package repro.synth

import org.scalatest.funsuite.AnyFunSuite
import org.scalacheck.Prop.forAll
import repro.PropHelper

class VocabSpec extends AnyFunSuite with PropHelper {

  test("mix is deterministic and well-spread") {
    assert(Vocab.mix(42L) === Vocab.mix(42L))
    val vals = (0L until 1000L).map(Vocab.mix)
    assert(vals.distinct.size === 1000)
  }

  test("word is deterministic in (salt, id)") {
    assert(Vocab.word(1, 2) === Vocab.word(1, 2))
    assert((Vocab.word(1, 2) != Vocab.word(2, 2)) || (Vocab.word(1, 3) != Vocab.word(2, 3)))
  }

  test("word has 2..4 syllables (4..8 chars)") {
    checkProp(forAll { (salt: Long, id: Long) =>
      val w = Vocab.word(salt, id)
      w.length >= 4 && w.length <= 8
    })
  }

  test("label produces the requested number of words") {
    val l = Vocab.label(7, 9, 3)
    assert(l.split(" ").length === 3)
  }

  test("different salts give disjoint-ish namespaces") {
    val a = (0L until 200L).map(Vocab.word(Vocab.SaltBrand, _)).toSet
    val b = (0L until 200L).map(Vocab.word(Vocab.SaltPlace, _)).toSet
    assert((a intersect b).size < 10)
  }

  test("typo transposes exactly two adjacent interior characters") {
    val s = "abcdef"
    val t = Vocab.typo(s, 123L)
    assert(t.length === s.length)
    assert(t !== s)
    assert(t.sorted === s.sorted)
    // exactly one adjacent transposition => Damerau distance 1
    assert(repro.core.LabelMatcher.damerau(s, t) === 1)
  }

  test("typo leaves short strings untouched") {
    assert(Vocab.typo("ab", 5L) === "ab")
  }

  test("zipfCumulative is monotone and ends at 1.0") {
    val c = Vocab.zipfCumulative(10, 1.2)
    assert(c.last === 1.0)
    assert(c.zip(c.tail).forall { case (a, b) => a <= b })
    // rank-1 mass dominates rank-2
    assert(c(0) > c(1) - c(0))
  }

  test("sampleCumulative respects boundaries") {
    val c = Vocab.zipfCumulative(4, 1.0)
    assert(Vocab.sampleCumulative(c, 0.0) === 0)
    assert(Vocab.sampleCumulative(c, 0.999999) === 3)
    checkProp(forAll { (seed: Long) =>
      val u = (seed & 0xffffL).toDouble / 65536.0
      val i = Vocab.sampleCumulative(c, u)
      i >= 0 && i < 4
    })
  }

  test("sampleCumulative reproduces zipf skew empirically") {
    val c = Vocab.zipfCumulative(5, 1.2)
    val r = new java.util.Random(1)
    val counts = new Array[Int](5)
    (0 until 20000).foreach(_ => counts(Vocab.sampleCumulative(c, r.nextDouble())) += 1)
    assert(counts(0) > counts(1) && counts(1) > counts(2))
  }
}
