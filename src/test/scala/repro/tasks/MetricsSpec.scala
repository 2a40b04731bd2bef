package repro.tasks

import org.scalatest.funsuite.AnyFunSuite
import org.scalacheck.Gen
import org.scalacheck.Prop.forAll
import repro.PropHelper

class MetricsSpec extends AnyFunSuite with PropHelper {

  test("accuracy on hand case") {
    assert(Metrics.accuracy(Seq("a", "b", "c", "d"), Seq("a", "x", "c", "y")) === 0.5)
  }

  test("microPRF on hand case") {
    val pred = Seq(Set("a", "b"), Set("c"))
    val gold = Seq(Set("a"), Set("c", "d"))
    val prf = Metrics.microPRF(pred, gold)
    assert(math.abs(prf.p - 2.0 / 3) < 1e-9)
    assert(math.abs(prf.r - 2.0 / 3) < 1e-9)
    assert(math.abs(prf.f - 2.0 / 3) < 1e-9)
  }

  test("microPRF handles empty predictions") {
    val prf = Metrics.microPRF(Seq(Set.empty[String]), Seq(Set("a")))
    assert(prf.p === 0.0 && prf.r === 0.0 && prf.f === 0.0)
  }

  test("spans parses BIO sequences") {
    val tags = Seq("B-Brand", "I-Brand", "O", "B-Cat", "B-Val")
    assert(Metrics.spans(tags) === Set(("Brand", 0, 2), ("Cat", 3, 4), ("Val", 4, 5)))
  }

  test("spans ignores orphan I tags") {
    assert(Metrics.spans(Seq("O", "I-X", "O")) === Set.empty)
  }

  test("lcs on hand cases") {
    assert(Metrics.lcs("abcde".toSeq, "ace".toSeq) === 3)
    assert(Metrics.lcs("abc".toSeq, "xyz".toSeq) === 0)
    assert(Metrics.lcs(Seq("a", "b"), Seq("a", "b")) === 2)
  }

  test("rougeL on hand cases") {
    assert(Metrics.rougeL(Seq("a", "b", "c"), Seq("a", "b", "c")) === 1.0)
    assert(Metrics.rougeL(Seq("x"), Seq("a", "b")) === 0.0)
    // cand=[a,c], ref=[a,b,c]: LCS=2, P=1, R=2/3, F=0.8
    assert(math.abs(Metrics.rougeL(Seq("a", "c"), Seq("a", "b", "c")) - 0.8) < 1e-9)
  }

  test("property: rougeL is 1 iff sequences are equal (for distinct-token seqs)") {
    val gen = Gen.choose(1, 6).flatMap(n => Gen.listOfN(n, Gen.choose(0, 20)))
    checkProp(forAll(gen) { xs =>
      val s = xs.distinct.map(_.toString)
      s.isEmpty || Metrics.rougeL(s, s) == 1.0
    })
  }

  test("property: lcs is bounded by min length and symmetric") {
    val gen = Gen.listOfN(6, Gen.choose(0, 3))
    checkProp(forAll(gen, gen) { (a0, b0) =>
      val a = a0.map(_.toString); val b = b0.map(_.toString)
      val l = Metrics.lcs(a, b)
      l <= math.min(a.length, b.length) && l == Metrics.lcs(b, a)
    })
  }

  test("property: microPRF f is between min and max of p and r or zero") {
    val gen = Gen.listOfN(5, Gen.choose(0, 8))
    checkProp(forAll(gen, gen) { (p0, g0) =>
      val prf = Metrics.microPRF(Seq(p0.toSet), Seq(g0.toSet))
      prf.f >= 0.0 && prf.f <= 1.0
    })
  }
}
