package repro.core

import org.scalacheck.Gen
import org.scalacheck.Prop.forAll
import repro.{PropHelper, SparkSpec, TestFixtures}
import repro.synth.{BusinessSynth, Vocab}

class LabelMatcherSpec extends SparkSpec with PropHelper {
  lazy val world = TestFixtures.world

  // ---------------------------------------------------------------- TokenTrie
  test("trie longestMatch finds deepest terminal") {
    val t = new TokenTrie
    t.insert(Seq("acme"), "A")
    t.insert(Seq("acme", "plus"), "B")
    assert(t.longestMatch(Seq("acme")) === Some("A"))
    assert(t.longestMatch(Seq("acme", "plus")) === Some("B"))
    assert(t.longestMatch(Seq("acme", "other")) === Some("A"))
    assert(t.longestMatch(Seq("other")) === None)
  }

  test("trie first insertion wins on duplicate labels") {
    val t = new TokenTrie
    t.insert(Seq("dup"), "first")
    t.insert(Seq("dup"), "second")
    assert(t.longestMatch(Seq("dup")) === Some("first"))
  }

  test("trie matchAt returns longest span and its length") {
    val t = new TokenTrie
    t.insert(Seq("red", "shoes"), "RS")
    t.insert(Seq("red"), "R")
    val toks = IndexedSeq("big", "red", "shoes", "sale")
    assert(t.matchAt(toks, 1) === Some(("RS", 2)))
    assert(t.matchAt(toks, 0) === None)
  }

  // ------------------------------------------------------------------ damerau
  test("damerau handles equal, substitution, insertion, transposition") {
    assert(LabelMatcher.damerau("abc", "abc") === 0)
    assert(LabelMatcher.damerau("abc", "abd") === 1)
    assert(LabelMatcher.damerau("abc", "abcd") === 1)
    assert(LabelMatcher.damerau("abc", "acb") === 1)
    assert(LabelMatcher.damerau("abc", "xyz", cap = 1) === 2) // capped
  }

  test("property: damerau(s, typo(s)) == 1 for length >= 3") {
    checkProp(forAll(Gen.choose(0L, 10000L)) { id =>
      val s = Vocab.word(99L, id)
      val t = Vocab.typo(s, id * 7 + 1)
      t == s || LabelMatcher.damerau(s, t) == 1
    })
  }

  test("property: damerau is symmetric for small strings") {
    val gen = Gen.choose(0L, 5000L)
    checkProp(forAll(gen, gen) { (a, b) =>
      val x = Vocab.word(1L, a).take(6)
      val y = Vocab.word(1L, b).take(6)
      LabelMatcher.damerau(x, y) == LabelMatcher.damerau(y, x)
    })
  }

  // ------------------------------------------------------------------ Matcher
  lazy val brandMatcher = new LabelMatcher.Matcher(
    world.brands.map(b => (b.id, b.label +: b.aliases)))

  test("matcher resolves canonical labels exactly") {
    world.brands.take(30).foreach { b =>
      assert(brandMatcher.matchText(b.label) === Some((b.id, "exact")), b.label)
    }
  }

  test("matcher resolves aliases via the trie") {
    world.brands.take(30).foreach { b =>
      val got = brandMatcher.matchText(b.aliases.head)
      assert(got.map(_._1) === Some(b.id), s"${b.aliases.head}")
    }
  }

  test("matcher resolves unknown alias extensions via prefix matching") {
    val b = world.brands.head
    assert(brandMatcher.matchText(b.label + " zzz unknown").map(_._1) === Some(b.id))
  }

  test("matcher resolves single-transposition typos fuzzily") {
    var hits = 0
    world.brands.take(50).foreach { b =>
      val t = Vocab.typo(b.label, b.id.hashCode.toLong)
      brandMatcher.matchText(t).foreach { case (id, m) =>
        if (id == b.id) { hits += 1; assert(m === "fuzzy" || t == b.label) }
      }
    }
    assert(hits > 35, s"fuzzy hit rate too low: $hits/50")
  }

  test("matcher misses on garbage") {
    assert(brandMatcher.matchText("zzzzzzzzzz qqqqqq") === None)
    assert(brandMatcher.matchText("") === None)
  }

  // ------------------------------------------------------------ Spark linking
  test("linkBrands recovers >85% of ground-truth brand links") {
    val raw = BusinessSynth.rawProducts(spark, world).toDF()
    val catalog = SchemaMapping.unifyBrands(spark, BusinessSynth.externalBrands(spark, world))
    val links = LabelMatcher.linkBrands(spark, raw, catalog).cache()
    // Canonical catalog ids differ from world ids; compare by label.
    val catLabel = catalog.select("id", "label").collect()
      .map(r => r.getString(0) -> r.getString(1)).toMap
    val gtLabel = TestFixtures.gtProducts
      .map(p => p.id -> world.brandById(p.brandId).label).toMap
    val rows = links.collect()
    val correct = rows.count(r => catLabel(r.getString(1)) == gtLabel(r.getString(0)))
    assert(rows.length.toDouble / world.cfg.nProducts > 0.85, "coverage")
    assert(correct.toDouble / rows.length > 0.95, "precision")
  }

  test("linkPlaces matches variant forms and picks city-level entries") {
    val raw = BusinessSynth.rawProducts(spark, world).toDF()
    val places = SchemaMapping.unifyPlaces(spark,
      BusinessSynth.externalPlacesA(spark, world),
      BusinessSynth.externalPlacesB(spark, world))
    val links = LabelMatcher.linkPlaces(spark, raw, places).cache()
    val placeLabel = places.select("id", "label").collect()
      .map(r => r.getString(0) -> r.getString(1)).toMap
    val gtLabel = TestFixtures.gtProducts
      .map(p => p.id -> world.placeById(p.placeId).label).toMap
    val rows = links.collect()
    assert(rows.length.toDouble / world.cfg.nProducts > 0.9, "coverage")
    val correct = rows.count(r => placeLabel(r.getString(1)) == gtLabel(r.getString(0)))
    assert(correct.toDouble / rows.length > 0.9, "precision")
  }
}
