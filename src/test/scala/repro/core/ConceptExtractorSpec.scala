package repro.core

import org.apache.spark.sql.functions._
import repro.{SparkSpec, TestFixtures}
import repro.synth.BusinessSynth

class ConceptExtractorSpec extends SparkSpec {
  lazy val world = TestFixtures.world

  private def tagger(lex: (String, String, String)*) = new ConceptExtractor.Tagger(lex)

  test("tagger finds a single-token mention") {
    val t = tagger(("c1", "running", "scene"))
    assert(t.tag("great for running today") === Seq(("c1", "scene")))
  }

  test("tagger finds multi-token mentions as one span") {
    val t = tagger(("c1", "outdoor running", "scene"))
    assert(t.tag("great for outdoor running today") === Seq(("c1", "scene")))
  }

  test("tagger prefers the longest span (leftmost-longest decoding)") {
    val t = tagger(("short", "outdoor", "scene"), ("long", "outdoor running", "scene"))
    assert(t.tag("nice outdoor running shoes") === Seq(("long", "scene")))
  }

  test("tagger emits multiple mentions in order") {
    val t = tagger(("a", "hiking", "scene"), ("b", "elderly", "crowd"))
    assert(t.tag("hiking shoes for the elderly") === Seq(("a", "scene"), ("b", "crowd")))
  }

  test("tagger finds nothing in plain text") {
    val t = tagger(("a", "hiking", "scene"))
    assert(t.tag("completely unrelated words") === Nil)
    assert(t.tag("") === Nil)
  }

  test("overlapping lexicon entries do not double-count tokens") {
    val t = tagger(("a", "red shoes", "theme"), ("b", "shoes sale", "theme"))
    // "red shoes sale": after consuming "red shoes", "sale" alone matches nothing.
    assert(t.tag("red shoes sale") === Seq(("a", "theme")))
  }

  test("extract aggregates mention support per product over the corpus") {
    import spark.implicits._
    val corpus = Seq(
      ("d1", "review", "prod:1", "great for hiking . also hiking again"),
      ("d2", "review", "prod:1", "great for hiking"),
      ("d3", "review", "prod:2", "bought for elderly"),
    ).toDF("docId", "kind", "productId", "text")
    val lexicon = Seq(("scene:1", "hiking", "scene"), ("crowd:1", "elderly", "crowd"))
      .toDF("conceptId", "label", "ctype")
    val out = ConceptExtractor.extract(spark, corpus, lexicon).collect()
      .map(r => (r.getString(0), r.getString(1), r.getString(2), r.getLong(3))).toSet
    assert(out === Set(("prod:1", "scene", "scene:1", 3L), ("prod:2", "crowd", "crowd:1", 1L)))
  }

  test("extraction on the tiny world recovers most gold concept mentions") {
    import spark.implicits._
    val corpus = BusinessSynth.corpus(spark, world).toDF()
    val lexicon = TestFixtures.sources.conceptLexicon.filter(col("level") === 2)
      .select("conceptId", "label", "ctype")
    val found = ConceptExtractor.extract(spark, corpus, lexicon)
      .select("productId", "conceptId").as[(String, String)].collect().toSet
    // Gold: every concept the world linked to the product (scene/crowd/theme/time
    // mentions appear in reviews with probability 0.8 per review).
    // Gold recall is bounded by mention sampling: a product's concept only
    // reaches the corpus if some review mentions it (p≈0.8 per review, one
    // concept drawn per type per review) — so the ceiling is well below 1.
    val gold = TestFixtures.gtProducts.flatMap(p =>
      (p.scenes ++ p.crowds ++ p.themes ++ p.times).map(c => (p.id, c))).toSet
    val recovered = gold.count(found.contains)
    assert(recovered.toDouble / gold.size > 0.55, s"recall ${recovered.toDouble / gold.size}")
    // Precision: extracted pairs are overwhelmingly gold (spurious mentions
    // are injected at ~spuriousMentionRate per review).
    val precise = found.count(gold.contains)
    assert(precise.toDouble / found.size > 0.85, s"precision ${precise.toDouble / found.size}")
  }

  test("linkMarkets links every clean market metadata string") {
    val raw = BusinessSynth.rawProducts(spark, world).toDF()
    val lexicon = TestFixtures.sources.conceptLexicon.filter(col("level") === 2)
      .select("conceptId", "label", "ctype")
    val links = ConceptExtractor.linkMarkets(spark, raw, lexicon)
    val gold = TestFixtures.gtProducts.flatMap(p => p.markets.map(m => (p.id, m))).toSet
    val got = links.collect().map(r => (r.getString(0), r.getString(1))).toSet
    assert(got === gold)
  }
}
