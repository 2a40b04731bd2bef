package repro.core

import org.apache.spark.sql.functions._
import repro.{SparkSpec, TestFixtures}

class KgStatsSpec extends SparkSpec {
  lazy val world = TestFixtures.world
  lazy val kg = TestFixtures.kg

  test("overall stats are consistent with node/triple tables") {
    val m = KgStats.overall(spark, kg).collect()
      .map(r => r.getString(0) -> r.getLong(1)).toMap
    assert(m("# products (instances of categories)") === world.cfg.nProducts.toLong)
    assert(m("# triples") === kg.triples.count())
    assert(m("# entities") === kg.nodes.count())
    assert(m("# core classes") > 0 && m("# core concepts") > 0)
    assert(m("# relation types") > 10)
  }

  test("per-type-level counts mirror the constructed taxonomies") {
    val rows = KgStats.perTypeLevel(kg).collect()
      .map(r => (r.getString(0), r.getInt(1)) -> (r.getLong(2), r.getLong(3))).toMap
    // Categories at each level match the expert taxonomy.
    val gtCat = world.categories.groupBy(_.level).view.mapValues(_.size).toMap
    for (l <- 1 to 3)
      assert(rows((Schema.NtCategory, l))._1 === gtCat(l).toLong)
    // Brand level 2 == number of brands.
    assert(rows((Schema.NtBrand, 2))._1 === world.cfg.nBrands.toLong)
    // Level-1 brand groups are internal nodes: zero leaves at level 1 only
    // if every group has brands; leaf count at level 2 equals brand count.
    assert(rows((Schema.NtBrand, 2))._2 === world.cfg.nBrands.toLong)
  }

  test("category leaves in stats match world leaves") {
    val rows = KgStats.perTypeLevel(kg).filter(col("ntype") === Schema.NtCategory)
      .collect()
    val totalLeaves = rows.map(_.getLong(3)).sum
    assert(totalLeaves === world.categoryLeaves.size.toLong)
  }

  test("per-relation counts cover core object properties") {
    val m = KgStats.perRelation(kg).collect()
      .map(r => r.getString(0) -> r.getLong(2)).toMap
    assert(m.contains(Schema.BrandIs))
    assert(m.contains(Schema.PlaceOfOrigin))
    assert(m.contains(Schema.RelatedScene))
    assert(m(Schema.RdfsLabel) === world.cfg.nProducts.toLong)
  }

  test("oracle: per-relation counts match DuckDB") {
    val got = KgStats.perRelation(kg).select(col("p"), col("n"))
    repro.Oracle.assertEquivalent(got,
      "SELECT p, count(*) AS n FROM triples GROUP BY p",
      "triples" -> kg.triples)
  }

  test("oracle: per-kind triple counts match DuckDB") {
    val got = kg.triples.groupBy("kind").agg(count(lit(1)) as "n")
    repro.Oracle.assertEquivalent(got,
      "SELECT kind, count(*) AS n FROM triples GROUP BY kind",
      "triples" -> kg.triples)
  }
}
