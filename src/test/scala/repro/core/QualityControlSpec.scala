package repro.core

import org.apache.spark.sql.functions._
import repro.{SparkSpec, TestFixtures}

class QualityControlSpec extends SparkSpec {

  test("facets computes typicality/remarkability on a hand-built example") {
    import spark.implicits._
    // Two sibling leaves under l2; concept X typical for both (not
    // remarkable); concept Y typical only for leafA (remarkable+salient).
    val productTypes = Seq(
      ("p1", "leafA"), ("p2", "leafA"), ("p3", "leafA"), ("p4", "leafA"),
      ("q1", "leafB"), ("q2", "leafB"), ("q3", "leafB"), ("q4", "leafB"),
    ).toDF("productId", "leafId")
    val links = Seq(
      // X on both leaves (typ 0.75 / 0.75)
      ("p1", "scene", "X", 2L), ("p2", "scene", "X", 1L), ("p3", "scene", "X", 1L),
      ("q1", "scene", "X", 1L), ("q2", "scene", "X", 1L), ("q3", "scene", "X", 1L),
      // Y only on leafA (typ 0.75 vs 0)
      ("p1", "scene", "Y", 1L), ("p2", "scene", "Y", 1L), ("p3", "scene", "Y", 1L),
      // Z rare on leafA (typ 0.25): plausible but not typical
      ("p4", "scene", "Z", 1L),
    ).toDF("productId", "ctype", "conceptId", "support")
    val ancestors = Seq(("leafA", "l2"), ("leafB", "l2")).toDF("leafId", "l2Id")

    val f = QualityControl.facets(spark, links, productTypes, ancestors,
      QualityControl.Thresholds(minSupport = 1, tauPlausible = 0.02,
        tauTypical = 0.5, tauRemarkable = 0.3))
      .collect().map(r => (r.getString(0), r.getString(2)) -> r).toMap

    val xa = f(("leafA", "X"))
    assert(math.abs(xa.getAs[Double]("typicality") - 0.75) < 1e-9)
    assert(math.abs(xa.getAs[Double]("remarkability") - 0.0) < 1e-9)
    assert(xa.getAs[Boolean]("typical") && !xa.getAs[Boolean]("remarkable"))
    assert(!xa.getAs[Boolean]("salient"))

    val ya = f(("leafA", "Y"))
    assert(math.abs(ya.getAs[Double]("typicality") - 0.75) < 1e-9)
    assert(math.abs(ya.getAs[Double]("remarkability") - 0.75) < 1e-9)
    assert(ya.getAs[Boolean]("salient"))

    val za = f(("leafA", "Z"))
    assert(za.getAs[Boolean]("plausible") && !za.getAs[Boolean]("typical"))
  }

  test("filterLinks drops implausible links and keeps plausible ones") {
    import spark.implicits._
    val productTypes = Seq(("p1", "leafA"), ("p2", "leafA")).toDF("productId", "leafId")
    val links = Seq(("p1", "scene", "X", 5L), ("p2", "scene", "W", 1L))
      .toDF("productId", "ctype", "conceptId", "support")
    val facets = Seq(
      ("leafA", "scene", "X", true), ("leafA", "scene", "W", false),
    ).toDF("leafId", "ctype", "conceptId", "plausible")
    val kept = QualityControl.filterLinks(links, productTypes, facets)
      .collect().map(r => (r.getString(0), r.getString(2))).toSet
    assert(kept === Set(("p1", "X")))
  }

  test("tiny-world salience agrees with the generative ground truth") {
    // In the world, `own` concepts are leaf-specific (salient candidates)
    // while `shared` concepts are common to all siblings (not remarkable).
    val world = TestFixtures.world
    val kg = TestFixtures.kg
    val facets = kg.facets.filter(col("ctype") === "scene").collect()
      .map(r => (r.getString(0), r.getString(2)) -> r.getAs[Boolean]("salient")).toMap

    val profs = world.leafProfiles
    var ownSalient = 0; var ownTotal = 0
    var sharedSalient = 0; var sharedTotal = 0
    profs.foreach { p =>
      // only leaves with enough products have reliable stats; use all, rely on rates
      p.sceneOwn.filterNot(p.sceneShared.contains).foreach { c =>
        facets.get((p.leafId, c)).foreach { s => ownTotal += 1; if (s) ownSalient += 1 }
      }
      p.sceneShared.filterNot(p.sceneOwn.contains).foreach { c =>
        facets.get((p.leafId, c)).foreach { s => sharedTotal += 1; if (s) sharedSalient += 1 }
      }
    }
    assert(ownTotal > 0 && sharedTotal > 0)
    val ownRate = ownSalient.toDouble / ownTotal
    val sharedRate = sharedSalient.toDouble / sharedTotal
    assert(ownRate > sharedRate,
      s"own-concept salience rate ($ownRate) should exceed shared-concept rate ($sharedRate)")
  }

  test("oracle: typicality aggregation matches DuckDB") {
    import spark.implicits._
    val productTypes = Seq(("p1", "A"), ("p2", "A"), ("p3", "B"))
      .toDF("productId", "leafId")
    val links = Seq(("p1", "scene", "X", 1L), ("p2", "scene", "X", 2L), ("p3", "scene", "X", 1L))
      .toDF("productId", "ctype", "conceptId", "support")
    val ancestors = Seq(("A", "l2"), ("B", "l2")).toDF("leafId", "l2Id")
    val got = QualityControl.facets(spark, links, productTypes, ancestors)
      .select(col("leafId"), col("conceptId"), col("typicality"))
    repro.Oracle.assertEquivalent(got,
      """SELECT t.leafId AS leafId, l.conceptId AS conceptId,
        |       CAST(count(DISTINCT l.productId) AS DOUBLE) /
        |       (SELECT count(DISTINCT t2.productId) FROM types t2 WHERE t2.leafId = t.leafId)
        |       AS typicality
        |FROM links l JOIN types t ON l.productId = t.productId
        |GROUP BY t.leafId, l.conceptId""".stripMargin,
      "links" -> links.drop("support"),
      "types" -> productTypes)
  }
}
