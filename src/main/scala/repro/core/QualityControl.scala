package repro.core

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.functions._

/** Concept quality control along the paper's four commonsense facets
  * (II-C.2): plausibility, typicality, remarkability, salience —
  * computed from corpus statistics with DataFrame aggregations.
  *
  * Definitions (for a leaf category c and concept p):
  *  - typicality(c,p)   = |products of c linked to p| / |products of c|
  *  - remarkability(c,p)= typicality(c,p) − mean over sibling leaves c'
  *                        (same level-2 ancestor, c' ≠ c) of typicality(c',p)
  *  - plausible(c,p)    = support ≥ minSupport ∧ typicality ≥ tauPlausible
  *  - typical(c,p)      = typicality ≥ tauTypical
  *  - remarkable(c,p)   = remarkability ≥ tauRemarkable
  *  - salient(c,p)      = typical ∧ remarkable  (paper: "a statement both
  *                        satisfying Typicality and Remarkability implies
  *                        Salience")
  */
object QualityControl {

  final case class Thresholds(
      minSupport: Long = 2L,
      tauPlausible: Double = 0.05,
      tauTypical: Double = 0.12,
      tauRemarkable: Double = 0.06)

  /** Facet table over candidate concept links.
    *
    * @param conceptLinks (productId, ctype, conceptId, support)
    * @param productTypes (productId, leafId) — rdf:type annotations
    * @param leafAncestors (leafId, l2Id) — level-2 ancestor of each leaf
    * @return (leafId, ctype, conceptId, support, typicality, remarkability,
    *          plausible, typical, remarkable, salient)
    */
  def facets(
      spark: SparkSession,
      conceptLinks: DataFrame,
      productTypes: DataFrame,
      leafAncestors: DataFrame,
      th: Thresholds = Thresholds()): DataFrame = {

    val leafCounts = productTypes.groupBy("leafId")
      .agg(countDistinct(col("productId")) as "nLeafProducts")

    val linksWithLeaf = conceptLinks.join(productTypes, Seq("productId"))

    val perLeaf = linksWithLeaf
      .groupBy("leafId", "ctype", "conceptId")
      .agg(countDistinct(col("productId")) as "nLinked", sum(col("support")) as "support")
      .join(leafCounts, Seq("leafId"))
      .withColumn("typicality", col("nLinked") / col("nLeafProducts"))
      .join(leafAncestors, Seq("leafId"))

    // Sibling group statistics: the typicality mass of (concept) across all
    // leaves of the same L2 ancestor. Leaves with zero links contribute 0,
    // so the mean divides by the number of leaves under the ancestor.
    val leavesPerL2 = leafAncestors.groupBy("l2Id").agg(count(lit(1)) as "nSiblings")
    val groupMass = perLeaf.groupBy("l2Id", "ctype", "conceptId")
      .agg(sum(col("typicality")) as "typMass")

    perLeaf
      .join(groupMass, Seq("l2Id", "ctype", "conceptId"))
      .join(leavesPerL2, Seq("l2Id"))
      .withColumn("remarkability",
        when(col("nSiblings") > 1,
          col("typicality") - (col("typMass") - col("typicality")) / (col("nSiblings") - 1))
          .otherwise(col("typicality")))
      .withColumn("plausible",
        col("support") >= th.minSupport && col("typicality") >= th.tauPlausible)
      .withColumn("typical", col("typicality") >= th.tauTypical)
      .withColumn("remarkable", col("remarkability") >= th.tauRemarkable)
      .withColumn("salient", col("typical") && col("remarkable"))
      .select("leafId", "ctype", "conceptId", "support", "typicality",
        "remarkability", "plausible", "typical", "remarkable", "salient")
  }

  /** Drop product→concept links whose (leaf, concept) pair is implausible
    * — this is where spurious corpus mentions get cleaned out.
    */
  def filterLinks(
      conceptLinks: DataFrame,
      productTypes: DataFrame,
      facetTable: DataFrame): DataFrame = {
    val plausible = facetTable.filter(col("plausible"))
      .select("leafId", "ctype", "conceptId")
    conceptLinks
      .join(productTypes, Seq("productId"))
      .join(plausible, Seq("leafId", "ctype", "conceptId"))
      .select("productId", "ctype", "conceptId")
  }
}
