package repro.core

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.functions._
import repro.synth.{BusinessSynth, World}

/** All raw inputs of the construction pipeline (paper Section II).
  *
  * @param categoryTaxonomy expert-defined top-down Category taxonomy
  *                         (id, label, level, parent) — the paper builds
  *                         this with 30 person/day review; here it is a
  *                         given input, like theirs after review
  * @param rawProducts      noisy platform product rows
  * @param placesA          Wikidata-like external place KG
  * @param placesB          OpenKG-like external place KG
  * @param brandRegistry    brand declaration registry
  * @param corpus           titles + reviews text corpus
  * @param conceptLexicon   (conceptId, label, ctype, level, parent) —
  *                         the annotation resource standing in for the
  *                         trained BERT-CRF's knowledge of concept surface
  *                         forms and their five top-level types
  */
final case class RawSources(
    categoryTaxonomy: DataFrame,
    rawProducts: DataFrame,
    placesA: DataFrame,
    placesB: DataFrame,
    brandRegistry: DataFrame,
    corpus: DataFrame,
    conceptLexicon: DataFrame)

object RawSources {
  /** Materialize every raw source from the synthetic world. */
  def fromWorld(spark: SparkSession, world: World): RawSources = {
    import spark.implicits._
    val catTax = world.categories.map(n => (n.id, n.label, n.level, n.parent))
      .toDF("id", "label", "level", "parent")
    val lexicon = world.allConcepts.map { n =>
      val ctype = n.id.split(":").head
      (n.id, n.label, ctype, n.level, n.parent)
    }.toDF("conceptId", "label", "ctype", "level", "parent")
    RawSources(
      categoryTaxonomy = catTax,
      rawProducts = BusinessSynth.rawProducts(spark, world).toDF(),
      placesA = BusinessSynth.externalPlacesA(spark, world),
      placesB = BusinessSynth.externalPlacesB(spark, world),
      brandRegistry = BusinessSynth.externalBrands(spark, world),
      corpus = BusinessSynth.corpus(spark, world).toDF(),
      conceptLexicon = lexicon)
  }
}

/** The constructed knowledge graph.
  *
  * @param nodes   (id, label, ntype, level)
  * @param triples (s, p, o, kind) — kind ∈ {object, data, meta}
  * @param images  (pid, vec) side table of image feature vectors (the
  *                multimodal payload referenced by `imageIs` triples)
  * @param facets  concept quality-control facet table
  */
final case class Kg(nodes: DataFrame, triples: DataFrame, images: DataFrame, facets: DataFrame) {
  def cache(): Kg = { nodes.cache(); triples.cache(); images.cache(); facets.cache(); this }
}

/** End-to-end OpenBG construction (paper Section II): ontology
  * formalization, Place/Brand schema mapping, trie+fuzzy entity linking,
  * bottom-up concept extraction with quality control, and multimodal
  * triple assembly — every stage a DataFrame transformation.
  */
object KgBuilder {
  import Schema._

  /** (leafId, l2Id): level-2 ancestor of each taxonomy node at level ≥ 2
    * (nodes at level ≤ 2 map to themselves). Bounded parent walk.
    */
  def leafAncestors(categoryTaxonomy: DataFrame): DataFrame = {
    var cur = categoryTaxonomy.select(col("id") as "leafId", col("id") as "cursor",
      col("level") as "curLevel")
    val parents = categoryTaxonomy.select(col("id") as "p_id", col("parent") as "p_parent",
      col("level") as "p_level")
    for (_ <- 0 until 3) {
      cur = cur.join(parents, cur("cursor") === parents("p_id"), "left")
        .select(col("leafId"),
          when(col("curLevel") > 2, col("p_parent")).otherwise(col("cursor")) as "cursor",
          when(col("curLevel") > 2, col("curLevel") - 1).otherwise(col("curLevel")) as "curLevel")
    }
    cur.select(col("leafId"), col("cursor") as "l2Id")
  }

  def build(spark: SparkSession, src: RawSources,
            qcThresholds: QualityControl.Thresholds = QualityControl.Thresholds()): Kg = {
    import spark.implicits._

    // ---- 1. Schema mapping: canonical Place and Brand catalogs.
    val placeCatalog = SchemaMapping.unifyPlaces(spark, src.placesA, src.placesB).cache()
    val brandCatalog = SchemaMapping.unifyBrands(spark, src.brandRegistry).cache()

    // ---- 2. Entity linking: products → Brand / Place.
    val brandLinks = LabelMatcher.linkBrands(spark, src.rawProducts, brandCatalog)
    val placeLinks = LabelMatcher.linkPlaces(spark, src.rawProducts, placeCatalog)

    // ---- 3. Bottom-up concepts: extraction + market metadata linking.
    val leafLexicon = src.conceptLexicon.filter(col("level") === 2)
    val mentions = ConceptExtractor.extract(spark, src.corpus, leafLexicon).cache()
    val marketLinks = ConceptExtractor.linkMarkets(spark, src.rawProducts, leafLexicon)

    val productTypes = src.rawProducts.select(col("pid") as "productId", col("leafId"))
    val ancestors = leafAncestors(src.categoryTaxonomy)
    val facetTable = QualityControl
      .facets(spark, mentions, productTypes, ancestors, qcThresholds).cache()
    val conceptLinks = QualityControl.filterLinks(mentions, productTypes, facetTable)

    // Discovered concepts (post-filter) + market concepts + their roots.
    val usedConceptIds = conceptLinks.select(col("conceptId"))
      .union(marketLinks.select(col("conceptId"))).distinct()
    val usedLeaves = src.conceptLexicon.join(usedConceptIds, Seq("conceptId"))
    val usedRoots = src.conceptLexicon.join(
      usedLeaves.select(col("parent") as "conceptId").distinct(), Seq("conceptId"))
    val discoveredLexicon = usedLeaves.unionByName(usedRoots).distinct().cache()

    // ---- 4. Node table.
    val attrPairs = src.rawProducts
      .select(col("pid"), explode(col("attrs")) as Seq("attrName", "value"))
      .cache()
    val valueNodes = attrPairs.select(col("attrName"), col("value")).distinct()
      .select(concat(lit("val:"), col("attrName"), lit(":"), col("value")) as "id",
        col("value") as "label", lit(NtValue) as "ntype", lit(0) as "level")
    val attrClassNodes = attrPairs.select(col("attrName")).distinct()
      .select(concat(lit("attrcls:"), col("attrName")) as "id",
        col("attrName") as "label", lit("AttrClass") as "ntype", lit(1) as "level")
    val productNodes = src.rawProducts.select(col("pid") as "id", col("title") as "label",
      lit(NtProduct) as "ntype", lit(0) as "level")

    val nodes = Ontology.categoryNodes(src.categoryTaxonomy)
      .unionByName(Ontology.brandNodes(brandCatalog))
      .unionByName(Ontology.placeNodes(placeCatalog))
      .unionByName(Ontology.conceptNodes(discoveredLexicon))
      .unionByName(productNodes)
      .unionByName(valueNodes)
      .unionByName(attrClassNodes)
      .cache()

    // ---- 5. Triples.
    // Meta.
    val typeTriples = src.rawProducts.select(col("pid") as "s", lit(RdfType) as "p",
      col("leafId") as "o", lit(KindMeta) as "kind")
    val valueTypeTriples = attrPairs
      .select(concat(lit("val:"), col("attrName"), lit(":"), col("value")) as "s",
        lit(RdfType) as "p", concat(lit("attrcls:"), col("attrName")) as "o",
        lit(KindMeta) as "kind").distinct()
    val metaTriples = Ontology.categoryMeta(src.categoryTaxonomy)
      .unionByName(Ontology.brandMeta(brandCatalog))
      .unionByName(Ontology.placeMeta(placeCatalog))
      .unionByName(Ontology.conceptMeta(discoveredLexicon))
      .unionByName(Ontology.equivalentClassLinks(nodes))
      .unionByName(Ontology.propertyLinks(attrPairs.select(col("attrName")).distinct()))
      .unionByName(typeTriples)
      .unionByName(valueTypeTriples)

    // Object properties.
    val brandTriples = brandLinks.select(col("pid") as "s", lit(BrandIs) as "p",
      col("brandId") as "o", lit(KindObject) as "kind")
    val placeTriples = placeLinks.select(col("pid") as "s", lit(PlaceOfOrigin) as "p",
      col("placeId") as "o", lit(KindObject) as "kind")
    val conceptRelExpr = ConceptRelOf.foldLeft(lit(null).cast("string")) {
      case (acc, (k, v)) => when(col("ctype") === k, lit(v)).otherwise(acc)
    }
    val conceptTriples = conceptLinks.filter(col("ctype") =!= "market")
      .select(col("productId") as "s", conceptRelExpr as "p", col("conceptId") as "o",
        lit(KindObject) as "kind")
    val marketTriples = marketLinks
      .join(src.conceptLexicon.select(col("conceptId"), col("parent")), Seq("conceptId"))
      .select(col("productId") as "s",
        concat(lit("inMarket:"), col("parent")) as "p", col("conceptId") as "o",
        lit(KindObject) as "kind")

    // Data properties.
    val labelTriples = src.rawProducts.select(col("pid") as "s", lit(RdfsLabel) as "p",
      col("title") as "o", lit(KindData) as "kind")
    val labelEnTriples = src.rawProducts.select(col("pid") as "s", lit(LabelEn) as "p",
      concat(lit("en "), col("title")) as "o", lit(KindData) as "kind")
      .unionByName(brandCatalog.select(col("id") as "s", lit(LabelEn) as "p",
        concat(lit("en "), col("label")) as "o", lit(KindData) as "kind"))
    val prefLabelTriples = discoveredLexicon.select(col("conceptId") as "s",
      lit(PrefLabel) as "p", col("label") as "o", lit(KindData) as "kind")
    val altLabelTriples = discoveredLexicon.select(col("conceptId") as "s",
      lit(AltLabel) as "p", concat(col("label"), lit(" alt")) as "o", lit(KindData) as "kind")
    val commentTriples = src.rawProducts.select(col("pid") as "s", lit(RdfsComment) as "p",
      col("description") as "o", lit(KindData) as "kind")
    val imageTriples = src.rawProducts.filter(col("hasImage"))
      .select(col("pid") as "s", lit(ImageIs) as "p",
        concat(lit("img:"), col("pid")) as "o", lit(KindData) as "kind")
    val attrTriples = attrPairs.select(col("pid") as "s",
      concat(lit("attr:"), col("attrName")) as "p",
      concat(lit("val:"), col("attrName"), lit(":"), col("value")) as "o",
      lit(KindData) as "kind")

    val triples = metaTriples
      .unionByName(brandTriples).unionByName(placeTriples)
      .unionByName(conceptTriples).unionByName(marketTriples)
      .unionByName(labelTriples).unionByName(labelEnTriples)
      .unionByName(prefLabelTriples).unionByName(altLabelTriples)
      .unionByName(commentTriples).unionByName(imageTriples)
      .unionByName(attrTriples)
      .distinct()

    val images = src.rawProducts.filter(col("hasImage"))
      .select(col("pid"), col("imageVec") as "vec")

    // Materialize and truncate lineage: the assembled tables are unions of
    // a dozen join trees each — without a checkpoint boundary Catalyst
    // re-optimizes the full construction plan on every downstream action,
    // which is quadratic pain for consumers like the benchmark builder.
    Kg(nodes.localCheckpoint(), triples.localCheckpoint(),
      images.localCheckpoint(), facetTable.localCheckpoint())
  }
}
