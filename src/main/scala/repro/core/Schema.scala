package repro.core

/** The OpenBG core ontology vocabulary (Section II-A of the paper).
  *
  * Relation names and node-type tags used throughout the pipeline.
  * Relations split into the paper's three kinds: object properties
  * (class/concept ↔ class/concept links with domain/range constraints),
  * data properties (attributes/literals), and meta-properties (W3C/SKOS
  * axioms).
  */
object Schema {

  // ----- node types ("ntype" column of the node table)
  val NtCategory = "Category"
  val NtBrand    = "Brand"
  val NtPlace    = "Place"
  val NtScene    = "Scene"
  val NtCrowd    = "Crowd"
  val NtTheme    = "Theme"
  val NtTime     = "Time"
  val NtMarket   = "MarketSegment"
  val NtProduct  = "Product"
  val NtValue    = "AttrValue"

  val ConceptTypes: Seq[String] = Seq(NtScene, NtCrowd, NtTheme, NtTime, NtMarket)
  val ClassTypes: Seq[String]   = Seq(NtCategory, NtBrand, NtPlace)

  /** synth-world concept type key → ontology node type. */
  val ConceptTypeOf: Map[String, String] = Map(
    "scene" -> NtScene, "crowd" -> NtCrowd, "theme" -> NtTheme,
    "time" -> NtTime, "market" -> NtMarket)

  // ----- relation kinds ("kind" column of the triple table)
  val KindObject = "object"
  val KindData   = "data"
  val KindMeta   = "meta"

  // ----- object properties
  val BrandIs       = "brandIs"
  val PlaceOfOrigin = "placeOfOrigin"
  val RelatedScene  = "relatedScene"
  val ForCrowd      = "forCrowd"
  val AboutTheme    = "aboutTheme"
  val AppliedTime   = "appliedTime"
  /** The paper's inMarket* family: one relation per market-segment root. */
  def inMarket(rootId: String): String = s"inMarket:$rootId"

  /** Object property for a synth concept type key. */
  val ConceptRelOf: Map[String, String] = Map(
    "scene" -> RelatedScene, "crowd" -> ForCrowd, "theme" -> AboutTheme,
    "time" -> AppliedTime)

  // ----- data properties
  val RdfsLabel    = "rdfs:label"
  val LabelEn      = "labelEn"
  val PrefLabel    = "skos:prefLabel"
  val AltLabel     = "skos:altLabel"
  val RdfsComment  = "rdfs:comment"
  val ImageIs      = "imageIs"
  /** Product attribute data property. */
  def attrProp(name: String): String = s"attr:$name"

  // ----- meta-properties
  val SubClassOf    = "rdfs:subClassOf"
  val Broader       = "skos:broader"
  val RdfType       = "rdf:type"
  val EquivClass    = "owl:equivalentClass"
  val SubPropOf     = "rdfs:subPropertyOf"
  val EquivPropOf   = "owl:equivalentPropertyOf"

  val OwlThing    = "owl:Thing"
  val SkosConcept = "skos:Concept"

  /** Attribute-value entity id (values are first-class entities so that
    * attribute triples are usable for link prediction).
    */
  def valueEntity(attrName: String, value: String): String = s"val:$attrName:$value"

  /** Attribute class node id (the rdf:type target of a value entity). */
  def attrClass(attrName: String): String = s"attrcls:$attrName"
}
