package repro.synth

/** Noise rates injected into the raw sources that the construction
  * pipeline must clean up (Section II of the paper: the "deficient
  * structure" challenge).
  *
  * @param brandAliasRate  fraction of raw product rows whose brand string
  *                        is an alias rather than the canonical name
  * @param brandTypoRate   fraction with a one-transposition typo
  * @param brandMissingRate fraction with an empty brand string
  * @param placeVariantRate fraction of place strings written in a
  *                        non-canonical variant form ("<label> shi")
  * @param attrDropRate    fraction of attribute k/v pairs dropped from raw rows
  * @param spuriousMentionRate rate of concept-looking tokens in corpus text
  *                        that are NOT true concept mentions
  */
final case class NoiseConfig(
    brandAliasRate: Double = 0.15,
    brandTypoRate: Double = 0.10,
    brandMissingRate: Double = 0.05,
    placeVariantRate: Double = 0.20,
    attrDropRate: Double = 0.10,
    spuriousMentionRate: Double = 0.08)

/** Scale knobs of the synthetic business world.
  *
  * The paper's OpenBG (Table I) has a 4-level Category taxonomy, a
  * 5-level Place taxonomy, 45 top-level brand groups, five concept
  * hierarchies, and products as instances of leaf categories. The
  * defaults mirror those *shapes* at ~1/10 ("bench") and ~1/100
  * ("tiny") of the leaf counts; absolute entity counts scale further
  * via `nProducts`.
  */
final case class SynthConfig(
    // Category taxonomy: level1 count, then branching per node.
    l1Categories: Int,
    l2PerL1: Int,
    l3PerL2: Int,
    l4Fraction: Double, // fraction of L3 nodes that get an L4 child layer (paper: L3≈L4)
    // Brands.
    nBrandTopGroups: Int,
    nBrands: Int,
    aliasesPerBrand: Int,
    // Place taxonomy (country → province → city → county → town).
    nCountries: Int,
    provincesPerCountry: Int,
    citiesPerProvince: Int,
    countiesPerCity: Int,
    townsPerCounty: Int,
    // Concepts.
    nScene: Int,
    nCrowd: Int,
    nTheme: Int,
    nTime: Int,
    nMarket: Int,
    // Products and text.
    nProducts: Int,
    reviewsPerProduct: Int,
    // Attribute schema.
    attrPool: Int,
    attrsPerLeaf: Int,
    valuesPerAttr: Int,
    // Multimodal.
    imageDim: Int,
    imageFraction: Double,
    // Behavioural concentration: top-weighted candidates per leaf.
    brandsPerLeaf: Int,
    conceptsPerLeaf: Int,
    noise: NoiseConfig = NoiseConfig(),
    seed: Long = 42L) {

  require(l1Categories > 0 && l2PerL1 > 0 && l3PerL2 > 0)
  require(nProducts > 0 && nBrands >= brandsPerLeaf)

  def nL2: Int = l1Categories * l2PerL1
  def nL3: Int = nL2 * l3PerL2
  def nL4: Int = (nL3 * l4Fraction).toInt
}

object SynthConfig {

  /** Unit-test scale: whole world in well under a second. */
  val tiny: SynthConfig = SynthConfig(
    l1Categories = 3, l2PerL1 = 3, l3PerL2 = 3, l4Fraction = 1.0,
    nBrandTopGroups = 5, nBrands = 60, aliasesPerBrand = 2,
    nCountries = 2, provincesPerCountry = 3, citiesPerProvince = 3,
    countiesPerCity = 2, townsPerCounty = 2,
    nScene = 18, nCrowd = 12, nTheme = 12, nTime = 6, nMarket = 30,
    nProducts = 600, reviewsPerProduct = 2,
    attrPool = 30, attrsPerLeaf = 4, valuesPerAttr = 8,
    imageDim = 16, imageFraction = 0.5,
    brandsPerLeaf = 6, conceptsPerLeaf = 3,
    seed = 42L)

  /** Bench scale: roughly 1/10 of the paper's per-level taxonomy shape. */
  val bench: SynthConfig = SynthConfig(
    l1Categories = 9, l2PerL1 = 10, l3PerL2 = 4, l4Fraction = 0.9,
    nBrandTopGroups = 45, nBrands = 1200, aliasesPerBrand = 2,
    nCountries = 4, provincesPerCountry = 6, citiesPerProvince = 5,
    countiesPerCity = 3, townsPerCounty = 2,
    nScene = 160, nCrowd = 120, nTheme = 120, nTime = 18, nMarket = 400,
    nProducts = 30000, reviewsPerProduct = 2,
    attrPool = 120, attrsPerLeaf = 5, valuesPerAttr = 12,
    imageDim = 24, imageFraction = 0.5,
    brandsPerLeaf = 10, conceptsPerLeaf = 3,
    seed = 42L)
}
