package repro.synth

/** Deterministic pseudo-word vocabulary.
  *
  * The synthetic business world needs human-ish labels (brand names,
  * category names, attribute values, place names) that are (a) fully
  * deterministic in a seed, (b) compositional — so text-feature models
  * have real signal — and (c) collision-poor across domains. Words are
  * built from syllables with a domain-salt mixed into the hash, so the
  * brand namespace never collides with the place namespace, etc.
  */
object Vocab {

  private val Syllables: Array[String] = Array(
    "ba", "be", "bi", "bo", "bu", "da", "de", "di", "do", "du",
    "ka", "ke", "ki", "ko", "ku", "la", "le", "li", "lo", "lu",
    "ma", "me", "mi", "mo", "mu", "na", "ne", "ni", "no", "nu",
    "ra", "re", "ri", "ro", "ru", "sa", "se", "si", "so", "su",
    "ta", "te", "ti", "to", "tu", "va", "ve", "vi", "vo", "vu",
    "za", "ze", "zi", "zo", "zu", "fa", "fe", "fi", "fo", "fu")

  /** SplitMix64 finalizer — cheap, well-mixed, deterministic. */
  def mix(x: Long): Long = {
    var z = x + 0x9e3779b97f4a7c15L
    z = (z ^ (z >>> 30)) * 0xbf58476d1ce4e5b9L
    z = (z ^ (z >>> 27)) * 0x94d049bb133111ebL
    z ^ (z >>> 31)
  }

  /** A single pseudo-word of 2–4 syllables, deterministic in (salt, id). */
  def word(salt: Long, id: Long): String = {
    val h = mix(salt * 0x9e3779b97f4a7c15L + id)
    val n = 2 + (math.abs(h) % 3).toInt
    val sb = new StringBuilder
    var s = h
    var i = 0
    while (i < n) {
      s = mix(s)
      sb.append(Syllables((math.abs(s) % Syllables.length).toInt))
      i += 1
    }
    sb.toString
  }

  /** Multi-word label, words joined by a single space. */
  def label(salt: Long, id: Long, nWords: Int): String =
    (0 until nWords).map(w => word(salt + 31L * w, id)).mkString(" ")

  // Domain salts — one namespace per label family.
  val SaltCategory = 101L
  val SaltBrand    = 202L
  val SaltPlace    = 303L
  val SaltConcept  = 404L
  val SaltAttr     = 505L
  val SaltValue    = 606L
  val SaltFiller   = 707L
  val SaltOpinion  = 808L

  def categoryLabel(level: Int, idx: Long): String = label(SaltCategory + level, idx, 1 + (idx % 2).toInt)
  def brandLabel(idx: Long): String               = label(SaltBrand, idx, 1)
  def placeLabel(level: Int, idx: Long): String   = label(SaltPlace + level, idx, 1)
  def conceptLabel(ctype: String, idx: Long): String =
    label(SaltConcept + ctype.hashCode.toLong, idx, 1 + (idx % 2).toInt)
  def attrName(idx: Long): String                 = word(SaltAttr, idx)
  def attrValue(attrIdx: Long, vIdx: Long): String = word(SaltValue + 131L * attrIdx, vIdx)
  def fillerWord(idx: Long): String               = word(SaltFiller, idx)
  def opinionWord(idx: Long): String              = word(SaltOpinion, idx % 24)

  /** A deterministic single-character-transposition typo of a label. */
  def typo(s: String, h: Long): String = {
    if (s.length < 3) s
    else {
      val i = 1 + (math.abs(mix(h)) % (s.length - 2)).toInt
      val a = s.toCharArray
      val t = a(i); a(i) = a(i + 1); a(i + 1) = t
      new String(a)
    }
  }

  /** Zipf weights for ranks 1..n, normalized to sum 1, as a cumulative array. */
  def zipfCumulative(n: Int, alpha: Double): Array[Double] = {
    val w = Array.tabulate(n)(k => 1.0 / math.pow(k + 1.0, alpha))
    val sum = w.sum
    val cum = new Array[Double](n)
    var acc = 0.0
    var i = 0
    while (i < n) { acc += w(i) / sum; cum(i) = acc; i += 1 }
    cum(n - 1) = 1.0
    cum
  }

  /** Sample an index from a cumulative weight array with uniform draw u in [0,1). */
  def sampleCumulative(cum: Array[Double], u: Double): Int = {
    val i = java.util.Arrays.binarySearch(cum, u)
    if (i >= 0) math.min(i + 1, cum.length - 1) else math.min(-i - 1, cum.length - 1)
  }
}
