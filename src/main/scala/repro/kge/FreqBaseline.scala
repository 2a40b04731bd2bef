package repro.kge

/** Conditional-frequency diagnostic baseline (not a paper model): scores
  * tails by P(t | r, type(h)) estimated from train counts, falling back
  * to P(t | r). Approximates the Bayes ceiling of the benchmark given
  * only the head's category — useful to sanity-check how much signal a
  * learned model can possibly extract.
  */
final class FreqBaseline(data: KgeDataset) extends KgeModel {
  val name = "FreqOracle"
  val nEnt: Int = data.nEnt
  val nRel: Int = data.nRel

  private val typeRel: Int = data.relIds.indexOf("rdf:type")

  private val typeOf = new Array[Int](nEnt)
  java.util.Arrays.fill(typeOf, -1)
  if (typeRel >= 0) {
    var i = 0
    while (i < data.nTrain) {
      if (data.trainR(i) == typeRel) typeOf(data.trainH(i)) = data.trainT(i)
      i += 1
    }
  }

  private val cond = new java.util.HashMap[Long, java.util.HashMap[Integer, Integer]]()
  private val global: java.util.HashMap[Integer, java.util.HashMap[Integer, Integer]] =
    new java.util.HashMap[Integer, java.util.HashMap[Integer, Integer]]()

  locally {
    var i = 0
    while (i < data.nTrain) {
      val h = data.trainH(i); val r = data.trainR(i); val t = data.trainT(i)
      val ty = typeOf(h)
      if (ty >= 0) {
        val k = ty.toLong * nRel + r
        var m = cond.get(k)
        if (m == null) { m = new java.util.HashMap[Integer, Integer](); cond.put(k, m) }
        m.merge(t, 1, (a: Integer, b: Integer) => a + b)
      }
      var g = global.get(Int.box(r))
      if (g == null) { g = new java.util.HashMap[Integer, Integer](); global.put(r, g) }
      g.merge(t, 1, (a: Integer, b: Integer) => a + b)
      i += 1
    }
  }

  def score(h: Int, r: Int, t: Int): Double = {
    val ty = typeOf(h)
    val m = if (ty >= 0) cond.get(ty.toLong * nRel + r) else null
    val c1 = if (m != null) { val v = m.get(Int.box(t)); if (v == null) 0 else v.intValue } else 0
    val g = global.get(Int.box(r))
    val c2 = if (g != null) { val v = g.get(Int.box(t)); if (v == null) 0 else v.intValue } else 0
    c1 * 1000.0 + c2 * 0.001
  }

  def update(h: Int, r: Int, t: Int, h2: Int, t2: Int, lr: Double, margin: Double): Double = 0.0
}
