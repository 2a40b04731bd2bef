package repro.tasks

import repro.synth.Vocab

/** Simulated "pre-trained model" family for the downstream tasks
  * (paper Section IV, Tables V–VII).
  *
  * The paper compares general-domain pre-trained models (RoBERTa, BERT,
  * mT5, UIE), an e-commerce vision-language model (mPLUG base/large),
  * and OpenBG-enhanced variants (+KG). Here each "model" is an identical
  * learner whose *inputs* encode the pre-training differences:
  *
  *  - encoder: a general-domain encoder reads text as character n-grams
  *    (subword segmentation without domain knowledge); the e-commerce
  *    encoder (mPLUG) reads clean domain word tokens.
  *  - useKg: the +KG variants additionally see KG-derived features
  *    (attribute triples, taxonomy, lexicons, concept statistics).
  *  - dimBits/epochs: capacity (base vs large).
  *
  * This keeps the causal structure of the comparison: every +KG delta in
  * our tables comes from the constructed KG, not from learner tweaks.
  */
object PretrainedSim {

  sealed trait Encoder extends Serializable
  case object GeneralChar extends Encoder
  case object DomainWord extends Encoder

  final case class SimModel(
      name: String,
      encoder: Encoder,
      useKg: Boolean,
      dimBits: Int,
      epochs: Int)

  /** Table V/VI/VII cast. */
  val RobertaLarge: SimModel = SimModel("RoBERTa-large", GeneralChar, useKg = false, 15, 30)
  val RobertaBaseKg: SimModel = SimModel("RoBERTa-base+KG", GeneralChar, useKg = true, 13, 15)
  val Uie: SimModel = SimModel("UIE", GeneralChar, useKg = false, 13, 18)
  val Mt5: SimModel = SimModel("mT5", GeneralChar, useKg = false, 14, 22)
  val Bert: SimModel = SimModel("BERT", GeneralChar, useKg = false, 13, 15)
  val MplugBase: SimModel = SimModel("mPLUG-base", DomainWord, useKg = false, 13, 15)
  val MplugBaseKg: SimModel = SimModel("mPLUG-base+KG", DomainWord, useKg = true, 13, 15)
  val MplugLargeKg: SimModel = SimModel("mPLUG-large+KG", DomainWord, useKg = true, 15, 30)

  /** Hashed feature indices of a token sequence under an encoder. */
  def textFeatures(tokens: Seq[String], enc: Encoder, dimBits: Int): Array[Int] = {
    val dim = 1 << dimBits
    val out = scala.collection.mutable.ArrayBuffer[Int]()
    enc match {
      case DomainWord =>
        // clean word unigrams + bigrams
        tokens.foreach(t => out += idx(Vocab.mix(t.hashCode.toLong * 31 + 1), dim))
        tokens.sliding(2).foreach { bg =>
          if (bg.length == 2)
            out += idx(Vocab.mix(bg.mkString("_").hashCode.toLong * 31 + 2), dim)
        }
      case GeneralChar =>
        // character trigrams of the raw string (no segmentation knowledge)
        val s = "^" + tokens.mkString(" ") + "$"
        var i = 0
        while (i + 3 <= s.length) {
          out += idx(Vocab.mix(s.substring(i, i + 3).hashCode.toLong * 31 + 3), dim)
          i += 1
        }
    }
    out.toArray
  }

  /** Extra feature indices from arbitrary tagged strings (KG features,
    * gazetteer flags, …) in a reserved hash namespace.
    */
  def taggedFeatures(tags: Seq[String], dimBits: Int): Array[Int] = {
    val dim = 1 << dimBits
    tags.map(t => idx(Vocab.mix(t.hashCode.toLong * 31 + 7), dim)).toArray
  }

  private def idx(h: Long, dim: Int): Int = math.floorMod(h, dim).toInt

  // ------------------------------------------------------------- classifiers

  /** Multinomial logistic regression over sparse binary features,
    * trained with SGD; deterministic in the seed.
    */
  final class SoftmaxClassifier(val nClasses: Int, val dimBits: Int, seed: Long = 3L)
      extends Serializable {
    private val dim = 1 << dimBits
    val w: Array[Array[Float]] = Array.fill(nClasses)(new Array[Float](dim))
    val b: Array[Float] = new Array[Float](nClasses)

    def scores(x: Array[Int]): Array[Double] = {
      val out = new Array[Double](nClasses)
      var c = 0
      while (c < nClasses) {
        var s = b(c).toDouble
        val wc = w(c)
        var i = 0
        while (i < x.length) { s += wc(x(i)); i += 1 }
        out(c) = s
        c += 1
      }
      out
    }

    def predict(x: Array[Int]): Int = {
      val s = scores(x)
      var best = 0; var c = 1
      while (c < nClasses) { if (s(c) > s(best)) best = c; c += 1 }
      best
    }

    def train(xs: Array[Array[Int]], ys: Array[Int], epochs: Int, lr0: Double = 0.5): Unit = {
      val rnd = new java.util.Random(seed)
      val order = Array.tabulate(xs.length)(identity)
      var e = 0
      while (e < epochs) {
        var i = xs.length - 1
        while (i > 0) {
          val j = rnd.nextInt(i + 1); val t = order(i); order(i) = order(j); order(j) = t
          i -= 1
        }
        val lr = lr0 / (1.0 + 0.3 * e)
        var k = 0
        while (k < xs.length) {
          val x = xs(order(k)); val y = ys(order(k))
          val s = scores(x)
          // softmax gradient
          var mx = s(0); var c = 1
          while (c < nClasses) { if (s(c) > mx) mx = s(c); c += 1 }
          var z = 0.0
          c = 0; while (c < nClasses) { z += math.exp(s(c) - mx); c += 1 }
          c = 0
          while (c < nClasses) {
            val p = math.exp(s(c) - mx) / z
            val g = p - (if (c == y) 1.0 else 0.0)
            if (math.abs(g) > 1e-8) {
              val step = (lr * g).toFloat
              val wc = w(c)
              var i2 = 0
              while (i2 < x.length) { wc(x(i2)) -= step; i2 += 1 }
              b(c) -= step
            }
            c += 1
          }
          k += 1
        }
        e += 1
      }
    }
  }

  /** Binary logistic regression over sparse indices + dense extras. */
  final class BinaryClassifier(val dimBits: Int, val nDense: Int, seed: Long = 4L)
      extends Serializable {
    private val dim = 1 << dimBits
    val w: Array[Float] = new Array[Float](dim)
    val wd: Array[Float] = new Array[Float](nDense)
    var b: Float = 0f

    def score(x: Array[Int], d: Array[Double]): Double = {
      var s = b.toDouble
      var i = 0
      while (i < x.length) { s += w(x(i)); i += 1 }
      i = 0
      while (i < nDense) { s += wd(i) * d(i); i += 1 }
      s
    }

    def predict(x: Array[Int], d: Array[Double]): Boolean = score(x, d) > 0

    def train(xs: Array[Array[Int]], ds: Array[Array[Double]], ys: Array[Boolean],
              epochs: Int, lr0: Double = 0.3): Unit = {
      val rnd = new java.util.Random(seed)
      val order = Array.tabulate(xs.length)(identity)
      var e = 0
      while (e < epochs) {
        var i = xs.length - 1
        while (i > 0) {
          val j = rnd.nextInt(i + 1); val t = order(i); order(i) = order(j); order(j) = t
          i -= 1
        }
        val lr = lr0 / (1.0 + 0.3 * e)
        var k = 0
        while (k < xs.length) {
          val o = order(k)
          val x = xs(o); val d = ds(o)
          val y = if (ys(o)) 1.0 else 0.0
          val p = 1.0 / (1.0 + math.exp(-score(x, d)))
          val g = p - y
          if (math.abs(g) > 1e-9) {
            val step = (lr * g).toFloat
            var i2 = 0
            while (i2 < x.length) { w(x(i2)) -= step; i2 += 1 }
            i2 = 0
            while (i2 < nDense) { wd(i2) -= (step * d(i2)).toFloat; i2 += 1 }
            b -= step
          }
          k += 1
        }
        e += 1
      }
    }
  }
}
