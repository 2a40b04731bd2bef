package repro.tasks

import org.apache.spark.sql.SparkSession
import PretrainedSim._

/** NER for item titles (paper IV-C): recover property/value spans from
  * titles; span-level P/R/F, full-resource and k-shot (Tables V, VII).
  */
object TitleNer {

  final case class Run(model: String, p: Double, r: Double, f: Double,
                       nTrain: Int, nValid: Int)

  /** Per-token feature vector: the token under the model's encoder, its
    * neighbours, position — plus KG gazetteer tags for +KG variants.
    */
  def tokenFeatures(tokens: Seq[String], i: Int, spec: SimModel,
                    gaz: Map[String, Seq[String]]): Array[Int] = {
    val cur = tokens(i)
    val prev = if (i > 0) tokens(i - 1) else "^"
    val next = if (i + 1 < tokens.length) tokens(i + 1) else "$"
    val base = textFeatures(Seq(cur), spec.encoder, spec.dimBits) ++
      taggedFeatures(Seq(s"prev:$prev", s"next:$next", s"pos:${math.min(i, 5)}"),
        spec.dimBits)
    if (spec.useKg) {
      val tags = gaz.getOrElse(cur, Nil).map(t => s"gaz:$t") ++
        gaz.getOrElse(prev, Nil).map(t => s"gazP:$t") ++
        gaz.getOrElse(next, Nil).map(t => s"gazN:$t")
      base ++ taggedFeatures(tags, spec.dimBits)
    } else base
  }

  /** Greedy decode with BIO repair: an I-x that does not continue x
    * becomes B-x (the usual constraint fix).
    */
  def repair(tags: Seq[String]): Seq[String] = {
    val out = tags.toArray
    var i = 0
    while (i < out.length) {
      if (out(i).startsWith("I-")) {
        val typ = out(i).drop(2)
        val prevOk = i > 0 && (out(i - 1) == s"B-$typ" || out(i - 1) == s"I-$typ")
        if (!prevOk) out(i) = s"B-$typ"
      }
      i += 1
    }
    out.toSeq
  }

  def run(spark: SparkSession, examples: Seq[TaskData.NerExample],
          gaz: Map[String, Seq[String]], spec: SimModel,
          kShot: Option[Int] = None): Run = {
    val (train0, valid) = TaskData.split80(examples, (e: TaskData.NerExample) => e.itemId)
    val train = kShot.map(k => TaskData.nerKShot(train0, k)).getOrElse(train0)

    val tagVocab = (train.flatMap(_.tags) :+ "O").distinct.sorted
    val tagIdx = tagVocab.zipWithIndex.toMap

    val xs = scala.collection.mutable.ArrayBuffer[Array[Int]]()
    val ys = scala.collection.mutable.ArrayBuffer[Int]()
    train.foreach { e =>
      e.tokens.indices.foreach { i =>
        xs += tokenFeatures(e.tokens, i, spec, gaz)
        ys += tagIdx(e.tags(i))
      }
    }
    val clf = new SoftmaxClassifier(tagVocab.size, spec.dimBits, seed = 12L)
    clf.train(xs.toArray, ys.toArray, spec.epochs)

    val predSpans = valid.map { e =>
      val raw = e.tokens.indices.map(i => tagVocab(clf.predict(tokenFeatures(e.tokens, i, spec, gaz))))
      Metrics.spans(repair(raw))
    }
    val goldSpans = valid.map(e => Metrics.spans(e.tags))
    // Valid-set spans whose type never occurs in train are unknowable in
    // the k-shot protocol; keep them (they depress recall, as in the paper).
    val prf = Metrics.microPRF(predSpans, goldSpans)
    Run(spec.name, prf.p, prf.r, prf.f, train.size, valid.size)
  }
}
