package repro.tasks

import org.apache.spark.sql.SparkSession
import PretrainedSim._

/** IE for reviews (paper IV-E): extract ⟨aspect, attribute, opinion⟩
  * triples from customer reviews; micro P/R/F (Table V).
  *
  * Formulation: template candidate generation ("the A of B is C") —
  * reviews also contain filler distractors matching the template — and a
  * learned accept/reject classifier whose features differ per model.
  */
object ReviewIE {

  final case class Run(model: String, p: Double, r: Double, f: Double,
                       nTrain: Int, nValid: Int)

  /** Candidate (aspect=B, attr=A, opinion=C) triples from the template. */
  def candidates(text: String): Seq[(String, String, String)] = {
    val toks = text.split("\\s+")
    val out = scala.collection.mutable.ArrayBuffer[(String, String, String)]()
    var i = 0
    while (i + 5 < toks.length) {
      if (toks(i) == "the" && toks(i + 2) == "of" && toks(i + 4) == "is")
        out += ((toks(i + 3), toks(i + 1), toks(i + 5)))
      i += 1
    }
    out.toSeq
  }

  def candFeatures(c: (String, String, String), spec: SimModel,
                   attrLex: Set[String]): Array[Int] = {
    val (b, a, op) = c
    val base = textFeatures(Seq(a, b, op), spec.encoder, spec.dimBits) ++
      taggedFeatures(Seq(s"A:$a", s"B:$b"), spec.dimBits)
    if (spec.useKg)
      base ++ taggedFeatures(Seq(
        if (attrLex.contains(a)) "kg:attrHit" else "kg:attrMiss",
        if (attrLex.contains(b)) "kg:aspectIsAttr" else "kg:aspectNotAttr"),
        spec.dimBits)
    else base
  }

  def run(spark: SparkSession, examples: Seq[TaskData.IeExample],
          attrLex: Set[String], spec: SimModel): Run = {
    val (train, valid) = TaskData.split80(examples, (e: TaskData.IeExample) => e.reviewId)

    val xs = scala.collection.mutable.ArrayBuffer[Array[Int]]()
    val ds = scala.collection.mutable.ArrayBuffer[Array[Double]]()
    val ys = scala.collection.mutable.ArrayBuffer[Boolean]()
    train.foreach { e =>
      candidates(e.text).foreach { c =>
        xs += candFeatures(c, spec, attrLex)
        ds += Array.empty[Double]
        ys += e.gold.contains(c)
      }
    }
    val clf = new BinaryClassifier(spec.dimBits, 0, seed = 14L)
    clf.train(xs.toArray, ds.toArray, ys.toArray, spec.epochs)

    val pred = valid.map { e =>
      candidates(e.text).filter(c => clf.predict(candFeatures(c, spec, attrLex), Array.empty))
        .toSet
    }
    val prf = Metrics.microPRF(pred, valid.map(_.gold))
    Run(spec.name, prf.p, prf.r, prf.f, train.size, valid.size)
  }
}
