package repro.tasks

import org.apache.spark.sql.SparkSession
import PretrainedSim._

/** Salience evaluation of commonsense statements (paper IV-F): decide
  * whether ⟨leaf, relation, concept⟩ is a characteristic trait of the
  * class; accuracy (Table V).
  *
  * +KG models additionally see the QC facet statistics (typicality,
  * remarkability, support) that the construction pipeline computed from
  * the corpus — the "commonsense knowledge in OpenBG" of the paper.
  */
object SalienceEvaluation {

  final case class Run(model: String, accuracy: Double, nTrain: Int, nValid: Int)

  def features(e: TaskData.SalienceExample, spec: SimModel): (Array[Int], Array[Double]) = {
    val text = textFeatures(e.leafLabel.split(" ").toSeq ++ Seq("|") ++
      e.conceptLabel.split(" ").toSeq, spec.encoder, spec.dimBits) ++
      taggedFeatures(Seq(s"ctype:${e.ctype}", s"concept:${e.conceptLabel}"), spec.dimBits)
    val dense = if (spec.useKg) e.stats else Array(0.0, 0.0, 0.0)
    (text, dense)
  }

  def run(spark: SparkSession, examples: Seq[TaskData.SalienceExample],
          spec: SimModel): Run = {
    val (train, valid) = TaskData.split80(examples,
      (e: TaskData.SalienceExample) => s"${e.leafId}|${e.ctype}|${e.conceptLabel}")

    val feats = train.map(features(_, spec))
    val clf = new BinaryClassifier(spec.dimBits, 3, seed = 15L)
    clf.train(feats.map(_._1).toArray, feats.map(_._2).toArray,
      train.map(_.salient).toArray, spec.epochs)

    val pred = valid.map { e =>
      val (x, d) = features(e, spec)
      if (clf.predict(x, d)) "1" else "0"
    }
    val gold = valid.map(e => if (e.salient) "1" else "0")
    Run(spec.name, Metrics.accuracy(pred, gold), train.size, valid.size)
  }
}
