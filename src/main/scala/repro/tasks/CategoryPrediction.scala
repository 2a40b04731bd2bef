package repro.tasks

import org.apache.spark.sql.SparkSession
import PretrainedSim._

/** Category prediction (paper IV-B): link an item to its leaf category —
  * evaluated with accuracy, full-resource and k-shot (Tables V, VI).
  */
object CategoryPrediction {

  final case class Run(model: String, accuracy: Double, nTrain: Int, nValid: Int)

  def features(e: TaskData.CatExample, spec: SimModel): Array[Int] = {
    val text = textFeatures(e.title, spec.encoder, spec.dimBits)
    if (spec.useKg && e.kgTokens.nonEmpty)
      text ++ taggedFeatures(e.kgTokens.map("kg:" + _), spec.dimBits) ++
        taggedFeatures(e.kgTokens.sliding(2).map(p => "kg2:" + p.mkString("_")).toSeq,
          spec.dimBits)
    else text
  }

  def run(spark: SparkSession, examples: Seq[TaskData.CatExample], spec: SimModel,
          kShot: Option[Int] = None): Run = {
    val (train0, valid) = TaskData.split80(examples, (e: TaskData.CatExample) => e.itemId)
    val train = kShot.map(k => TaskData.kShot(train0, k)).getOrElse(train0)
    val labels = examples.map(_.label).distinct.sorted
    val labelIdx = labels.zipWithIndex.toMap

    val xs = train.map(features(_, spec)).toArray
    val ys = train.map(e => labelIdx(e.label)).toArray
    val clf = new SoftmaxClassifier(labels.size, spec.dimBits, seed = 11L)
    clf.train(xs, ys, spec.epochs)

    val pred = valid.map(e => labels(clf.predict(features(e, spec))))
    val acc = Metrics.accuracy(pred, valid.map(_.label))
    Run(spec.name, acc, train.size, valid.size)
  }
}
