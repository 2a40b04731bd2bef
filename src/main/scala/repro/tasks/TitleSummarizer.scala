package repro.tasks

import org.apache.spark.sql.SparkSession
import PretrainedSim._

/** Title summarization (paper IV-D): compress an expatiatory item title
  * to its informative core; extractive keep/drop formulation, evaluated
  * with ROUGE-L against the gold short title (Table V).
  */
object TitleSummarizer {

  final case class Run(model: String, rougeL: Double, nTrain: Int, nValid: Int)

  def tokenFeatures(tokens: Seq[String], i: Int, spec: SimModel,
                    gaz: Map[String, Seq[String]]): Array[Int] = {
    val cur = tokens(i)
    val base = textFeatures(Seq(cur), spec.encoder, spec.dimBits) ++
      taggedFeatures(Seq(
        s"pos:${math.min(i, 7)}",
        s"relpos:${(i * 4) / math.max(1, tokens.length)}",
        s"len:${math.min(cur.length, 8)}"), spec.dimBits)
    if (spec.useKg) {
      // KG knows which surface forms are brands / categories / attribute
      // values — exactly the tokens worth keeping. Collapsed to coarse
      // roles: token-level keep/drop only needs the role, and per-attribute
      // tags fragment under the shared value vocabularies.
      val roles = gaz.getOrElse(cur, Nil).map {
        case "Brand" => "brand"; case "Category" => "category"; case _ => "value"
      }.distinct
      val kgTag = if (roles.isEmpty) Seq("gaz:none") else roles.map(r => s"gaz:$r")
      base ++ taggedFeatures(kgTag, spec.dimBits)
    } else base
  }

  def run(spark: SparkSession, examples: Seq[TaskData.SummExample],
          gaz: Map[String, Seq[String]], spec: SimModel): Run = {
    val (train, valid) = TaskData.split80(examples, (e: TaskData.SummExample) => e.itemId)

    val xs = scala.collection.mutable.ArrayBuffer[Array[Int]]()
    val ds = scala.collection.mutable.ArrayBuffer[Array[Double]]()
    val ys = scala.collection.mutable.ArrayBuffer[Boolean]()
    train.foreach { e =>
      e.tokens.indices.foreach { i =>
        xs += tokenFeatures(e.tokens, i, spec, gaz)
        ds += Array.empty[Double]
        ys += e.keep(i)
      }
    }
    val clf = new BinaryClassifier(spec.dimBits, 0, seed = 13L)
    // Keep/drop labels on value tokens are intrinsically ambiguous (the
    // gold keeps one of several); long training only overfits that noise.
    clf.train(xs.toArray, ds.toArray, ys.toArray, math.min(spec.epochs, 18))

    val pairs = valid.map { e =>
      val kept = e.tokens.indices
        .filter(i => clf.predict(tokenFeatures(e.tokens, i, spec, gaz), Array.empty))
        .map(e.tokens)
      (kept: Seq[String], e.gold)
    }
    Run(spec.name, Metrics.meanRougeL(pairs), train.size, valid.size)
  }
}
