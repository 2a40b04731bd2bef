package repro.tasks

/** Evaluation metrics of the downstream tasks (paper Section IV):
  * accuracy, span/triple precision-recall-F1, and ROUGE-L.
  */
object Metrics {

  final case class PRF(p: Double, r: Double, f: Double)

  def accuracy(pred: Seq[String], gold: Seq[String]): Double = {
    require(pred.length == gold.length && pred.nonEmpty)
    pred.zip(gold).count { case (a, b) => a == b }.toDouble / pred.length
  }

  /** Micro-averaged P/R/F over per-example predicted/gold item sets. */
  def microPRF[A](pred: Seq[Set[A]], gold: Seq[Set[A]]): PRF = {
    require(pred.length == gold.length)
    var tp = 0; var np = 0; var ng = 0
    pred.zip(gold).foreach { case (p, g) =>
      tp += p.count(g.contains); np += p.size; ng += g.size
    }
    val prec = if (np == 0) 0.0 else tp.toDouble / np
    val rec = if (ng == 0) 0.0 else tp.toDouble / ng
    val f = if (prec + rec == 0) 0.0 else 2 * prec * rec / (prec + rec)
    PRF(prec, rec, f)
  }

  /** BIO tag sequences → typed spans (type, start, end-exclusive). */
  def spans(tags: Seq[String]): Set[(String, Int, Int)] = {
    val out = scala.collection.mutable.Set[(String, Int, Int)]()
    var i = 0
    while (i < tags.length) {
      if (tags(i).startsWith("B-")) {
        val typ = tags(i).drop(2)
        var j = i + 1
        while (j < tags.length && tags(j) == s"I-$typ") j += 1
        out += ((typ, i, j))
        i = j
      } else i += 1
    }
    out.toSet
  }

  /** Length of the longest common subsequence. */
  def lcs[A](a: Seq[A], b: Seq[A]): Int = {
    val dp = Array.ofDim[Int](a.length + 1, b.length + 1)
    for (i <- 1 to a.length; j <- 1 to b.length)
      dp(i)(j) =
        if (a(i - 1) == b(j - 1)) dp(i - 1)(j - 1) + 1
        else math.max(dp(i - 1)(j), dp(i)(j - 1))
    dp(a.length)(b.length)
  }

  /** ROUGE-L F1 of a candidate against a reference (token level). */
  def rougeL(cand: Seq[String], ref: Seq[String]): Double = {
    if (cand.isEmpty || ref.isEmpty) return 0.0
    val l = lcs(cand, ref).toDouble
    val p = l / cand.length
    val r = l / ref.length
    if (p + r == 0) 0.0 else 2 * p * r / (p + r)
  }

  /** Corpus-level mean ROUGE-L. */
  def meanRougeL(pairs: Seq[(Seq[String], Seq[String])]): Double =
    pairs.map { case (c, r) => rougeL(c, r) }.sum / math.max(1, pairs.length)
}
