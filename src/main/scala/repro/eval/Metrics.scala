package repro.eval

/** Evaluation metrics (Sec. 5.2): Exact Match, SQuAD-style token F1 and
  * coverage for phrase mining; macro/micro/weighted F1 for the 4-class
  * event key-elements task.
  *
  * Empty predictions score 0 on EM/F1 but still count in the denominator —
  * consistent with the paper (Match has F1 ≈ COV × partial-F1).
  */
object Metrics {

  def em(pred: Seq[String], gold: Seq[String]): Double = if (pred == gold) 1.0 else 0.0

  /** Token-multiset overlap F1 (Rajpurkar et al. 2016). */
  def f1(pred: Seq[String], gold: Seq[String]): Double = {
    if (pred.isEmpty || gold.isEmpty) return 0.0
    val pc = pred.groupBy(identity).view.mapValues(_.size)
    val gc = gold.groupBy(identity).view.mapValues(_.size)
    val overlap = pc.map { case (t, c) => math.min(c, gc.getOrElse(t, 0)) }.sum
    if (overlap == 0) return 0.0
    val p = overlap.toDouble / pred.size
    val r = overlap.toDouble / gold.size
    2 * p * r / (p + r)
  }

  /** Aggregate EM / F1 / COV over (pred, gold) pairs. */
  def phraseScores(pairs: Seq[(Seq[String], Seq[String])]): (Double, Double, Double) = {
    require(pairs.nonEmpty, "no evaluation pairs")
    val n = pairs.size.toDouble
    val emS = pairs.map { case (p, g) => em(p, g) }.sum / n
    val f1S = pairs.map { case (p, g) => f1(p, g) }.sum / n
    val cov = pairs.count(_._1.nonEmpty) / n
    (emS, f1S, cov)
  }

  /** Per-class precision/recall/F1 plus macro, micro and weighted averages.
    *
    * @param pairs (gold class, predicted class) per token
    */
  def classF1s(pairs: Seq[(Int, Int)], numClasses: Int): (Double, Double, Double) = {
    require(pairs.nonEmpty, "no classification pairs")
    val tp = new Array[Double](numClasses)
    val fp = new Array[Double](numClasses)
    val fn = new Array[Double](numClasses)
    for ((g, p) <- pairs) {
      if (g == p) tp(g) += 1
      else { fp(p) += 1; fn(g) += 1 }
    }
    def f1Of(c: Int): Double = {
      val denomP = tp(c) + fp(c); val denomR = tp(c) + fn(c)
      if (denomP == 0 || denomR == 0 || tp(c) == 0) 0.0
      else {
        val p = tp(c) / denomP; val r = tp(c) / denomR
        2 * p * r / (p + r)
      }
    }
    val support = (0 until numClasses).map(c => tp(c) + fn(c))
    val macroF1 = (0 until numClasses).map(f1Of).sum / numClasses
    val microF1 = { // single-label multi-class micro-F1 = accuracy
      val correct = tp.sum
      correct / pairs.size
    }
    val weighted = (0 until numClasses).map(c => f1Of(c) * support(c)).sum / math.max(1.0, support.sum)
    (macroF1, microF1, weighted)
  }
}
