package repro.eval

/** ROC curve and AUC for a binary classifier scored by a distance: higher
  * score = predicted positive (fraud). Used for the Fig. 6 study.
  */
object Roc {

  final case class Point(fpr: Double, tpr: Double)

  /** AUC by the Mann–Whitney rank statistic, with the standard midrank tie
    * correction. `scored` is `(score, isPositive)`.
    */
  def auc(scored: Seq[(Double, Boolean)]): Double = {
    val pos = scored.count(_._2).toDouble
    val neg = scored.size - pos
    require(pos > 0 && neg > 0, "AUC needs both classes")
    // Midranks of the scores.
    val sorted = scored.sortBy(_._1)
    var i = 0
    var rankSumPos = 0.0
    while (i < sorted.length) {
      var j = i
      while (j + 1 < sorted.length && sorted(j + 1)._1 == sorted(i)._1) j += 1
      val midrank = (i + j + 2) / 2.0 // ranks are 1-based
      var k = i
      while (k <= j) {
        if (sorted(k)._2) rankSumPos += midrank
        k += 1
      }
      i = j + 1
    }
    (rankSumPos - pos * (pos + 1) / 2.0) / (pos * neg)
  }

  /** The full ROC curve: one point per distinct threshold, plus (0,0), (1,1).
    * Thresholds sweep from high to low score, classifying `score >= thr` as
    * positive.
    */
  def curve(scored: Seq[(Double, Boolean)]): Seq[Point] = {
    val pos = scored.count(_._2).toDouble
    val neg = scored.size - pos
    val byScoreDesc = scored.sortBy(-_._1)
    val pts = Vector.newBuilder[Point]
    pts += Point(0, 0)
    var tp = 0.0
    var fp = 0.0
    var i = 0
    while (i < byScoreDesc.length) {
      var j = i
      while (j + 1 < byScoreDesc.length && byScoreDesc(j + 1)._1 == byScoreDesc(i)._1) j += 1
      var k = i
      while (k <= j) {
        if (byScoreDesc(k)._2) tp += 1 else fp += 1
        k += 1
      }
      pts += Point(fp / neg, tp / pos)
      i = j + 1
    }
    pts.result()
  }

  /** TPR at the largest curve point with `fpr <= target` (for table rows). */
  def tprAtFpr(scored: Seq[(Double, Boolean)], target: Double): Double =
    curve(scored).filter(_.fpr <= target + 1e-12).map(_.tpr).max
}
