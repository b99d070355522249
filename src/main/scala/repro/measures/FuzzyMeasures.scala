package repro.measures

import repro.core.{Hungarian, Nld}

/** Weighted fuzzy set-based similarity measures of Wang et al., TODS 2014
  * ("Extending String Similarity Join to Tolerant Fuzzy Token Matching") —
  * the baselines of the paper's Fig. 6 ROC study (Sec. V-D).
  *
  * Two tokens may "fuzzily match" only when their token similarity
  * `1 − NLD` reaches the token threshold `delta` (the measures' first,
  * independent threshold T1 — the tuning drawback the paper criticizes).
  * The *fuzzy overlap* is the maximum-weight matching of the token bigraph
  * restricted to such edges, each edge weighted
  * `sim(x, y) · (w(x) + w(y)) / 2` for token weights `w` (IDF here, giving
  * the "weighted" variants). The overlap is then plugged into the
  * Jaccard / cosine / Dice forms.
  */
object FuzzyMeasures {

  /** IDF weights over a token corpus: `w(tok) = ln(1 + N / df(tok))`. */
  def idfWeights(corpus: Seq[Seq[String]]): Map[String, Double] = {
    val n = corpus.size.toDouble
    val df = corpus.iterator.flatMap(_.distinct).toSeq.groupBy(identity).view.mapValues(_.size)
    df.map { case (tok, d) => tok -> math.log1p(n / d) }.toMap
  }

  /** Token similarity: `1 − NLD` (an edit-similarity in [0, 1]). */
  def tokenSim(a: String, b: String): Double = 1.0 - Nld.nld(a, b)

  /** Max-weight fuzzy overlap of two token multisets under threshold `delta`. */
  def fuzzyOverlap(xs: Seq[String], ys: Seq[String],
                   w: String => Double, delta: Double): Double = {
    if (xs.isEmpty || ys.isEmpty) return 0.0
    val (rows, cols) = if (xs.size <= ys.size) (xs, ys) else (ys, xs)
    val weights = Array.tabulate(rows.size, cols.size) { (i, j) =>
      val s = tokenSim(rows(i), cols(j))
      if (s >= delta) s * (w(rows(i)) + w(cols(j))) / 2.0 else 0.0
    }
    Hungarian.maxWeight(weights)._1
  }

  private def totalWeight(ts: Seq[String], w: String => Double): Double =
    ts.iterator.map(w).sum

  /** Weighted fuzzy-Jaccard similarity. */
  def fJaccard(xs: Seq[String], ys: Seq[String], w: String => Double, delta: Double): Double = {
    if (xs.isEmpty && ys.isEmpty) return 1.0
    val o = fuzzyOverlap(xs, ys, w, delta)
    val denom = totalWeight(xs, w) + totalWeight(ys, w) - o
    if (denom <= 0) 0.0 else math.min(1.0, o / denom)
  }

  /** Weighted fuzzy-cosine similarity (clamped to [0, 1]). */
  def fCosine(xs: Seq[String], ys: Seq[String], w: String => Double, delta: Double): Double = {
    if (xs.isEmpty && ys.isEmpty) return 1.0
    val wx = totalWeight(xs, w)
    val wy = totalWeight(ys, w)
    if (wx <= 0 || wy <= 0) return 0.0
    math.min(1.0, fuzzyOverlap(xs, ys, w, delta) / math.sqrt(wx * wy))
  }

  /** Weighted fuzzy-Dice similarity. */
  def fDice(xs: Seq[String], ys: Seq[String], w: String => Double, delta: Double): Double = {
    if (xs.isEmpty && ys.isEmpty) return 1.0
    val denom = totalWeight(xs, w) + totalWeight(ys, w)
    if (denom <= 0) 0.0 else math.min(1.0, 2.0 * fuzzyOverlap(xs, ys, w, delta) / denom)
  }
}
