package repro.core

/** Normalized Levenshtein Distance (Def. 2, after Li & Liu 2007) and the
  * paper's threshold-conversion lemmas used by the join machinery.
  *
  * `NLD(x, y) = 2·LD(x, y) / (|x| + |y| + LD(x, y))`, a metric in [0, 1].
  */
object Nld {

  /** Exact NLD. Two empty strings are at distance 0. */
  def nld(x: String, y: String): Double = {
    if (x.isEmpty && y.isEmpty) return 0.0
    val ld = Levenshtein.distance(x, y)
    2.0 * ld / (x.length + y.length + ld)
  }

  /** NLD computed from a known LD value. */
  def fromLd(lenX: Int, lenY: Int, ld: Int): Double =
    if (lenX == 0 && lenY == 0) 0.0 else 2.0 * ld / (lenX + lenY + ld)

  /** Lemma 8: largest LD compatible with `NLD <= t` for the given lengths.
    *
    * If `|x| <= |y|` then `LD <= floor(2·t·|y| / (2−t))`; if `|x| > |y|` then
    * `LD <= floor(t·|y| / (1−t))` (`|y|` being the shorter). Both directions
    * are applied, and the trivial bound `LD <= max(|x|, |y|)` caps the result.
    */
  def maxLdFor(lenX: Int, lenY: Int, t: Double): Int = {
    require(t >= 0 && t < 1, s"threshold out of range: $t")
    val lo = math.min(lenX, lenY)
    val hi = math.max(lenX, lenY)
    val symBound = math.floor(2.0 * t * hi / (2.0 - t)).toInt
    val asymBound =
      if (lo == hi) Int.MaxValue
      else math.floor(t * lo / (1.0 - t)).toInt
    math.min(hi, math.min(symBound, asymBound))
  }

  /** Lemma 8's segment-count bound in terms of the longer length only:
    * `U(L) = floor(2·t·L / (2−t))`. PassJoin partitions the longer (indexed)
    * string into `U + 1` segments.
    */
  def maxLdForLongerLen(longerLen: Int, t: Double): Int = {
    require(t >= 0 && t < 1, s"threshold out of range: $t")
    math.floor(2.0 * t * longerLen / (2.0 - t)).toInt
  }

  /** Lemma 9 length condition: with `|x| <= |y|` and `NLD(x,y) <= t`, the
    * shorter length must satisfy `ceil((1−t)·|y|) <= |x|`.
    */
  def minShorterLen(longerLen: Int, t: Double): Int =
    math.ceil((1.0 - t) * longerLen).toInt

  /** Largest longer-length `|y|` a shorter string of length `lenX` may pair
    * with under `NLD <= t` (inverse of Lemma 9): all `|y|` with
    * `ceil((1−t)·|y|) <= lenX`.
    */
  def maxLongerLen(lenX: Int, t: Double): Int = {
    var hi = if (t >= 1.0) Int.MaxValue else math.floor(lenX / (1.0 - t)).toInt + 1
    while (minShorterLen(hi, t) > lenX) hi -= 1
    hi
  }

  /** Lemma 10: a strict lower bound on LD implied by `NLD > t`.
    * If `|x| <= |y|`: `LD > floor(t·|y| / (2−t))`; else
    * `LD > floor(2·t·|y| / (2−t))` (`|y|` the shorter).
    */
  def ldLowerBoundExclusive(lenX: Int, lenY: Int, t: Double): Int = {
    val (shorter, longer) = (math.min(lenX, lenY), math.max(lenX, lenY))
    if (lenX == lenY || longer == lenY)
      math.floor(t * longer / (2.0 - t)).toInt
    else
      math.floor(2.0 * t * shorter / (2.0 - t)).toInt
  }

  /** True iff `NLD(x, y) <= t`, using the banded LD for early abandon. */
  def within(x: String, y: String, t: Double): Boolean = {
    val u = maxLdFor(x.length, y.length, t)
    val ld = Levenshtein.bounded(x, y, u)
    ld <= u && fromLd(x.length, y.length, ld) <= t
  }
}
