package repro.core

/** Levenshtein Distance (Def. 1 of the paper) — character-level insertions,
  * deletions and substitutions.
  *
  * Two variants are provided: the classic full dynamic program, and a banded
  * ("threshold-bounded") dynamic program used by the join verification path,
  * which only fills cells within `maxDist` of the diagonal and abandons early
  * once the distance is known to exceed the threshold.
  */
object Levenshtein {

  /** Exact LD via the two-row dynamic program. O(|x|·|y|) time, O(min) space. */
  def distance(x: String, y: String): Int = {
    if (x eq y) return 0
    val (a, b) = if (x.length <= y.length) (x, y) else (y, x)
    val n = a.length
    val m = b.length
    if (n == 0) return m
    var prev = Array.tabulate(n + 1)(identity)
    var curr = new Array[Int](n + 1)
    var j = 1
    while (j <= m) {
      curr(0) = j
      val bj = b.charAt(j - 1)
      var i = 1
      while (i <= n) {
        val cost = if (a.charAt(i - 1) == bj) 0 else 1
        curr(i) = math.min(math.min(curr(i - 1) + 1, prev(i) + 1), prev(i - 1) + cost)
        i += 1
      }
      val t = prev; prev = curr; curr = t
      j += 1
    }
    prev(n)
  }

  /** Banded LD: returns `LD(x, y)` if it is `<= maxDist`, otherwise some value
    * `> maxDist` (the exact value is not meaningful past the threshold).
    *
    * Only the diagonal band `|i - j| <= maxDist` is evaluated, giving
    * O(maxDist · min(|x|,|y|)) time. `maxDist < 0` always reports exceeded.
    */
  def bounded(x: String, y: String, maxDist: Int): Int = {
    if (maxDist < 0) return Int.MaxValue / 2
    val (a, b) = if (x.length <= y.length) (x, y) else (y, x)
    val n = a.length
    val m = b.length
    if (m - n > maxDist) return maxDist + 1
    if (n == 0) return m
    val big = maxDist + 1
    var prev = new Array[Int](n + 1)
    var curr = new Array[Int](n + 1)
    var i = 0
    while (i <= n) { prev(i) = if (i <= maxDist) i else big; i += 1 }
    var j = 1
    while (j <= m) {
      val lo = math.max(1, j - maxDist)
      val hi = math.min(n, j + maxDist)
      curr(0) = if (j <= maxDist) j else big
      if (lo > 1) curr(lo - 1) = big
      val bj = b.charAt(j - 1)
      val bandLo = math.max(0, j - maxDist) // leftmost in-band column this row
      var rowMin = if (bandLo == 0) curr(0) else big
      i = lo
      while (i <= hi) {
        val cost = if (a.charAt(i - 1) == bj) 0 else 1
        val del = if (i - 1 >= bandLo) curr(i - 1) + 1 else big
        val ins = if (i - j < maxDist) prev(i) + 1 else big
        val sub = prev(i - 1) + cost
        val v = math.min(math.min(del, ins), sub)
        curr(i) = math.min(v, big)
        if (curr(i) < rowMin) rowMin = curr(i)
        i += 1
      }
      if (hi < n) curr(hi + 1) = big
      if (rowMin > maxDist) return maxDist + 1
      val t = prev; prev = curr; curr = t
      j += 1
    }
    prev(n)
  }

  /** True iff `LD(x, y) <= maxDist`. */
  def within(x: String, y: String, maxDist: Int): Boolean =
    bounded(x, y, maxDist) <= maxDist
}
