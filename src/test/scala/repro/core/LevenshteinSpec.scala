package repro.core

import org.scalatest.funsuite.AnyFunSuite
import scala.util.Random

/** Unit and property tests for [[Levenshtein]] (Def. 1, Lemma 1). */
class LevenshteinSpec extends AnyFunSuite {

  /** Reference O(nm) DP, written independently of the implementation. */
  private def refLd(x: String, y: String): Int = {
    val dp = Array.tabulate(x.length + 1, y.length + 1) { (i, j) =>
      if (i == 0) j else if (j == 0) i else 0
    }
    for (i <- 1 to x.length; j <- 1 to y.length) {
      val c = if (x(i - 1) == y(j - 1)) 0 else 1
      dp(i)(j) = math.min(math.min(dp(i - 1)(j) + 1, dp(i)(j - 1) + 1), dp(i - 1)(j - 1) + c)
    }
    dp(x.length)(y.length)
  }

  private val knownCases = Seq(
    ("", "", 0),
    ("", "a", 1),
    ("a", "", 1),
    ("a", "a", 0),
    ("a", "b", 1),
    ("abc", "abc", 0),
    ("abc", "abd", 1),
    ("abc", "acb", 2),
    ("kitten", "sitting", 3),
    ("flaw", "lawn", 2),
    ("intention", "execution", 5),
    ("thomson", "thompson", 1),
    ("alex", "alexa", 1),
    ("chan", "chank", 1),
    ("kalan", "alan", 1),
    ("chan", "", 4),
    ("sunday", "saturday", 3),
    ("gumbo", "gambol", 2),
    ("book", "back", 2),
    ("abcdef", "fedcba", 6),
  )

  for ((x, y, d) <- knownCases) {
    test(s"""LD("$x", "$y") == $d""") {
      assert(Levenshtein.distance(x, y) == d)
    }
  }

  test("distance agrees with reference DP on random strings") {
    val rnd = new Random(1)
    for (_ <- 1 to 500) {
      val x = rnd.alphanumeric.take(rnd.nextInt(12)).mkString
      val y = rnd.alphanumeric.take(rnd.nextInt(12)).mkString
      assert(Levenshtein.distance(x, y) == refLd(x, y), s"($x, $y)")
    }
  }

  test("distance agrees with reference DP exhaustively over {a,b}^<=4") {
    val strs = for {
      len <- 0 to 4
      bits <- 0 until (1 << len)
    } yield (0 until len).map(i => if (((bits >> i) & 1) == 0) 'a' else 'b').mkString
    for (x <- strs; y <- strs)
      assert(Levenshtein.distance(x, y) == refLd(x, y), s"($x, $y)")
  }

  test("identity: LD(x, x) == 0") {
    val rnd = new Random(2)
    for (_ <- 1 to 100) {
      val x = rnd.alphanumeric.take(rnd.nextInt(15)).mkString
      assert(Levenshtein.distance(x, x) == 0)
    }
  }

  test("symmetry: LD(x, y) == LD(y, x)") {
    val rnd = new Random(3)
    for (_ <- 1 to 200) {
      val x = rnd.alphanumeric.take(rnd.nextInt(10)).mkString
      val y = rnd.alphanumeric.take(rnd.nextInt(10)).mkString
      assert(Levenshtein.distance(x, y) == Levenshtein.distance(y, x))
    }
  }

  test("triangle inequality (Lemma 1)") {
    val rnd = new Random(4)
    def s() = Seq.fill(rnd.nextInt(8))("ab".charAt(rnd.nextInt(2))).mkString
    for (_ <- 1 to 300) {
      val (x, y, z) = (s(), s(), s())
      assert(Levenshtein.distance(x, z) <=
             Levenshtein.distance(x, y) + Levenshtein.distance(y, z), s"($x, $y, $z)")
    }
  }

  test("length-difference lower bound and max-length upper bound") {
    val rnd = new Random(5)
    for (_ <- 1 to 200) {
      val x = rnd.alphanumeric.take(rnd.nextInt(12)).mkString
      val y = rnd.alphanumeric.take(rnd.nextInt(12)).mkString
      val d = Levenshtein.distance(x, y)
      assert(d >= math.abs(x.length - y.length))
      assert(d <= math.max(x.length, y.length))
    }
  }

  for (maxDist <- 0 to 6) {
    test(s"bounded(maxDist=$maxDist) matches full DP decision on random strings") {
      val rnd = new Random(100 + maxDist)
      for (_ <- 1 to 300) {
        val x = Seq.fill(rnd.nextInt(10))("abc".charAt(rnd.nextInt(3))).mkString
        val y = Seq.fill(rnd.nextInt(10))("abc".charAt(rnd.nextInt(3))).mkString
        val full = refLd(x, y)
        val b = Levenshtein.bounded(x, y, maxDist)
        if (full <= maxDist) assert(b == full, s"($x, $y): bounded=$b full=$full")
        else assert(b > maxDist, s"($x, $y): bounded=$b full=$full")
      }
    }
  }

  test("bounded with negative maxDist always reports exceeded") {
    assert(Levenshtein.bounded("a", "a", -1) > -1)
    assert(!Levenshtein.within("a", "a", -1))
  }

  test("bounded exact at the threshold boundary") {
    assert(Levenshtein.bounded("kitten", "sitting", 3) == 3)
    assert(Levenshtein.bounded("kitten", "sitting", 2) > 2)
    assert(Levenshtein.within("kitten", "sitting", 3))
    assert(!Levenshtein.within("kitten", "sitting", 2))
  }

  test("bounded handles empty strings") {
    assert(Levenshtein.bounded("", "", 0) == 0)
    assert(Levenshtein.bounded("", "abc", 3) == 3)
    assert(Levenshtein.bounded("", "abc", 2) > 2)
    assert(Levenshtein.bounded("abc", "", 5) == 3)
  }

  test("bounded with generous threshold equals exact distance") {
    val rnd = new Random(6)
    for (_ <- 1 to 200) {
      val x = rnd.alphanumeric.take(rnd.nextInt(12)).mkString
      val y = rnd.alphanumeric.take(rnd.nextInt(12)).mkString
      assert(Levenshtein.bounded(x, y, 20) == refLd(x, y), s"($x, $y)")
    }
  }
}
