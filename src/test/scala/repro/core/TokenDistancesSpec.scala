package repro.core

import org.scalatest.funsuite.AnyFunSuite
import scala.util.Random

/** Tests for SLD / NSLD (Defs. 3, 4; Lemmas 4, 5, 6; Theorems 2, 3) and the
  * greedy-token-aligning approximation.
  */
class TokenDistancesSpec extends AnyFunSuite {

  /** Brute-force SLD: min over all ways to match padded token multisets. */
  private def bruteSld(xs: Seq[String], ys: Seq[String]): Int = {
    val k = math.max(xs.size, ys.size)
    if (k == 0) return 0
    val a = xs.padTo(k, "")
    val b = ys.padTo(k, "")
    b.permutations.map(p => a.zip(p).map { case (s, t) => Levenshtein.distance(s, t) }.sum).min
  }

  private def randTokens(rnd: Random, maxTokens: Int, maxLen: Int,
                         alphabet: String = "abc"): Seq[String] =
    Seq.fill(rnd.nextInt(maxTokens + 1))(
      (1 to (1 + rnd.nextInt(maxLen))).map(_ => alphabet.charAt(rnd.nextInt(alphabet.length))).mkString)

  // --- Paper's worked examples (Sec. II-D) ---

  test("""paper example: SLD({chan, kalan}, {chank, alan}) == 2""") {
    assert(TokenDistances.sld(Seq("chan", "kalan"), Seq("chank", "alan")) == 2)
  }

  test("""paper example: SLD({chan, kalan}, {alan}) == 5""") {
    assert(TokenDistances.sld(Seq("chan", "kalan"), Seq("alan")) == 5)
  }

  test("""paper example: NSLD({chan, kalan}, {chank, alan}) == 0.2""") {
    assert(math.abs(TokenDistances.nsld(Seq("chan", "kalan"), Seq("chank", "alan")) - 0.2) < 1e-12)
  }

  // --- SLD semantics ---

  test("SLD of identical multisets is 0 regardless of order") {
    assert(TokenDistances.sld(Seq("b", "a"), Seq("a", "b")) == 0)
    assert(TokenDistances.sld(Seq("john", "mary"), Seq("mary", "john")) == 0)
  }

  test("SLD against the empty multiset is the aggregate length") {
    assert(TokenDistances.sld(Seq("abc", "de"), Seq.empty) == 5)
    assert(TokenDistances.sld(Seq.empty, Seq("abc", "de")) == 5)
    assert(TokenDistances.sld(Seq.empty, Seq.empty) == 0)
  }

  test("SLD with duplicate tokens (multiset semantics)") {
    assert(TokenDistances.sld(Seq("ana", "ana"), Seq("ana")) == 3)
    assert(TokenDistances.sld(Seq("ana", "ana"), Seq("ana", "ana")) == 0)
  }

  test("SLD matches brute force on random small multisets") {
    val rnd = new Random(20)
    for (_ <- 1 to 300) {
      val xs = randTokens(rnd, 4, 4)
      val ys = randTokens(rnd, 4, 4)
      assert(TokenDistances.sld(xs, ys) == bruteSld(xs, ys), s"($xs, $ys)")
    }
  }

  test("Lemma 4 — identity: SLD(x, x) == 0") {
    val rnd = new Random(21)
    for (_ <- 1 to 100) {
      val xs = randTokens(rnd, 5, 5)
      assert(TokenDistances.sld(xs, xs) == 0)
    }
  }

  test("Lemma 4 — symmetry") {
    val rnd = new Random(22)
    for (_ <- 1 to 200) {
      val xs = randTokens(rnd, 4, 4)
      val ys = randTokens(rnd, 4, 4)
      assert(TokenDistances.sld(xs, ys) == TokenDistances.sld(ys, xs))
    }
  }

  test("Lemma 4 — triangle inequality") {
    val rnd = new Random(23)
    for (_ <- 1 to 300) {
      val xs = randTokens(rnd, 3, 3, "ab")
      val ys = randTokens(rnd, 3, 3, "ab")
      val zs = randTokens(rnd, 3, 3, "ab")
      assert(TokenDistances.sld(xs, zs) <=
             TokenDistances.sld(xs, ys) + TokenDistances.sld(ys, zs), s"($xs, $ys, $zs)")
    }
  }

  // --- NSLD ---

  test("Lemma 5: NSLD in [0, 1]") {
    val rnd = new Random(24)
    for (_ <- 1 to 300) {
      val d = TokenDistances.nsld(randTokens(rnd, 4, 5), randTokens(rnd, 4, 5))
      assert(d >= 0.0 && d <= 1.0)
    }
  }

  test("NSLD against empty multiset is 1 (Lemma 5 extreme)") {
    assert(TokenDistances.nsld(Seq("abc"), Seq.empty) == 1.0)
    assert(TokenDistances.nsld(Seq.empty, Seq.empty) == 0.0)
  }

  test("Lemma 6 lower bound: NSLD >= 1 − L(x)/L(y) for L(y) >= L(x) > 0") {
    // Only the lower bound — the direction TSJ's length filter relies on.
    // The paper also claims NSLD <= 2/(L(x)/L(y)+2), but that direction is
    // false (see the erratum test below); its appendix proof only derives
    // the lower bound.
    val rnd = new Random(25)
    for (_ <- 1 to 300) {
      val a = randTokens(rnd, 4, 5)
      val b = randTokens(rnd, 4, 5)
      val (xs, ys) =
        if (Tokenizer.aggLength(a) <= Tokenizer.aggLength(b)) (a, b) else (b, a)
      val lx = Tokenizer.aggLength(xs).toDouble
      val ly = Tokenizer.aggLength(ys).toDouble
      if (ly > 0) {
        val d = TokenDistances.nsld(xs, ys)
        assert(d >= 1.0 - lx / ly - 1e-12, s"($xs, $ys)")
      }
    }
  }

  test("erratum: Lemma 6's claimed upper bound 2/(L(x)/L(y)+2) does not hold") {
    // SLD({ba,bbb}, {aacca}) = 7 > L(y) = 5: forced cross-size token matches
    // make SLD exceed max(L(x), L(y)), so NSLD = 14/17 > 2/3. Unlike strings
    // under NLD (Lemma 3), token multisets admit no LD <= max-length bound.
    val xs = Seq("ba", "bbb")
    val ys = Seq("aacca")
    assert(TokenDistances.sld(xs, ys) == 7)
    assert(TokenDistances.nsld(xs, ys) > 2.0 / 3.0)
  }

  test("Theorem 2 — NSLD triangle inequality") {
    val rnd = new Random(26)
    for (_ <- 1 to 500) {
      val xs = randTokens(rnd, 3, 3, "ab")
      val ys = randTokens(rnd, 3, 3, "ab")
      val zs = randTokens(rnd, 3, 3, "ab")
      assert(TokenDistances.nsld(xs, zs) <=
             TokenDistances.nsld(xs, ys) + TokenDistances.nsld(ys, zs) + 1e-12,
             s"($xs, $ys, $zs)")
    }
  }

  for (t <- Seq(0.1, 0.2, 0.3, 0.5)) {
    test(s"Theorem 3 (t=$t): NSLD <= t implies a token pair with NLD <= t") {
      val rnd = new Random(27 + (t * 100).toInt)
      var hits = 0
      for (_ <- 1 to 2000) {
        val xs = randTokens(rnd, 3, 5)
        // Perturb xs slightly so thresholds are actually exercised.
        val ys = xs.map { tok =>
          if (rnd.nextBoolean() && tok.length > 1) tok.drop(1)
          else if (rnd.nextBoolean()) tok + "a"
          else tok
        }
        if (xs.nonEmpty && ys.nonEmpty && TokenDistances.nsld(xs, ys) <= t) {
          hits += 1
          val exists = xs.exists(x => ys.exists(y => Nld.nld(x, y) <= t))
          assert(exists, s"($xs, $ys)")
        }
      }
      assert(hits > 0, "the property must actually fire")
    }
  }

  // --- Greedy approximation ---

  test("greedy SLD is an upper bound of exact SLD") {
    val rnd = new Random(28)
    for (_ <- 1 to 500) {
      val xs = randTokens(rnd, 4, 4)
      val ys = randTokens(rnd, 4, 4)
      assert(TokenDistances.sldGreedy(xs, ys) >= TokenDistances.sld(xs, ys), s"($xs, $ys)")
    }
  }

  test("greedy SLD equals 0 exactly on identical multisets") {
    val rnd = new Random(29)
    for (_ <- 1 to 100) {
      val xs = randTokens(rnd, 4, 4)
      assert(TokenDistances.sldGreedy(xs, xs.reverse) == 0)
    }
  }

  test("greedy can be suboptimal (documented behaviour)") {
    // Edge weights: (ab,b)=1 (ab,a)=1 (bbbb,b)=3 (bbbb,a)=4. Greedy grabs
    // (ab,b) and is forced into (bbbb,a): 1+4=5. Optimal crosses: 1+3=4.
    val xs = Seq("ab", "bbbb")
    val ys = Seq("b", "a")
    assert(TokenDistances.sld(xs, ys) == 4)
    assert(TokenDistances.sldGreedy(xs, ys) == 5)
  }

  test("nsldGreedy >= nsld") {
    val rnd = new Random(31)
    for (_ <- 1 to 300) {
      val xs = randTokens(rnd, 4, 4)
      val ys = randTokens(rnd, 4, 4)
      assert(TokenDistances.nsldGreedy(xs, ys) >= TokenDistances.nsld(xs, ys) - 1e-12)
    }
  }

  // --- Length-histogram lower bound (Sec. III-E.2) ---

  test("sldLengthLowerBound never exceeds the true SLD") {
    val rnd = new Random(32)
    for (_ <- 1 to 500) {
      val xs = randTokens(rnd, 4, 5)
      val ys = randTokens(rnd, 4, 5)
      val lb = TokenDistances.sldLengthLowerBound(xs.map(_.length), ys.map(_.length))
      assert(lb <= TokenDistances.sld(xs, ys), s"($xs, $ys)")
    }
  }

  test("sldLengthLowerBound is the optimal matching of the length lists") {
    // For each instance, compare against brute force over permutations.
    val rnd = new Random(33)
    for (_ <- 1 to 200) {
      val a = Seq.fill(rnd.nextInt(4))(rnd.nextInt(6))
      val b = Seq.fill(rnd.nextInt(4))(rnd.nextInt(6))
      val k = math.max(a.size, b.size)
      if (k > 0) {
        val pa = a.padTo(k, 0)
        val pb = b.padTo(k, 0)
        val brute = pb.permutations.map(p => pa.zip(p).map { case (u, v) => math.abs(u - v) }.sum).min
        assert(TokenDistances.sldLengthLowerBound(a, b) == brute, s"($a, $b)")
      }
    }
  }

  test("nsldLengthLowerBound never exceeds the true NSLD") {
    val rnd = new Random(34)
    for (_ <- 1 to 500) {
      val xs = randTokens(rnd, 4, 5)
      val ys = randTokens(rnd, 4, 5)
      val lb = TokenDistances.nsldLengthLowerBound(xs.map(_.length), ys.map(_.length))
      assert(lb <= TokenDistances.nsld(xs, ys) + 1e-12, s"($xs, $ys)")
    }
  }

  test("nsldFromSld handles the all-empty corner") {
    assert(TokenDistances.nsldFromSld(0, 0, 0) == 0.0)
  }
}
