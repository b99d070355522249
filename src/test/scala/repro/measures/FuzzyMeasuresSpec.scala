package repro.measures

import org.scalatest.funsuite.AnyFunSuite
import scala.util.Random

/** Tests for the weighted fuzzy set-based similarity baselines (Wang et al.). */
class FuzzyMeasuresSpec extends AnyFunSuite {

  private val unitW: String => Double = _ => 1.0

  private def randTokens(rnd: Random, maxTokens: Int): Seq[String] =
    Seq.fill(1 + rnd.nextInt(maxTokens))(
      (1 to (2 + rnd.nextInt(5))).map(_ => "abcd".charAt(rnd.nextInt(4))).mkString)

  test("tokenSim of identical tokens is 1") {
    assert(FuzzyMeasures.tokenSim("anna", "anna") == 1.0)
  }

  test("tokenSim of disjoint tokens is low") {
    assert(FuzzyMeasures.tokenSim("aaaa", "bbbb") < 0.5)
  }

  test("identical sets have similarity 1 under all measures") {
    val xs = Seq("maria", "silva")
    for (f <- Seq(FuzzyMeasures.fJaccard _, FuzzyMeasures.fCosine _, FuzzyMeasures.fDice _))
      assert(math.abs(f(xs, xs, unitW, 0.8) - 1.0) < 1e-9)
  }

  test("disjoint dissimilar sets have similarity 0") {
    val xs = Seq("aaaa")
    val ys = Seq("zzzz")
    for (f <- Seq(FuzzyMeasures.fJaccard _, FuzzyMeasures.fCosine _, FuzzyMeasures.fDice _))
      assert(f(xs, ys, unitW, 0.8) == 0.0)
  }

  test("all measures stay within [0, 1]") {
    val rnd = new Random(1)
    for (_ <- 1 to 300) {
      val xs = randTokens(rnd, 4)
      val ys = randTokens(rnd, 4)
      for (f <- Seq(FuzzyMeasures.fJaccard _, FuzzyMeasures.fCosine _, FuzzyMeasures.fDice _)) {
        val s = f(xs, ys, unitW, 0.7)
        assert(s >= 0.0 && s <= 1.0, s"($xs, $ys) -> $s")
      }
    }
  }

  test("measures are symmetric") {
    val rnd = new Random(2)
    for (_ <- 1 to 200) {
      val xs = randTokens(rnd, 4)
      val ys = randTokens(rnd, 4)
      for (f <- Seq(FuzzyMeasures.fJaccard _, FuzzyMeasures.fCosine _, FuzzyMeasures.fDice _))
        assert(math.abs(f(xs, ys, unitW, 0.7) - f(ys, xs, unitW, 0.7)) < 1e-9)
    }
  }

  test("fuzzy overlap counts near-matching tokens above delta") {
    // "thomson" vs "thompson": sim = 1 − 1/8 = 0.875 >= 0.8 — matched.
    val o = FuzzyMeasures.fuzzyOverlap(Seq("thomson"), Seq("thompson"), unitW, 0.8)
    assert(math.abs(o - 0.875) < 1e-9)
    // Below delta the same pair contributes nothing.
    assert(FuzzyMeasures.fuzzyOverlap(Seq("thomson"), Seq("thompson"), unitW, 0.9) == 0.0)
  }

  test("threshold quantization: small sub-delta edits zero out the overlap") {
    // This is the drawback the paper exploits in Fig. 6: a graded edit just
    // below the token threshold looks like a completely different token.
    val near = FuzzyMeasures.fJaccard(Seq("william", "smith"), Seq("wlm", "smith"), unitW, 0.8)
    val far = FuzzyMeasures.fJaccard(Seq("william", "smith"), Seq("qqqqqqq", "smith"), unitW, 0.8)
    assert(math.abs(near - far) < 1e-9, "both collapse to the shared-token-only overlap")
  }

  test("overlap respects one-to-one matching (no token reuse)") {
    // Two copies of "anna" on one side cannot both match a single "anna".
    val o = FuzzyMeasures.fuzzyOverlap(Seq("anna", "anna"), Seq("anna"), unitW, 0.9)
    assert(math.abs(o - 1.0) < 1e-9)
  }

  test("empty token sets") {
    assert(FuzzyMeasures.fJaccard(Seq.empty, Seq.empty, unitW, 0.8) == 1.0)
    assert(FuzzyMeasures.fJaccard(Seq("a"), Seq.empty, unitW, 0.8) == 0.0)
    assert(FuzzyMeasures.fCosine(Seq("a"), Seq.empty, unitW, 0.8) == 0.0)
    assert(FuzzyMeasures.fDice(Seq("a"), Seq.empty, unitW, 0.8) == 0.0)
  }

  test("idfWeights: rarer tokens weigh more") {
    val corpus = Seq(Seq("john", "rare"), Seq("john", "x"), Seq("john", "y"))
    val idf = FuzzyMeasures.idfWeights(corpus)
    assert(idf("rare") > idf("john"))
  }

  test("idfWeights counts document frequency, not term frequency") {
    val corpus = Seq(Seq("dup", "dup", "dup"), Seq("other"))
    val idf = FuzzyMeasures.idfWeights(corpus)
    assert(idf("dup") == math.log1p(2.0 / 1.0))
  }

  test("weighting changes the ranking of candidate matches") {
    val w: String => Double = t => if (t == "rare") 10.0 else 1.0
    val withRare = FuzzyMeasures.fJaccard(Seq("rare", "aa"), Seq("rare", "bb"), w, 0.8)
    val withoutRare = FuzzyMeasures.fJaccard(Seq("pop", "aa"), Seq("pop", "bb"), unitW, 0.8)
    assert(withRare > withoutRare, "sharing a heavy token must count for more")
  }
}
