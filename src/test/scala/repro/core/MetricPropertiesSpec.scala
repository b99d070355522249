package repro.core

import org.scalacheck.{Gen, Prop, Test => SCTest}
import org.scalatest.funsuite.AnyFunSuite

/** ScalaCheck property suite: the metric axioms and bound lemmas under
  * generator-driven search (complements the seeded-loop tests).
  */
class MetricPropertiesSpec extends AnyFunSuite {

  private val params = SCTest.Parameters.default.withMinSuccessfulTests(300)

  private def check(name: String)(prop: Prop): Unit = test(name) {
    val res = SCTest.check(params, prop)
    assert(res.passed, res.status.toString)
  }

  private val word: Gen[String] =
    for {
      n <- Gen.choose(0, 10)
      cs <- Gen.listOfN(n, Gen.oneOf('a', 'b', 'c'))
    } yield cs.mkString

  private val tokens: Gen[List[String]] =
    for {
      n <- Gen.choose(0, 4)
      ts <- Gen.listOfN(n, word.suchThat(_.nonEmpty))
    } yield ts

  // --- LD ---

  check("LD identity")(Prop.forAll(word)(x => Levenshtein.distance(x, x) == 0))

  check("LD symmetry")(Prop.forAll(word, word)((x, y) =>
    Levenshtein.distance(x, y) == Levenshtein.distance(y, x)))

  check("LD triangle")(Prop.forAll(word, word, word)((x, y, z) =>
    Levenshtein.distance(x, z) <=
      Levenshtein.distance(x, y) + Levenshtein.distance(y, z)))

  check("LD zero iff equal")(Prop.forAll(word, word)((x, y) =>
    (Levenshtein.distance(x, y) == 0) == (x == y)))

  check("bounded LD agrees with exact under any threshold")(
    Prop.forAll(word, word, Gen.choose(0, 12)) { (x, y, u) =>
      val exact = Levenshtein.distance(x, y)
      val b = Levenshtein.bounded(x, y, u)
      if (exact <= u) b == exact else b > u
    })

  // --- NLD ---

  check("NLD range")(Prop.forAll(word, word) { (x, y) =>
    val d = Nld.nld(x, y); d >= 0.0 && d <= 1.0
  })

  check("NLD identity of indiscernibles")(Prop.forAll(word, word)((x, y) =>
    (Nld.nld(x, y) == 0.0) == (x == y)))

  check("NLD triangle")(Prop.forAll(word, word, word)((x, y, z) =>
    Nld.nld(x, z) <= Nld.nld(x, y) + Nld.nld(y, z) + 1e-12))

  check("Lemma 8 conversion is sound")(
    Prop.forAll(word, word, Gen.oneOf(0.05, 0.1, 0.2, 0.4)) { (x, y, t) =>
      Nld.nld(x, y) > t || Levenshtein.distance(x, y) <= Nld.maxLdFor(x.length, y.length, t)
    })

  check("Lemma 9 conversion is sound")(
    Prop.forAll(word, word, Gen.oneOf(0.05, 0.1, 0.2, 0.4)) { (a, b, t) =>
      val (x, y) = if (a.length <= b.length) (a, b) else (b, a)
      Nld.nld(x, y) > t || Nld.minShorterLen(y.length, t) <= x.length
    })

  // --- SLD / NSLD ---

  check("SLD identity")(Prop.forAll(tokens)(xs => TokenDistances.sld(xs, xs) == 0))

  check("SLD is permutation-invariant")(Prop.forAll(tokens) { xs =>
    TokenDistances.sld(xs, xs.reverse) == 0
  })

  check("SLD symmetry")(Prop.forAll(tokens, tokens)((xs, ys) =>
    TokenDistances.sld(xs, ys) == TokenDistances.sld(ys, xs)))

  check("SLD triangle")(Prop.forAll(tokens, tokens, tokens)((xs, ys, zs) =>
    TokenDistances.sld(xs, zs) <=
      TokenDistances.sld(xs, ys) + TokenDistances.sld(ys, zs)))

  check("NSLD range")(Prop.forAll(tokens, tokens) { (xs, ys) =>
    val d = TokenDistances.nsld(xs, ys); d >= 0.0 && d <= 1.0
  })

  check("NSLD triangle (Theorem 2)")(Prop.forAll(tokens, tokens, tokens)((xs, ys, zs) =>
    TokenDistances.nsld(xs, zs) <=
      TokenDistances.nsld(xs, ys) + TokenDistances.nsld(ys, zs) + 1e-12))

  check("greedy never beats exact SLD")(Prop.forAll(tokens, tokens)((xs, ys) =>
    TokenDistances.sldGreedy(xs, ys) >= TokenDistances.sld(xs, ys)))

  check("length lower bound never exceeds SLD")(Prop.forAll(tokens, tokens)((xs, ys) =>
    TokenDistances.sldLengthLowerBound(xs.map(_.length), ys.map(_.length)) <=
      TokenDistances.sld(xs, ys)))

  check("Theorem 3 witness exists")(
    Prop.forAll(tokens.suchThat(_.nonEmpty), tokens.suchThat(_.nonEmpty),
                Gen.oneOf(0.1, 0.25, 0.5)) { (xs, ys, t) =>
      TokenDistances.nsld(xs, ys) > t ||
        xs.exists(x => ys.exists(y => Nld.nld(x, y) <= t))
    })
}
