package repro.core

import org.scalatest.funsuite.AnyFunSuite
import scala.util.Random

/** Tests for the [[Hungarian]] assignment solver. */
class HungarianSpec extends AnyFunSuite {

  /** Brute-force min assignment cost over all column permutations. */
  private def bruteMin(cost: Array[Array[Double]]): Double = {
    val n = cost.length
    val m = cost(0).length
    (0 until m).toList.combinations(n).flatMap(_.permutations)
      .map(perm => perm.zipWithIndex.map { case (j, i) => cost(i)(j) }.sum)
      .min
  }

  test("1x1") {
    assert(Hungarian.solve(Array(Array(7.0)))._1 == 7.0)
  }

  test("2x2 picks the cross assignment when cheaper") {
    val cost = Array(Array(10.0, 1.0), Array(1.0, 10.0))
    val (c, a) = Hungarian.solve(cost)
    assert(c == 2.0)
    assert(a.toSeq == Seq(1, 0))
  }

  test("3x3 known case") {
    // Classic example: optimal cost 5 (a->2, b->1, c->0 style).
    val cost = Array(
      Array(4.0, 1.0, 3.0),
      Array(2.0, 0.0, 5.0),
      Array(3.0, 2.0, 2.0))
    assert(Hungarian.solve(cost)._1 == 5.0)
  }

  test("identity matrix costs zero on the diagonal complement") {
    val cost = Array.tabulate(4, 4)((i, j) => if (i == j) 0.0 else 1.0)
    assert(Hungarian.solve(cost)._1 == 0.0)
  }

  test("empty matrix") {
    assert(Hungarian.solve(Array.empty[Array[Double]])._1 == 0.0)
  }

  for (n <- 2 to 5) {
    test(s"random ${n}x$n matrices match brute force") {
      val rnd = new Random(n)
      for (_ <- 1 to 50) {
        val cost = Array.fill(n, n)(rnd.nextInt(20).toDouble)
        val (c, a) = Hungarian.solve(cost)
        assert(math.abs(c - bruteMin(cost)) < 1e-9, cost.map(_.mkString(",")).mkString(";"))
        assert(a.distinct.length == n, "assignment must be a permutation")
        assert(math.abs(a.zipWithIndex.map { case (j, i) => cost(i)(j) }.sum - c) < 1e-9)
      }
    }
  }

  for ((n, m) <- Seq((2, 4), (3, 5), (1, 6))) {
    test(s"rectangular ${n}x$m matches brute force") {
      val rnd = new Random(n * 31 + m)
      for (_ <- 1 to 40) {
        val cost = Array.fill(n, m)(rnd.nextInt(15).toDouble)
        val (c, a) = Hungarian.solve(cost)
        assert(math.abs(c - bruteMin(cost)) < 1e-9)
        assert(a.distinct.length == n)
      }
    }
  }

  test("rows > cols is rejected") {
    intercept[IllegalArgumentException] {
      Hungarian.solve(Array(Array(1.0), Array(2.0)))
    }
  }

  test("minCost on integer matrices") {
    val cost = Array(Array(3, 7), Array(2, 9))
    assert(Hungarian.minCost(cost) == 9) // 7 + 2
  }

  test("maxWeight maximizes instead of minimizing") {
    val w = Array(Array(10.0, 1.0), Array(1.0, 10.0))
    val (total, a) = Hungarian.maxWeight(w)
    assert(total == 20.0)
    assert(a.toSeq == Seq(0, 1))
  }

  test("maxWeight on rectangular weights") {
    val rnd = new Random(99)
    for (_ <- 1 to 40) {
      val w = Array.fill(3, 5)(rnd.nextDouble() * 10)
      val (total, _) = Hungarian.maxWeight(w)
      val brute = (0 until 5).toList.combinations(3).flatMap(_.permutations)
        .map(p => p.zipWithIndex.map { case (j, i) => w(i)(j) }.sum).max
      assert(math.abs(total - brute) < 1e-9)
    }
  }

  test("negative costs are handled") {
    val cost = Array(Array(-5.0, 2.0), Array(3.0, -4.0))
    assert(Hungarian.solve(cost)._1 == -9.0)
  }
}
