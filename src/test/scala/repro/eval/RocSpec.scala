package repro.eval

import org.scalatest.funsuite.AnyFunSuite
import scala.util.Random

/** Tests for the ROC/AUC computation. */
class RocSpec extends AnyFunSuite {

  test("perfect separation gives AUC 1") {
    val scored = Seq((0.9, true), (0.8, true), (0.2, false), (0.1, false))
    assert(Roc.auc(scored) == 1.0)
  }

  test("inverted separation gives AUC 0") {
    val scored = Seq((0.1, true), (0.2, true), (0.8, false), (0.9, false))
    assert(Roc.auc(scored) == 0.0)
  }

  test("all-tied scores give AUC 0.5") {
    val scored = Seq((0.5, true), (0.5, false), (0.5, true), (0.5, false))
    assert(Roc.auc(scored) == 0.5)
  }

  test("random scores give AUC near 0.5") {
    val rnd = new Random(1)
    val scored = Seq.fill(4000)((rnd.nextDouble(), rnd.nextBoolean()))
    assert(math.abs(Roc.auc(scored) - 0.5) < 0.05)
  }

  test("AUC equals the pairwise comparison probability (small case)") {
    val rnd = new Random(2)
    val scored = Seq.fill(60)((rnd.nextInt(10).toDouble, rnd.nextBoolean()))
    if (scored.exists(_._2) && scored.exists(!_._2)) {
      val pos = scored.filter(_._2).map(_._1)
      val neg = scored.filterNot(_._2).map(_._1)
      val direct = (for (p <- pos; n <- neg)
        yield if (p > n) 1.0 else if (p == n) 0.5 else 0.0).sum / (pos.size * neg.size)
      assert(math.abs(Roc.auc(scored) - direct) < 1e-9)
    }
  }

  test("AUC requires both classes") {
    intercept[IllegalArgumentException](Roc.auc(Seq((1.0, true))))
  }

  test("curve starts at (0,0) and ends at (1,1)") {
    val rnd = new Random(3)
    val scored = Seq.fill(200)((rnd.nextDouble(), rnd.nextBoolean()))
    val c = Roc.curve(scored)
    assert(c.head == Roc.Point(0, 0))
    assert(math.abs(c.last.fpr - 1.0) < 1e-12 && math.abs(c.last.tpr - 1.0) < 1e-12)
  }

  test("curve is monotone in both axes") {
    val rnd = new Random(4)
    val scored = Seq.fill(500)((rnd.nextInt(20).toDouble, rnd.nextBoolean()))
    val c = Roc.curve(scored)
    c.sliding(2).foreach {
      case Seq(a, b) => assert(b.fpr >= a.fpr && b.tpr >= a.tpr)
      case _ =>
    }
  }

  test("tprAtFpr is monotone in the FPR budget") {
    val rnd = new Random(5)
    val scored = Seq.fill(300)((rnd.nextDouble(), rnd.nextDouble() < 0.4))
    val ts = Seq(0.01, 0.05, 0.1, 0.5, 1.0).map(Roc.tprAtFpr(scored, _))
    assert(ts == ts.sorted)
  }

  test("tprAtFpr(1.0) is 1.0") {
    val scored = Seq((0.9, true), (0.1, false), (0.5, true), (0.4, false))
    assert(Roc.tprAtFpr(scored, 1.0) == 1.0)
  }
}
