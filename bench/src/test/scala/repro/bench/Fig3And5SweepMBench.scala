package repro.bench

import repro.SparkSpec
import repro.eval.Experiments
import repro.eval.Experiments.fmt

/** Figs. 3 & 5: runtime and #pairs/recall vs max-frequency M for the fuzzy /
  * greedy / exact TSJ variants.
  *
  * Paper (M from 100 to 1000 on 44.4M names; M=1000 drops ~1% of tokens):
  * greedy saves ~9% runtime, exact ~33%, both stable across M; recall of
  * greedy ≈0.999999, recall of exact between 0.974 and 0.985. Our M sweep is
  * scaled to the corpus so a comparable ~1% token-drop point is included
  * (see EXPERIMENTS.md).
  */
class Fig3And5SweepMBench extends SparkSpec {

  test("figs 3 & 5: runtime and pairs/recall vs M") {
    val n = 30000
    val ms = Seq(100L, 250L, 500L, 1000L)
    val rows = Experiments.sweepM(spark, n, seed = 7, t = 0.1, ms = ms)

    println(s"\n### Fig 3 — TSJ runtime (s) vs M (n=$n, T=0.1)")
    println(Experiments.markdownTable(
      Seq("M", "variant", "seconds"),
      rows.map(r => Seq(r.param.toLong.toString, r.variant, fmt(r.seconds)))))

    println(s"\n### Fig 5 — discovered pairs and recall vs M (n=$n, T=0.1)")
    println(Experiments.markdownTable(
      Seq("M", "variant", "pairs", "recall"),
      rows.map(r => Seq(r.param.toLong.toString, r.variant, r.pairs.toString,
                        f"${r.recall}%.5f"))))

    // Shape checks.
    assert(rows.filter(_.variant == "fuzzy-token-matching").forall(_.recall == 1.0))
    assert(rows.forall(_.recall <= 1.0 + 1e-12))
    for (v <- rows.map(_.variant).distinct) {
      val byM = rows.filter(_.variant == v).sortBy(_.param)
      assert(byM.head.pairs <= byM.last.pairs, s"$v pairs not monotone in M")
    }
    // Greedy recall stays essentially perfect across M (paper: ~0.999999).
    val greedy = rows.filter(_.variant == "greedy-token-aligning")
    assert(greedy.forall(_.recall >= 0.99), s"greedy recalls: ${greedy.map(_.recall)}")
  }
}
