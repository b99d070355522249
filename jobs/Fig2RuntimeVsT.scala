package repro.jobs

import repro.eval.Experiments
import repro.eval.Experiments.fmt

/** Figs. 2 & 4: TSJ runtime and #pairs/recall vs the NSLD threshold T for
  * fuzzy / greedy / exact variants.
  * Usage: spark-submit ... repro.jobs.Fig2RuntimeVsT [corpusSize]
  */
object Fig2RuntimeVsT {
  def main(args: Array[String]): Unit = {
    val spark = JobSession.build("fig2-runtime-vs-t")
    val n = JobSession.intArg(args, 0, 30000)
    val rows = Experiments.sweepT(spark, n, seed = 7,
      ts = Seq(0.025, 0.075, 0.125, 0.175, 0.225).map(math.min(_, 0.5)), m = 1000)
    println(s"Figs 2 & 4 — runtime and pairs/recall vs T (corpus n=$n, M=1000)")
    println(Experiments.markdownTable(
      Seq("T", "variant", "seconds", "pairs", "recall"),
      rows.map(r => Seq(fmt(r.param), r.variant, fmt(r.seconds),
                        r.pairs.toString, f"${r.recall}%.5f"))))
    spark.stop()
  }
}
