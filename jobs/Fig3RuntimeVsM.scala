package repro.jobs

import repro.eval.Experiments
import repro.eval.Experiments.fmt

/** Figs. 3 & 5: TSJ runtime and #pairs/recall vs max-frequency M for
  * fuzzy / greedy / exact variants.
  * Usage: spark-submit ... repro.jobs.Fig3RuntimeVsM [corpusSize]
  */
object Fig3RuntimeVsM {
  def main(args: Array[String]): Unit = {
    val spark = JobSession.build("fig3-runtime-vs-m")
    val n = JobSession.intArg(args, 0, 30000)
    val rows = Experiments.sweepM(spark, n, seed = 7, t = 0.1,
                                  ms = Seq(100L, 250L, 500L, 1000L))
    println(s"Figs 3 & 5 — runtime and pairs/recall vs M (corpus n=$n, T=0.1)")
    println(Experiments.markdownTable(
      Seq("M", "variant", "seconds", "pairs", "recall"),
      rows.map(r => Seq(r.param.toLong.toString, r.variant, fmt(r.seconds),
                        r.pairs.toString, f"${r.recall}%.5f"))))
    spark.stop()
  }
}
