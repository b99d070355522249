package repro.jobs

import repro.eval.Experiments
import repro.eval.Experiments.fmt

/** Fig. 1: TSJ runtime vs #workers for both dedup strategies.
  * Usage: spark-submit ... repro.jobs.Fig1Scalability [corpusSize]
  */
object Fig1Scalability {
  def main(args: Array[String]): Unit = {
    val spark = JobSession.build("fig1-scalability")
    val n = JobSession.intArg(args, 0, 100000)
    val rows = Experiments.fig1(spark, n, seed = 7, t = 0.1, m = 1000,
                                workers = Seq(2, 4, 8, 16))
    println("Fig 1 — TSJ runtime (s) vs workers and dedup strategy " +
      s"(corpus n=$n, T=0.1, M=1000)")
    println(Experiments.markdownTable(
      Seq("workers", "dedup", "seconds", "pairs"),
      rows.map(r => Seq(r.workers.toString, r.dedup, fmt(r.seconds), r.pairs.toString))))
    spark.stop()
  }
}
