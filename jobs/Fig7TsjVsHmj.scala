package repro.jobs

import repro.eval.Experiments
import repro.eval.Experiments.fmt

/** Fig. 7: TSJ vs HMJ (metric-space join baseline) runtime vs #workers.
  * Usage: spark-submit ... repro.jobs.Fig7TsjVsHmj [corpusSize]
  */
object Fig7TsjVsHmj {
  def main(args: Array[String]): Unit = {
    val spark = JobSession.build("fig7-tsj-vs-hmj")
    val n = JobSession.intArg(args, 0, 30000)
    val rows = Experiments.fig7(spark, n, seed = 7, t = 0.1, m = 1000,
                                workers = Seq(2, 4, 8, 16))
    println(s"Fig 7 — TSJ vs HMJ runtime (s) vs workers (corpus n=$n, T=0.1, M=1000)")
    println(Experiments.markdownTable(
      Seq("workers", "algo", "seconds", "pairs", "finished"),
      rows.map(r => Seq(r.workers.toString, r.algo, fmt(r.seconds),
                        r.pairs.toString, r.finished.toString))))
    spark.stop()
  }
}
