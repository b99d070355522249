package repro.jobs

import repro.eval.Experiments
import repro.eval.Experiments.fmt

/** Fig. 6: ROC/AUC of NSLD vs weighted FJaccard/FCosine/FDice on the
  * name-change sample.
  * Usage: spark-submit ... repro.jobs.Fig6Roc [numPairs]
  */
object Fig6Roc {
  def main(args: Array[String]): Unit = {
    val n = JobSession.intArg(args, 0, 10000)
    val rows = Experiments.fig6(n, seed = 11)
    println(s"Fig 6 — ROC of the distance measures on $n name changes " +
      "(half legit, half fraud)")
    println(Experiments.markdownTable(
      Seq("measure", "AUC", "TPR@FPR=0.05", "TPR@FPR=0.10"),
      rows.map(r => Seq(r.measure, fmt(r.auc), fmt(r.tprAtFpr05), fmt(r.tprAtFpr10)))))
  }
}
