package repro.jobs

import repro.bench.Experiments

/** spark-submit entrypoint reproducing Table 1 (§7.5): per-filter
  * time/TPR/TNR, AV-on-all-pairs, GEqO, Oracle+AV, and the §7.6 ablation.
  *
  * Usage: spark-submit --class repro.jobs.Table1Job repro.jar [nSubexprs] [nClasses]
  */
object Table1Job {
  def main(args: Array[String]): Unit = {
    val nSubexprs = args.lift(0).map(_.toInt).getOrElse(317)
    val nClasses  = args.lift(1).map(_.toInt).getOrElse(50)
    val emf = Experiments.trainEmf()
    val vmf = Experiments.calibrateVmf(emf)
    val r = Experiments.table1(emf, vmf, nSubexprs, nClasses)
    println(Experiments.renderTable1(r))
  }
}
