package repro.jobs

import repro.bench.Experiments

/** spark-submit entrypoint reproducing Table 5 (§7.2): VMF filter quality.
  *
  * Usage: spark-submit --class repro.jobs.Table5Job repro.jar [nTest]
  */
object Table5Job {
  def main(args: Array[String]): Unit = {
    val nTest = args.lift(0).map(_.toInt).getOrElse(3000)
    val emf = Experiments.trainEmf()
    val vmf = Experiments.calibrateVmf(emf)
    println(Experiments.renderTable5(Experiments.table5(vmf, nTest)))
  }
}
