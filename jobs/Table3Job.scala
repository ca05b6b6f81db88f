package repro.jobs

import repro.bench.Experiments

/** spark-submit entrypoint reproducing Table 3 (§7.1.1): MLP vs RF vs LR.
  *
  * Usage: spark-submit --class repro.jobs.Table3Job repro.jar [nTrain] [nTest]
  */
object Table3Job {
  def main(args: Array[String]): Unit = {
    val nTrain = args.lift(0).map(_.toInt).getOrElse(4000)
    val nTest  = args.lift(1).map(_.toInt).getOrElse(2000)
    val emf = Experiments.trainEmf(nTrain = nTrain)
    println(Experiments.renderTable3(Experiments.table3(emf, nTrain, nTest)))
  }
}
