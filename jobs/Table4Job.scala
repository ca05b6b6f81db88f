package repro.jobs

import repro.bench.Experiments

/** spark-submit entrypoint reproducing Table 4 (§7.1.3): transfer learning
  * on randomly-generated schemas at the paper's dataset sizes.
  *
  * Usage: spark-submit --class repro.jobs.Table4Job repro.jar [size ...]
  */
object Table4Job {
  def main(args: Array[String]): Unit = {
    val sizes = if (args.nonEmpty) args.toSeq.map(_.toInt)
                else Seq(1200, 5000, 11000, 19900, 44900)
    val emf = Experiments.trainEmf()
    println(Experiments.renderTable4(Experiments.table4(emf, sizes)))
  }
}
