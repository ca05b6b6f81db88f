package repro.bench

import repro.core.emf.Emf
import repro.core.vmf.Vmf

/** One TPC-H-trained EMF (+calibrated VMF) shared by every bench suite —
  * mirrors the paper's single pre-trained model evaluated across §7, and
  * keeps bench wall-clock dominated by the experiments, not training.
  */
object BenchModels {
  lazy val emf: Emf = Experiments.trainEmf()
  lazy val vmf: Vmf = Experiments.calibrateVmf(emf)
}
