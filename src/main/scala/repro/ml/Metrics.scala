package repro.ml

/** Binary-classification metrics used throughout §7: confusion counts and
  * the derived accuracy / precision / recall / F1 / TPR / TNR.
  */
final case class Confusion(tp: Long, fp: Long, tn: Long, fn: Long) {
  def total: Long = tp + fp + tn + fn
  private def ratio(a: Long, b: Long): Double = if (b == 0) 0.0 else a.toDouble / b

  def accuracy: Double  = ratio(tp + tn, total)
  def precision: Double = ratio(tp, tp + fp)
  def recall: Double    = ratio(tp, tp + fn)
  def tpr: Double       = recall
  def tnr: Double       = ratio(tn, tn + fp)
  def f1: Double = {
    val p = precision; val r = recall
    if (p + r == 0) 0.0 else 2 * p * r / (p + r)
  }
  def +(o: Confusion): Confusion = Confusion(tp + o.tp, fp + o.fp, tn + o.tn, fn + o.fn)
}

object Confusion {
  val empty: Confusion = Confusion(0, 0, 0, 0)

  def of(predicted: Seq[Boolean], actual: Seq[Boolean]): Confusion = {
    require(predicted.size == actual.size, "prediction/label size mismatch")
    var tp = 0L; var fp = 0L; var tn = 0L; var fn = 0L
    predicted.lazyZip(actual).foreach { (p, a) =>
      if (p && a) tp += 1 else if (p && !a) fp += 1
      else if (!p && !a) tn += 1 else fn += 1
    }
    Confusion(tp, fp, tn, fn)
  }
}
