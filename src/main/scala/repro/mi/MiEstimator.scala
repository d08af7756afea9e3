package repro.mi

/** Column sample types and estimator dispatch (Section II / Section V).
  *
  * A collected sample column is either numeric ([[NumCol]]) or string
  * ([[StrCol]]). Estimator selection follows the paper's rules for real data:
  * string-string -> MLE, numeric-numeric -> MixedKSG, mixed -> DC-KSG.
  * Experiments may also force a specific estimator (e.g. MLE over the ordered
  * integer values of the Trinomial distribution).
  */
sealed trait ColData {
  def size: Int
  /** Values as reference objects, for equality-based (discrete) estimators. */
  def anyValues: IndexedSeq[AnyRef]
  def isNumeric: Boolean
}

final case class NumCol(values: Array[Double]) extends ColData {
  def size: Int                     = values.length
  def anyValues: IndexedSeq[AnyRef] = values.map(v => java.lang.Double.valueOf(v)).toIndexedSeq
  def isNumeric: Boolean            = true
}

final case class StrCol(values: Array[String]) extends ColData {
  def size: Int                     = values.length
  def anyValues: IndexedSeq[AnyRef] = values.toIndexedSeq
  def isNumeric: Boolean            = false
}

/** Which MI estimator to apply to a sample of (x, y) pairs. */
sealed trait EstimatorKind { def name: String }
object EstimatorKind {
  case object MLE      extends EstimatorKind { val name = "MLE"      }
  case object KSG      extends EstimatorKind { val name = "KSG"      }
  case object MixedKSG extends EstimatorKind { val name = "MixedKSG" }
  case object DCKSG    extends EstimatorKind { val name = "DC-KSG"   }
  val all: Seq[EstimatorKind] = Seq(MLE, KSG, MixedKSG, DCKSG)
}

object MI {
  /** Default number of neighbors for the KSG-family estimators. */
  val DefaultK = 3

  /** The paper's data-type dispatch rule (Section V, "MI Estimators"). */
  def auto(x: ColData, y: ColData): EstimatorKind = (x.isNumeric, y.isNumeric) match {
    case (false, false) => EstimatorKind.MLE
    case (true, true)   => EstimatorKind.MixedKSG
    case _              => EstimatorKind.DCKSG
  }

  /** Estimate I(X;Y) in nats from a paired sample with the given estimator.
    * Returns NaN on samples too small to estimate (fewer than 2·k points for
    * k-NN estimators, fewer than 1 point for MLE).
    */
  def estimate(kind: EstimatorKind, x: ColData, y: ColData, k: Int = DefaultK): Double = {
    require(x.size == y.size, s"paired sample size mismatch: ${x.size} vs ${y.size}")
    kind match {
      case EstimatorKind.MLE =>
        if (x.size < 1) Double.NaN else Mle.mi(x.anyValues, y.anyValues)
      case EstimatorKind.KSG =>
        numeric(x, y) match {
          case Some((xs, ys)) if xs.length > k + 1 => Ksg.mi(xs, ys, k)
          case _                                   => Double.NaN
        }
      case EstimatorKind.MixedKSG =>
        numeric(x, y) match {
          case Some((xs, ys)) if xs.length > k + 1 => MixedKsg.mi(xs, ys, k)
          case _                                   => Double.NaN
        }
      case EstimatorKind.DCKSG =>
        // The discrete side provides classes; MI is symmetric so orient the
        // pair such that the continuous side is numeric.
        val oriented: Option[(IndexedSeq[AnyRef], Array[Double])] = (x, y) match {
          case (s: StrCol, nc: NumCol) => Some((s.anyValues, nc.values))
          case (nc: NumCol, s: StrCol) => Some((s.anyValues, nc.values))
          case (a: NumCol, b: NumCol)  => Some((a.anyValues, b.values)) // discrete-by-equality x
          case _                       => None
        }
        oriented match {
          case Some((cls, cont)) if cls.size > k + 1 => DcKsg.mi(cls, cont, k)
          case _                                     => Double.NaN
        }
    }
  }

  private def numeric(x: ColData, y: ColData): Option[(Array[Double], Array[Double])] =
    (x, y) match {
      case (a: NumCol, b: NumCol) => Some((a.values, b.values))
      case _                      => None
    }
}
