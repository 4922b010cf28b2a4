package repro.core

/** Predicate algebra of Raven's unified IR (paper §3, §4.1).
  *
  * Raven harvests conjunctive predicates from the WHERE clause of a
  * prediction query and propagates them through featurizers into the model.
  * Numeric predicates are represented as closed intervals over the extended
  * reals; categorical predicates as (in-)equality with a string constant.
  */
sealed trait ColPredicate {
  /** Input column this predicate constrains. */
  def col: String
}

/** Equality with a string constant, e.g. `mktsegment = 'BUILDING'`. */
final case class EqString(col: String, value: String) extends ColPredicate

/** Equality with a numeric constant, e.g. `asthma = 1`. */
final case class EqNum(col: String, value: Double) extends ColPredicate

/** Range predicate `lo <= col <= hi` (use -Inf / +Inf for open sides). */
final case class RangeNum(col: String, lo: Double, hi: Double) extends ColPredicate

/** Closed interval over the extended reals. The lattice element Raven pushes
  * through featurizers and uses to prune tree branches (paper §4.1 step 2).
  */
final case class Interval(lo: Double, hi: Double) {
  require(!lo.isNaN && !hi.isNaN, "interval bounds must not be NaN")

  def isEmpty: Boolean = lo > hi
  def isPoint: Boolean = lo == hi

  def intersect(other: Interval): Interval =
    Interval(math.max(lo, other.lo), math.min(hi, other.hi))

  def contains(x: Double): Boolean = x >= lo && x <= hi

  /** Image under the affine map `x => (x - offset) * scale` — how an interval
    * moves through a StandardScaler (paper: "a constant n_c is updated to
    * (constant - offset) x scale when pushed through a Scaler").
    */
  def mapAffine(offset: Double, scale: Double): Interval = {
    val a = (lo - offset) * scale
    val b = (hi - offset) * scale
    if (scale >= 0) Interval(a, b) else Interval(b, a)
  }
}

object Interval {
  val Full: Interval = Interval(Double.NegativeInfinity, Double.PositiveInfinity)
  def point(x: Double): Interval = Interval(x, x)
}

/** Predicate on the *output* of a trained pipeline, e.g.
  * `PREDICT(...) = 1` ("risk_of_covid = 'high'" in the running example).
  */
final case class OutputPredicate(predictedClass: Double)

/** Per-feature knowledge derived from data predicates: the interval each
  * encoded model feature is confined to. Missing entries mean "unconstrained".
  */
final case class FeatureBounds(bounds: Map[Int, Interval]) {
  def apply(i: Int): Interval = bounds.getOrElse(i, Interval.Full)
  def isConstrained(i: Int): Boolean = bounds.contains(i)
  def constantOf(i: Int): Option[Double] = bounds.get(i).filter(_.isPoint).map(_.lo)
}

object FeatureBounds {
  val Empty: FeatureBounds = FeatureBounds(Map.empty)
}
