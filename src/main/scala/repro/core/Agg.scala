package repro.core

/** The aggregate bundle maintained per slot (per type, per stored event, or
  * per pattern), implementing every column of the paper's Table 8 at once.
  *
  * For a set of (partial) trends, the fields hold:
  *  - `count`:  number of trends (COUNT(*))
  *  - `countE`: Σ over trends of #target-type events in the trend (COUNT(E))
  *  - `sum`:    Σ over trends of the trend's target-attribute sum (SUM)
  *  - `min`/`max`: min/max over trends of the trend's target min/max
  *    (+∞/−∞ neutral when no trend contains a target event yet)
  *
  * Counts are Doubles: exact below 2^53 (all correctness tests), and
  * order-of-magnitude-faithful in benchmarks where ANY counts explode.
  */
final case class Agg(count: Double, countE: Double, sum: Double, min: Double, max: Double)
    extends Serializable {
  def avg: Double = if (countE == 0) Double.NaN else sum / countE
  def isZero: Boolean = count == 0
}

object Agg {
  /** No trends. */
  val zero: Agg = Agg(0, 0, 0, Double.PositiveInfinity, Double.NegativeInfinity)
  /** One fresh trend about to be started by the incoming event (the "+1 if
    * start type" of Theorems 4.1/5.1/6.2, before the event itself is added). */
  val startUnit: Agg = Agg(1, 0, 0, Double.PositiveInfinity, Double.NegativeInfinity)

  /** Union of two disjoint trend sets (the Σ of Table 8). */
  def merge(a: Agg, b: Agg): Agg =
    if (a.isZero) b else if (b.isZero) a
    else Agg(a.count + b.count, a.countE + b.countE, a.sum + b.sum,
             math.min(a.min, b.min), math.max(a.max, b.max))

  /** Extend every trend in `s` by an event with attribute `v`.
    * `isTarget` = the event's type equals the aggregation target E:
    * each extended trend then gains one E-event of value v (Table 8 rows
    * e.count_E, e.sum, e.min; non-target rows propagate unchanged). */
  def extend(s: Agg, v: Double, isTarget: Boolean): Agg =
    if (s.isZero) zero
    else if (!isTarget) s
    else Agg(s.count, s.countE + s.count, s.sum + v * s.count,
             math.min(s.min, v), math.max(s.max, v))
}
