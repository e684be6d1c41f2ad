package repro.core

/** A matched event retained by the mixed-grained aggregator (type in T_e),
  * together with its event-grained aggregate. */
final case class StoredEv(sid: Long, time: Long, etype: String, value: Double, agg: Agg)
    extends Serializable {
  /** Reconstruct an event view for predicate evaluation (group is
    * irrelevant inside a substream). */
  def toEv: Ev = Ev(sid, time, etype, "", value)
}

/** Serializable snapshot of any Cogra aggregator's state — the per-key state
  * persisted by the Structured Streaming driver between micro-batches.
  * Unused fields stay at their neutral values for a given granularity. */
final case class CograState(
    typeAggs: Map[String, Agg],
    events: Seq[StoredEv],
    hasLast: Boolean,
    lastType: String,
    lastValue: Double,
    lastAgg: Agg,
    finalAgg: Agg) extends Serializable

object CograState {
  val empty: CograState =
    CograState(Map.empty, Vector.empty, hasLast = false, "", 0.0, Agg.zero, Agg.zero)
}
