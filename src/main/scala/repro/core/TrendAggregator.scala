package repro.core

/** Incremental trend aggregator over one substream (one group, one window),
  * fed events in (time, sid) order. Implementations are the paper's three
  * granularities (§§4–6). */
trait TrendAggregator {
  /** The query being evaluated. */
  def query: TrendQuery
  /** Process one event and discard it (unless the granularity must store it). */
  def onEvent(e: Ev): Unit
  /** Aggregate over all *finished* trends seen so far. */
  def result: Agg
  /** Memory proxy: aggregates + stored events currently retained. */
  def liveUnits: Long
  /** Peak of liveUnits over the run. */
  def peakUnits: Long
  /** Serializable state for the streaming driver. */
  def snapshot: CograState
}
