package repro.core

/** Sliding window: WITHIN `size` SLIDE `slide` (paper Definition 6).
  * Window ids are window start times, multiples of `slide`. */
final case class WindowSpec(size: Long, slide: Long) extends Serializable {
  require(size > 0 && slide > 0 && slide <= size, s"bad window: size=$size slide=$slide")

  /** All window start ids an event at time `t` falls into. */
  def windowsOf(t: Long): Seq[Long] = {
    val hi = math.floorDiv(t, slide)                 // latest window starting at or before t
    val lo = math.floorDiv(t - size, slide) + 1      // earliest window still covering t
    (math.max(0L, lo) to hi).map(_ * slide)
  }
  def end(wid: Long): Long = wid + size
}

/** Event trend aggregation query (paper Definition 6).
  *
  * Grouping and single-event predicates are represented by the event's
  * `group` field (paper §7 reduces them to stream partitioning), so the
  * query itself carries the pattern, semantics, adjacent-event predicates,
  * the aggregation target type, and the window.
  *
  * @param target type `E` whose attribute feeds COUNT(E)/MIN/MAX/SUM/AVG;
  *               defaults to the pattern's end type. COUNT(*) needs none.
  */
final case class TrendQuery(
    pattern: Pattern,
    semantics: Semantics,
    adjPreds: Seq[AdjPred] = Nil,
    targetType: Option[String] = None,
    window: WindowSpec = WindowSpec(Long.MaxValue, Long.MaxValue)) extends Serializable {

  @transient lazy val info: PatternInfo = PatternAnalyzer.analyze(pattern)
  def target: String = targetType.getOrElse(info.end)
  require(targetType.forall(pattern.types.contains), s"target $targetType not in pattern")
}

object TrendQuery {
  /** Unwindowed query, for local aggregator tests over one substream. */
  def local(p: Pattern, s: Semantics, preds: Seq[AdjPred] = Nil,
            target: Option[String] = None): TrendQuery =
    TrendQuery(p, s, preds, target, WindowSpec(Long.MaxValue / 4, Long.MaxValue / 4))
}
