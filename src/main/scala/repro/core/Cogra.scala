package repro.core

/** Cogra runtime executor facade (paper Fig. 3): the static query analyzer
  * (pattern analysis + predicate classification) picks the coarsest sound
  * granularity (Table 4) and instantiates the matching aggregator. */
object Cogra {

  def aggregator(q: TrendQuery, restore: Option[CograState] = None): TrendAggregator =
    Granularity.select(q) match {
      case Granularity.TypeG    => new TypeGrained(q, restore)
      case Granularity.MixedG   => new MixedGrained(q, restore)
      case Granularity.PatternG => new PatternGrained(q, restore)
    }

  /** Run over one time-ordered substream. */
  def run(events: Iterable[Ev], q: TrendQuery): Agg = {
    val a = aggregator(q)
    events.foreach(a.onEvent)
    a.result
  }
}
