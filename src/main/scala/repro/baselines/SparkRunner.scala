package repro.baselines

import org.apache.spark.sql.{Dataset, SparkSession}
import repro.core._

/** Per-(group, window) result of an engine run, with run statistics.
  * `computeMs` is the pure aggregation time inside the task, excluding
  * Spark shuffle/scheduling — the benchmarks report both. */
final case class EngineWinResult(engine: String, group: String, wid: Long,
                                 count: Double, countE: Double, sum: Double,
                                 min: Double, max: Double,
                                 peakUnits: Long, trends: Long, dnf: Boolean,
                                 computeMs: Double)

/** Workload-level summary used by the benchmarks. */
final case class EngineSummary(engine: String, windows: Long, dnfWindows: Long,
                               totalCount: Double, peakUnits: Long, trends: Long,
                               computeMs: Double) {
  def dnf: Boolean = dnfWindows > 0
}

/** Runs any [[TrendEngine]] over a windowed, grouped event stream on Spark —
  * the common experimental harness of §9: identical partitioning for every
  * engine, so measured differences come from the aggregation strategy. */
object SparkRunner {

  def run(spark: SparkSession, events: Dataset[Ev], q: TrendQuery,
          engine: TrendEngine, budget: Budget): Dataset[EngineWinResult] = {
    import spark.implicits._
    val win = q.window
    events
      .flatMap(e => win.windowsOf(e.time).map(wid => (wid, e)))
      .groupByKey { case (wid, e) => (e.group, wid) }
      .mapGroups { (key: (String, Long), it: Iterator[(Long, Ev)]) =>
        val (g, wid) = key
        val evs = it.map(_._2).toArray
        scala.util.Sorting.stableSort(evs, (a: Ev, b: Ev) => Ev.ordering.lt(a, b))
        val t0 = System.nanoTime()
        val r = engine.run(evs, q, budget)
        val ms = (System.nanoTime() - t0) / 1e6
        EngineWinResult(engine.name, g, wid, r.agg.count, r.agg.countE, r.agg.sum,
          r.agg.min, r.agg.max, r.peakUnits, r.trends, r.dnf, ms)
      }
  }

  /** Run and reduce to a workload summary (peak memory = max over
    * concurrently processed substreams is approximated by the max
    * per-substream peak times the parallelism-free sum for stored state;
    * we report the sum, the quantity the paper's single-node peak reflects). */
  def summarize(spark: SparkSession, events: Dataset[Ev], q: TrendQuery,
                engine: TrendEngine, budget: Budget): EngineSummary = {
    val rows = run(spark, events, q, engine, budget).collect()
    EngineSummary(
      engine = engine.name,
      windows = rows.length.toLong,
      dnfWindows = rows.count(_.dnf).toLong,
      totalCount = rows.iterator.filterNot(_.dnf).map(_.count).sum,
      peakUnits = rows.iterator.map(_.peakUnits).sum,
      trends = rows.iterator.map(_.trends).sum,
      computeMs = rows.iterator.map(_.computeMs).sum)
  }
}
