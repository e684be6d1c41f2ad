package repro.bench

import org.apache.spark.sql.{Dataset, SparkSession}
import repro.core._
import repro.baselines._
import repro.streams.EventGen

/** One measured point of an experiment (a row of a figure's table). */
final case class ExpRow(fig: String, engine: String, x: String,
                        events: Long, windows: Long,
                        wallMs: Double, computeMs: Double,
                        latencyMsPerWin: Double, throughputEvS: Double,
                        memUnits: Long, trends: Long,
                        totalCount: Double, dnf: Boolean)

/** Reproduction harness for the paper's evaluation (§9, Figures 5–10 and
  * Table 9). Each `figN` method regenerates one experiment's numbers; the
  * per-figure bench suites and jobs/ entrypoints are thin wrappers.
  *
  * Scale points are ~1000x below the paper's (see DESIGN.md §5): the
  * two-step baselines are exponential and hit their "does not terminate"
  * cutoffs at proportionally smaller workloads here. Once an engine DNFs at
  * a scale, larger scales are reported DNF without being run (the paper
  * plots the same way).
  */
object Experiments {

  /** Measure one engine on one workload. Events must already be cached. */
  def measure(spark: SparkSession, fig: String, x: String, events: Dataset[Ev],
              nEvents: Long, q: TrendQuery, engine: TrendEngine, budget: Budget): ExpRow = {
    val t0 = System.nanoTime()
    val s = SparkRunner.summarize(spark, events, q, engine, budget)
    val wallMs = (System.nanoTime() - t0) / 1e6
    ExpRow(fig, engine.name, x, nEvents, s.windows, wallMs, s.computeMs,
      latencyMsPerWin = if (s.windows == 0) 0 else s.computeMs / s.windows,
      throughputEvS = nEvents / math.max(1e-9, wallMs / 1000.0),
      memUnits = s.peakUnits, trends = s.trends,
      totalCount = s.totalCount, dnf = s.dnf)
  }

  /** Run `engines` over increasing scales; skip an engine after its first
    * DNF (emitting DNF rows), since the budgets are monotone in scale. */
  private def sweep(spark: SparkSession, fig: String,
                    points: Seq[(String, Dataset[Ev], Long, TrendQuery)],
                    engines: Seq[TrendEngine],
                    budgetOf: TrendEngine => Budget): Seq[ExpRow] = {
    val dead = scala.collection.mutable.Set.empty[String]
    val rows = for ((x, ds, n, q) <- points; e <- engines if e.supports(q)) yield {
      if (dead(e.name)) {
        ExpRow(fig, e.name, x, n, 0, 0, 0, 0, 0, 0, 0, 0, dnf = true)
      } else {
        ds.persist(); ds.count()
        val r = measure(spark, fig, x, ds, n, q, e, budgetOf(e))
        if (r.dnf) dead += e.name
        r
      }
    }
    points.foreach(_._2.unpersist())
    rows
  }

  /** Sliding window holding ~`n` events: size n, slide n/2, stream of 2n
    * events at one event per time unit (≈4–5 windows). */
  private def winFor(n: Long): WindowSpec = WindowSpec(n, math.max(1, n / 2))

  import Pattern._

  // ---- Figure 5: contiguous semantics, q1-style, activity data ----------
  // PATTERN M+  SEMANTICS contiguous  WHERE M.rate < NEXT(M).rate, 14 groups
  def q1(win: WindowSpec): TrendQuery =
    TrendQuery(plus(tp("M")), Semantics.CONT, Seq(AdjPred.Cmp("M", "M", "<")),
               Some("M"), win)

  def fig5(spark: SparkSession, scales: Seq[Long], budget: Budget = Budget()): Seq[ExpRow] = {
    val points = scales.map { n =>
      (n.toString, EventGen.activity(spark, 2 * n, 14, seed = 11), 2 * n, q1(winFor(n)))
    }
    sweep(spark, "fig5-CONT", points, Seq(FlinkLike, Sase, Engines.CograEngine), _ => budget)
  }

  // ---- Figure 6: skip-till-next-match, q2-style, transport data ---------
  // PATTERN (SEQ(A+,B))+  SEMANTICS skip-till-next-match, 30 groups
  def q2(win: WindowSpec): TrendQuery =
    TrendQuery(plus(seq(plus(tp("A")), tp("B"))), Semantics.NEXT, Nil, None, win)

  def fig6(spark: SparkSession, scales: Seq[Long], budget: Budget = Budget()): Seq[ExpRow] = {
    val points = scales.map { n =>
      (n.toString, EventGen.transport(spark, 2 * n, 30, seed = 17), 2 * n, q2(winFor(n)))
    }
    sweep(spark, "fig6-NEXT", points, Seq(Sase, Engines.CograEngine), _ => budget)
  }

  // ---- Figures 7/8: skip-till-any-match, q3-style, stock data -----------
  // PATTERN SEQ(A+,B)  SEMANTICS skip-till-any-match, 19 groups
  def q3(win: WindowSpec, preds: Seq[AdjPred] = Nil): TrendQuery =
    TrendQuery(seq(plus(tp("A")), tp("B")), Semantics.ANY, preds, Some("B"), win)

  def fig7(spark: SparkSession, scales: Seq[Long], budget: Budget = Budget()): Seq[ExpRow] = {
    val points = scales.map { n =>
      (n.toString, EventGen.stock(spark, 2 * n, 19, seed = 13), 2 * n, q3(winFor(n)))
    }
    sweep(spark, "fig7-ANY-all", points, Engines.all, _ => budget)
  }

  def fig8(spark: SparkSession, scales: Seq[Long], budget: Budget = Budget()): Seq[ExpRow] = {
    val points = scales.map { n =>
      (n.toString, EventGen.stock(spark, 2 * n, 19, seed = 13), 2 * n, q3(winFor(n)))
    }
    sweep(spark, "fig8-ANY-online", points, Seq(Greta, ASeq, Engines.CograEngine), _ => budget)
  }

  // ---- Figure 9: predicate selectivity (ANY + adjacency predicate) ------
  def fig9(spark: SparkSession, selectivities: Seq[Double], n: Long,
           budget: Budget = Budget(), flinkBudget: Option[Budget] = None): Seq[ExpRow] = {
    val ds = EventGen.stock(spark, 2 * n, 19, seed = 13)
    val points = selectivities.map { s =>
      (f"$s%.1f", ds, 2 * n, q3(winFor(n), Seq(AdjPred.Sel("A", "A", s))))
    }
    val engines = Seq(FlinkLike, Sase, Greta, Engines.CograEngine)
    sweep(spark, "fig9-selectivity", points, engines,
          e => if (e.name == "Flink") flinkBudget.getOrElse(budget) else budget)
  }

  // ---- Figure 10: number of trend groups ---------------------------------
  def fig10(spark: SparkSession, groups: Seq[Int], n: Long,
            budget: Budget = Budget()): Seq[ExpRow] = {
    val points = groups.map { g =>
      (g.toString,
       EventGen.stream(spark, 2 * n, g, Seq("A" -> 0.5, "B" -> 0.3, "C" -> 0.2),
                       seed = 17, walkValues = false),
       2 * n, q3(winFor(n)))
    }
    sweep(spark, "fig10-grouping", points, Engines.all, _ => budget)
  }

  // ---- Table 9: expressive power matrix ----------------------------------
  final case class Table9Row(engine: String, kleene: Boolean, any: Boolean,
                             next: Boolean, cont: Boolean, adjPreds: Boolean,
                             online: Boolean)

  def table9: Seq[Table9Row] =
    Engines.all.map { e =>
      Table9Row(e.name, e.nativeKleene,
        e.supportsSemantics(Semantics.ANY), e.supportsSemantics(Semantics.NEXT),
        e.supportsSemantics(Semantics.CONT), e.supportsAdjPreds, e.online)
    }

  /** Assert that all engines that terminated agree on COUNT(*) at every
    * scale point. ANY-semantics counts reach 1e100+ where different
    * summation orders differ in the last ulps, so agreement is relative
    * (1e-9); infinite counts (past Double range) must be infinite for all. */
  def assertCountsAgree(rows: Seq[ExpRow]): Unit =
    rows.groupBy(_.x).foreach { case (x, rs) =>
      val cs = rs.filter(!_.dnf).map(_.totalCount)
      if (cs.nonEmpty) {
        if (cs.exists(_.isInfinity))
          require(cs.forall(_.isInfinity), s"engines disagree at $x: $cs")
        else
          require(cs.max - cs.min <= 1e-9 * math.max(1.0, cs.max.abs),
            s"engines disagree at $x: $cs")
      }
    }

  // ---- reporting ----------------------------------------------------------
  def markdown(rows: Seq[ExpRow]): String = {
    val header =
      "| fig | engine | x | events | windows | wall ms | compute ms | lat ms/win | evt/s | mem units | trends | count | DNF |\n" +
      "|---|---|---|---|---|---|---|---|---|---|---|---|---|\n"
    header + rows.map { r =>
      if (r.dnf)
        f"| ${r.fig} | ${r.engine} | ${r.x} | ${r.events} | - | - | - | - | - | - | - | - | DNF |"
      else
        f"| ${r.fig} | ${r.engine} | ${r.x} | ${r.events} | ${r.windows} | ${r.wallMs}%.0f " +
        f"| ${r.computeMs}%.1f | ${r.latencyMsPerWin}%.2f | ${r.throughputEvS}%.0f " +
        f"| ${r.memUnits} | ${r.trends} | ${r.totalCount}%.4g |  |"
    }.mkString("\n")
  }

  def printRows(rows: Seq[ExpRow]): Unit = {
    // println is the delivery channel: bench suites run under `sbt bench/test`
    // whose captured output is the experiment record (EXPERIMENTS.md source).
    println(markdown(rows))
  }
}
