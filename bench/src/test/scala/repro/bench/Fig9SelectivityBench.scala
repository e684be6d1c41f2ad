package repro.bench

import repro.SparkSpec
import repro.baselines.Budget

/** Figure 9: predicate selectivity 10–90% (SEQ(A+,B) under ANY with a
  * tunable-selectivity predicate on (A,A) adjacency; stock data; 50k-event
  * windows in the paper, scaled down here). Engines: Flink, SASE, GRETA,
  * Cogra at mixed granularity (A-Seq excluded — no predicate support).
  * Paper: Flink fails past 50% selectivity; Cogra beats SASE by 2 orders
  * and GRETA by 2x at 90%. */
class Fig9SelectivityBench extends SparkSpec {

  test("fig9: predicate selectivity sweep") {
    val sels = Seq(0.1, 0.3, 0.5, 0.7, 0.9)
    val rows = Experiments.fig9(spark, sels, n = 400L,
      budget = Budget(maxTrends = 5_000_000, maxMillis = 15_000),
      flinkBudget = Some(Budget(maxTrends = 5_000_000, maxUnits = 60_000, maxMillis = 15_000)))
    Experiments.printRows(rows)

    val byEngine = rows.groupBy(_.engine)
    assert(byEngine("Cogra").forall(!_.dnf))
    assert(byEngine("GRETA").forall(!_.dnf))
    // Flink's stored-trend memory explodes with selectivity (paper: DNF >50%)
    assert(byEngine("Flink").exists(_.dnf), "Flink should DNF at high selectivity")
    // all engines that terminate agree
    Experiments.assertCountsAgree(rows)
    // Cogra stores only restricted-type events: fewer units than GRETA's
    // all-matched-events graph at the top selectivity (paper: 2x)
    val c = byEngine("Cogra").maxBy(_.x.toDouble)
    val g = byEngine("GRETA").maxBy(_.x.toDouble)
    assert(c.memUnits <= g.memUnits, s"cogra=${c.memUnits} greta=${g.memUnits}")
  }
}
