package repro.bench

import repro.SparkSpec
import repro.baselines.Budget

/** Figure 6: skip-till-next-match ((SEQ(A+,B))+, transport data, 30
  * groups), SASE vs Cogra (the only engines supporting NEXT, Table 9).
  * Paper: SASE fails past 4M events/window with hours of delay; Cogra is 4
  * orders faster and 5 orders smaller at SASE's last point. */
class Fig6NextMatchBench extends SparkSpec {

  test("fig6: skip-till-next-match sweep") {
    val scales = Seq(1_000L, 5_000L, 10_000L, 50_000L, 100_000L)
    val rows = Experiments.fig6(spark, scales, Budget(maxMillis = 15_000))
    Experiments.printRows(rows)

    val cogra = rows.filter(_.engine == "Cogra")
    val sase = rows.filter(_.engine == "SASE")
    assert(cogra.forall(!_.dnf), "Cogra must never DNF")
    // identical aggregates wherever SASE terminates (two-step == online)
    Experiments.assertCountsAgree(rows)
    // Cogra memory is constant per substream; SASE's partial-trend sets grow
    val lastBoth = sase.filter(!_.dnf).map(_.x).toSet
    if (lastBoth.nonEmpty) {
      val x = lastBoth.maxBy(_.toLong)
      val c = cogra.find(_.x == x).get
      val s = sase.find(_.x == x).get
      assert(c.memUnits < s.memUnits, s"cogra=${c.memUnits} sase=${s.memUnits}")
      assert(c.computeMs <= s.computeMs, s"cogra=${c.computeMs} sase=${s.computeMs}")
    }
  }
}
