package repro.baselines

import repro.core._
import scala.collection.mutable

/** GRETA baseline (paper §9.1 and [32]): online event trend aggregation
  * under skip-till-any-match at the finest (event) granularity. Every
  * matched event is kept as a graph node carrying its aggregate; a new
  * event scans all stored events of its predecessor types (evaluating the
  * adjacency predicates edge by edge), so time is O(n²) and memory O(n) —
  * the graph-construction overhead the paper's §9.2/§9.4 attribute GRETA's
  * delays to.
  */
object Greta extends TrendEngine {
  val name = "GRETA"
  val nativeKleene = true
  def supportsSemantics(s: Semantics) = s == Semantics.ANY
  val supportsAdjPreds = true
  val online = true

  def run(events: IndexedSeq[Ev], q: TrendQuery, budget: Budget): RunResult =
    try {
      val info = q.info
      val deadline = budget.deadline
      val nodes = mutable.ArrayBuffer.empty[StoredEv] // the GRETA graph
      var finalAgg = Agg.zero
      var peak = 0L
      var i = 0
      for (e <- events) {
        i += 1
        if ((i & 0xFF) == 0 && System.currentTimeMillis() > deadline) throw new BudgetExceeded
        val tpe = e.etype
        if (info.contains(tpe)) {
          val predTs = info.preds(tpe)
          var s = if (info.isStart(tpe)) Agg.startUnit else Agg.zero
          val it = nodes.iterator
          while (it.hasNext) {
            val p = it.next()
            if (predTs(p.etype) &&
                (p.time < e.time || (p.time == e.time && p.sid < e.sid)) &&
                AdjPred.holds(q.adjPreds, p.toEv, e))
              s = Agg.merge(s, p.agg)
          }
          val eAgg = Agg.extend(s, e.value, tpe == q.target)
          if (!eAgg.isZero) {
            nodes += StoredEv(e.sid, e.time, tpe, e.value, eAgg)
            if (nodes.size > budget.maxUnits) throw new BudgetExceeded
            if (info.isEnd(tpe)) finalAgg = Agg.merge(finalAgg, eAgg)
          }
          peak = math.max(peak, nodes.size.toLong)
        }
      }
      RunResult(finalAgg, peak + 1, 0L, dnf = false)
    } catch { case _: BudgetExceeded => RunResult.DNF }
}
