package repro.bench

import org.scalatest.funsuite.AnyFunSuite

/** Table 9: expressive power of the event aggregation approaches — printed
  * as the paper's matrix and asserted cell by cell. */
class Table9ExpressivePowerBench extends AnyFunSuite {

  test("table9: expressive power matrix") {
    def m(b: Boolean) = if (b) "+" else "-"
    println("| Approach | Kleene | ANY | NEXT | CONT | adj. predicates | online |")
    println("|---|---|---|---|---|---|---|")
    Experiments.table9.foreach { r =>
      println(s"| ${r.engine} | ${m(r.kleene)} | ${m(r.any)} | ${m(r.next)} " +
        s"| ${m(r.cont)} | ${m(r.adjPreds)} | ${m(r.online)} |")
    }
    val rows = Experiments.table9.map(r => r.engine -> r).toMap
    assert(rows("Flink").productIterator.toSeq ==
      Seq("Flink", false, true, false, true, true, false))
    assert(rows("SASE").productIterator.toSeq ==
      Seq("SASE", true, true, true, true, true, false))
    assert(rows("GRETA").productIterator.toSeq ==
      Seq("GRETA", true, true, false, false, true, true))
    assert(rows("A-Seq").productIterator.toSeq ==
      Seq("A-Seq", false, true, false, false, false, true))
    assert(rows("Cogra").productIterator.toSeq ==
      Seq("Cogra", true, true, true, true, true, true))
  }
}
