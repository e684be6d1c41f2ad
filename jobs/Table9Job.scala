package repro.jobs

import repro.bench.Experiments

/** Table 9 (expressive power of the event aggregation approaches):
  * `spark-submit --class repro.jobs.Table9Job ...` (no Spark work needed). */
object Table9Job {
  def main(args: Array[String]): Unit = {
    println("| Approach | Kleene | ANY | NEXT | CONT | adj. predicates | online |")
    println("|---|---|---|---|---|---|---|")
    Experiments.table9.foreach { r =>
      def m(b: Boolean) = if (b) "+" else "-"
      println(s"| ${r.engine} | ${m(r.kleene)} | ${m(r.any)} | ${m(r.next)} " +
        s"| ${m(r.cont)} | ${m(r.adjPreds)} | ${m(r.online)} |")
    }
  }
}
