package repro.jobs

import repro.bench.{Experiments, JobSupport}

/** Figure 10 (event trend grouping, all approaches, transport-style data):
  * `spark-submit --class repro.jobs.Fig10Job ... [groups,...]` */
object Fig10Job {
  def main(args: Array[String]): Unit = {
    val spark = JobSupport.session("cogra-fig10")
    // descending: fewer groups are exponentially harder for the two-step
    // engines, and the harness skips an engine's remaining points after DNF
    val groups = JobSupport.ints(args, Seq(30, 25, 20, 15, 10, 5))
    Experiments.printRows(Experiments.fig10(spark, groups, n = 600L))
    spark.stop()
  }
}
