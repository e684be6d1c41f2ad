package repro.jobs

import repro.bench.{Experiments, JobSupport}

/** Figure 6 (skip-till-next-match, SASE vs Cogra, transport data):
  * `spark-submit --class repro.jobs.Fig6Job ... [eventsPerWindow,...]` */
object Fig6Job {
  def main(args: Array[String]): Unit = {
    val spark = JobSupport.session("cogra-fig6")
    val scales = JobSupport.longs(args, Seq(1_000L, 5_000L, 10_000L, 50_000L, 100_000L, 500_000L))
    Experiments.printRows(Experiments.fig6(spark, scales))
    spark.stop()
  }
}
