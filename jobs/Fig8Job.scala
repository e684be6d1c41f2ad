package repro.jobs

import repro.bench.{Experiments, JobSupport}

/** Figure 8 (skip-till-any-match, online approaches, stock data):
  * `spark-submit --class repro.jobs.Fig8Job ... [eventsPerWindow,...]` */
object Fig8Job {
  def main(args: Array[String]): Unit = {
    val spark = JobSupport.session("cogra-fig8")
    val scales = JobSupport.longs(args, Seq(10_000L, 20_000L, 50_000L, 100_000L, 200_000L, 500_000L))
    Experiments.printRows(Experiments.fig8(spark, scales))
    spark.stop()
  }
}
