package repro.jobs

import repro.bench.{Experiments, JobSupport}

/** Figure 5 (contiguous semantics, all approaches, activity data):
  * `spark-submit --class repro.jobs.Fig5Job ... [eventsPerWindow,...]` */
object Fig5Job {
  def main(args: Array[String]): Unit = {
    val spark = JobSupport.session("cogra-fig5")
    val scales = JobSupport.longs(args, Seq(10_000L, 50_000L, 100_000L, 500_000L, 1_000_000L))
    Experiments.printRows(Experiments.fig5(spark, scales))
    spark.stop()
  }
}
