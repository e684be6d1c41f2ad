package repro.jobs

import repro.bench.{Experiments, JobSupport}

/** Figure 7 (skip-till-any-match, all approaches, stock data):
  * `spark-submit --class repro.jobs.Fig7Job ... [eventsPerWindow,...]` */
object Fig7Job {
  def main(args: Array[String]): Unit = {
    val spark = JobSupport.session("cogra-fig7")
    val scales = JobSupport.longs(args, Seq(100L, 200L, 400L, 800L, 1_600L, 3_200L))
    Experiments.printRows(Experiments.fig7(spark, scales))
    spark.stop()
  }
}
