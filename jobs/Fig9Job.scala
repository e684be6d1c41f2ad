package repro.jobs

import repro.bench.{Experiments, JobSupport}

/** Figure 9 (predicate selectivity, ANY + adjacency predicate, stock data):
  * `spark-submit --class repro.jobs.Fig9Job ... [selectivity,...]` */
object Fig9Job {
  def main(args: Array[String]): Unit = {
    val spark = JobSupport.session("cogra-fig9")
    val sels = JobSupport.doubles(args, Seq(0.1, 0.3, 0.5, 0.7, 0.9))
    Experiments.printRows(Experiments.fig9(spark, sels, n = 400L))
    spark.stop()
  }
}
