package repro.jobs

/** Reproduces paper Table 5 (TPC-DS classification-tree training).
  * Usage: spark-submit --class repro.jobs.Table5Job repro.jar [sf]
  */
object Table5Job {
  def main(args: Array[String]): Unit = {
    val spark = JobSession.build("lmfao-table5")
    println(repro.tables.Table5.render(
      repro.tables.Table5.compute(spark, JobSession.sfFromArgs(args))))
    spark.stop()
  }
}
