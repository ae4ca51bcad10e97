package repro.jobs

/** Reproduces paper Table 4 (LR + regression-tree training over Retailer and
  * Favorita). Usage: spark-submit --class repro.jobs.Table4Job repro.jar [sf]
  */
object Table4Job {
  def main(args: Array[String]): Unit = {
    val spark = JobSession.build("lmfao-table4")
    println(repro.tables.Table4.render(
      repro.tables.Table4.compute(spark, JobSession.sfFromArgs(args))))
    spark.stop()
  }
}
