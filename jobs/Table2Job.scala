package repro.jobs

/** Reproduces paper Table 2 (batch/plan statistics: A, I, V, G, output size).
  * Usage: spark-submit --class repro.jobs.Table2Job repro.jar [sf]
  */
object Table2Job {
  def main(args: Array[String]): Unit = {
    val spark = JobSession.build("lmfao-table2")
    println(repro.tables.Table2.render(
      repro.tables.Table2.compute(spark, JobSession.sfFromArgs(args))))
    spark.stop()
  }
}
