package repro.jobs

import repro.datasets.Retailer

/** Reproduces paper Table 3 (aggregate-batch timings: LMFAO vs per-query
  * baselines) plus the Figure 5-style ablation on Retailer.
  * Usage: spark-submit --class repro.jobs.Table3Job repro.jar [sf]
  */
object Table3Job {
  def main(args: Array[String]): Unit = {
    val spark = JobSession.build("lmfao-table3")
    val sf = JobSession.sfFromArgs(args)
    println(repro.tables.Table3.render(repro.tables.Table3.compute(spark, sf)))
    println("== Figure 5-style ablation (Retailer covar matrix, seconds) ==")
    repro.tables.Table3.ablation(spark, Retailer, sf).foreach { case (tag, t) =>
      println(f"  $tag%-28s $t%8.2f")
    }
    spark.stop()
  }
}
