package repro.bench

import java.nio.file.{Files, Paths, StandardOpenOption}
import repro.SparkSpec

/** Base for the table benches: prints each reproduced table and also appends
  * it to bench_results/<name>.txt so EXPERIMENTS.md can be assembled from
  * the artifacts.
  */
trait BenchBase extends SparkSpec {

  // Benches run a realistic engine configuration: dimension tables and
  // aggregate views are tiny, so broadcast joins are the honest Spark plan
  // for LMFAO *and* the baselines; few shuffle partitions match the data
  // scale. (Unit tests keep broadcast off to exercise shuffle paths.)
  override def beforeAll(): Unit = {
    super.beforeAll()
    spark.conf.set("spark.sql.autoBroadcastJoinThreshold", 10L * 1024 * 1024)
    spark.conf.set("spark.sql.shuffle.partitions", "8")
  }

  def emit(name: String, text: String): Unit = {
    println(text)
    val dir = Paths.get(sys.props.getOrElse("repro.bench.outdir", "bench_results"))
    Files.createDirectories(dir)
    Files.write(dir.resolve(s"$name.txt"), text.getBytes("UTF-8"),
      StandardOpenOption.CREATE, StandardOpenOption.TRUNCATE_EXISTING)
  }
}
