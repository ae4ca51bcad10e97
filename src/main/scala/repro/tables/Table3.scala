package repro.tables

import org.apache.spark.sql.SparkSession
import repro.core._
import repro.datasets.SchemaDataset

/** Paper Table 3: wall-clock seconds for each aggregate-batch workload —
  * LMFAO vs the per-query baselines, with relative speedups.
  *
  * Baseline mapping (DESIGN.md §3): each engine receives the same list of
  * queries as LMFAO (one query per group-by set, multiple aggregates per
  * query) and evaluates them independently over the natural join:
  *  - "PQ-cached" (DBX proxy): the join is materialized once and reused;
  *  - "PQ-cold" (MonetDB proxy): the join is recomputed for every query;
  *    capped at `ColdSampleCap` sampled queries with extrapolation (marked
  *    `~`) to bound bench time.
  */
object Table3 {

  val ColdSampleCap = 8

  final case class Row(dataset: String, workload: String, system: String,
                       seconds: Double, speedupVsLmfao: Double, extrapolated: Boolean)

  def compute(spark: SparkSession, sf: Double = Workloads.benchSf,
              datasets: Seq[SchemaDataset] = Workloads.datasets,
              includeCold: Boolean = true): Seq[Row] =
    datasets.flatMap { ds =>
      val (dfs, sizes) = Workloads.loadPersisted(spark, ds, sf)
      val rows = Workloads.batches(ds, dfs).flatMap { case (wl, batch) =>
        // LMFAO: full layered pipeline, timed end to end (plan + execute).
        val lmfao = new LmfaoService(spark, ds.tree, dfs, sizes)
        val (_, tL) = Timing.timed { Workloads.drain(lmfao.run(batch)) }
        lmfao.close()

        // DBX proxy: per-query over a join materialized once (materialization
        // is part of its measured work).
        val cachedSvc = new FlatJoinService(spark, ds.tree, dfs, cached = true)
        val (_, tCachedTotal) = Timing.timed {
          cachedSvc.joined // forces materialization
          Workloads.timeBaseline(cachedSvc, batch)
        }
        cachedSvc.close()

        // MonetDB proxy: per-query, join recomputed every time (sampled).
        val cold =
          if (!includeCold) None
          else {
            val coldSvc = new FlatJoinService(spark, ds.tree, dfs, cached = false)
            val r = Workloads.timeBaseline(coldSvc, batch, ColdSampleCap)
            coldSvc.close()
            Some(r)
          }

        Seq(
          Row(ds.name, wl, "LMFAO", tL, 1.0, extrapolated = false),
          Row(ds.name, wl, "PQ-cached", tCachedTotal, tCachedTotal / tL, extrapolated = false),
        ) ++ cold.map { case (t, ex) => Row(ds.name, wl, "PQ-cold", t, t / tL, ex) }
      }
      dfs.values.foreach(_.unpersist(blocking = false))
      rows
    }

  /** Figure 5-style ablation on one dataset: covar-matrix time with layers
    * switched off (single root / no merging / sequential groups).
    */
  def ablation(spark: SparkSession, ds: SchemaDataset, sf: Double = Workloads.benchSf)
      : Seq[(String, Double)] = {
    val (dfs, sizes) = Workloads.loadPersisted(spark, ds, sf)
    val batch = Workloads.covarBatch(ds)
    def run(tag: String, merge: Boolean, multiRoot: Boolean, parallel: Boolean): (String, Double) = {
      val svc = new LmfaoService(spark, ds.tree, dfs, sizes, merge = merge,
        multiRoot = multiRoot, parallel = parallel)
      val (_, t) = Timing.timed { Workloads.drain(svc.run(batch)) }
      svc.close()
      tag -> t
    }
    val rows = Seq(
      run("unshared (AC/DC proxy)", merge = false, multiRoot = false, parallel = false),
      run("+merging",               merge = true,  multiRoot = false, parallel = false),
      run("+multi-root",            merge = true,  multiRoot = true,  parallel = false),
      run("+parallel (full LMFAO)", merge = true,  multiRoot = true,  parallel = true),
    )
    dfs.values.foreach(_.unpersist(blocking = false))
    rows
  }

  def render(rows: Seq[Row]): String = {
    val sb = new StringBuilder
    sb ++= "== Table 3: aggregate-batch wall time (seconds; speedup vs LMFAO) ==\n"
    sb ++= f"${"dataset"}%-10s ${"workload"}%-14s ${"system"}%-10s ${"sec"}%9s ${"vs LMFAO"}%9s\n"
    for (r <- rows) {
      val mark = if (r.extrapolated) "~" else " "
      sb ++= f"${r.dataset}%-10s ${r.workload}%-14s ${r.system}%-10s $mark${r.seconds}%8.2f ${r.speedupVsLmfao}%8.2fx\n"
    }
    sb.result()
  }
}
