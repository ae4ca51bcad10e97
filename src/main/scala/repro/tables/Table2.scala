package repro.tables

import org.apache.spark.sql.SparkSession
import repro.core.LmfaoService
import repro.datasets.SchemaDataset

/** Paper Table 2: per dataset × workload {CM, RT, MI, DC} — the number of
  * application aggregates (A), intermediate aggregates synthesized by LMFAO
  * (I), merged views (V), view groups (G), and the on-disk size of the
  * application aggregates in MB.
  */
object Table2 {

  final case class Row(dataset: String, workload: String,
                       a: Int, i: Int, v: Int, g: Int, sizeMb: Double)

  def compute(spark: SparkSession, sf: Double = Workloads.benchSf,
              datasets: Seq[SchemaDataset] = Workloads.datasets): Seq[Row] =
    datasets.flatMap { ds =>
      val (dfs, sizes) = Workloads.loadPersisted(spark, ds, sf)
      val svc = new LmfaoService(spark, ds.tree, dfs, sizes)
      val rows = Workloads.batches(ds, dfs).filterNot(_._1 == "Count").map { case (wl, batch) =>
        val plan  = svc.planOnly(batch)
        val out   = svc.run(batch)
        val size = out.map { case (_, df) => Workloads.sizeMb(df, df.count()) }.sum
        svc.close()
        val st = plan.stats
        Row(ds.name, wl, st.appAggs, st.intermediateAggs, st.views, st.groups, size)
      }
      dfs.values.foreach(_.unpersist(blocking = false))
      rows
    }

  def render(rows: Seq[Row]): String = {
    val sb = new StringBuilder
    sb ++= "== Table 2: aggregates (A), intermediates (I), views (V), groups (G), output MB ==\n"
    sb ++= f"${"dataset"}%-10s ${"workload"}%-14s ${"A"}%6s ${"I"}%6s ${"V"}%5s ${"G"}%4s ${"sizeMB"}%9s\n"
    for (r <- rows)
      sb ++= f"${r.dataset}%-10s ${r.workload}%-14s ${r.a}%6d ${r.i}%6d ${r.v}%5d ${r.g}%4d ${r.sizeMb}%9.2f\n"
    sb.result()
  }
}
