package repro.tables

import org.apache.spark.sql.SparkSession
import repro.core.FlatJoinService
import repro.datasets.SchemaDataset

/** Paper Table 1: characteristics of the four datasets — tuples and size of
  * the database, tuples and size of the join result, relation/attribute/
  * categorical-attribute counts. Reproduced over the synthetic datasets at
  * the bench scale factor.
  */
object Table1 {

  final case class Row(dataset: String, dbTuples: Long, dbMb: Double,
                       joinTuples: Long, joinMb: Double,
                       relations: Int, attrs: Int, catAttrs: Int)

  def compute(spark: SparkSession, sf: Double = Workloads.benchSf,
              datasets: Seq[SchemaDataset] = Workloads.datasets): Seq[Row] =
    datasets.map { ds =>
      val (dfs, sizes) = Workloads.loadPersisted(spark, ds, sf)
      val dbTuples = sizes.values.sum
      val dbMb = dfs.map { case (n, df) => Workloads.sizeMb(df, sizes(n)) }.sum
      val joined  = FlatJoinService.fullJoin(ds.tree, dfs)
      val joinRows = joined.count()
      val joinMb   = Workloads.sizeMb(joined, joinRows)
      val row = Row(ds.name, dbTuples, dbMb, joinRows, joinMb,
        ds.tree.relations.size, ds.tree.allAttrs.size, ds.categorical.size)
      dfs.values.foreach(_.unpersist(blocking = false))
      row
    }

  def render(rows: Seq[Row]): String = {
    val sb = new StringBuilder
    sb ++= "== Table 1: dataset characteristics ==\n"
    sb ++= f"${"dataset"}%-10s ${"dbTuples"}%12s ${"dbMB"}%9s ${"joinTuples"}%12s ${"joinMB"}%9s ${"rels"}%5s ${"attrs"}%6s ${"cat"}%4s\n"
    for (r <- rows)
      sb ++= f"${r.dataset}%-10s ${r.dbTuples}%12d ${r.dbMb}%9.1f ${r.joinTuples}%12d ${r.joinMb}%9.1f ${r.relations}%5d ${r.attrs}%6d ${r.catAttrs}%4d\n"
    sb.result()
  }
}
