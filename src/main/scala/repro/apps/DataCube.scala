package repro.apps

import org.apache.spark.sql.DataFrame
import org.apache.spark.sql.functions._
import repro.core._

/** Data cubes (§2, eq. 6): for k dimension attributes and v measures, the
  * 2^k group-by aggregates over every subset of the dimensions, plus the
  * 1NF assembly with the special `ALL` value of Gray et al.
  */
object DataCube {

  def subsetQ(dims: Seq[String]): String =
    if (dims.isEmpty) "cube_all" else s"cube_${dims.mkString("_")}"
  def measureName(m: String): String = s"sum__$m"

  /** All 2^k subsets of `dims`, in a stable order (preserving dim order). */
  def subsets(dims: Seq[String]): Seq[Seq[String]] =
    dims.foldLeft(Seq(Seq.empty[String]))((acc, d) => acc ++ acc.map(_ :+ d))

  /** The batch: one query per dimension subset, `v` SUM measures each. */
  def batch(dims: Seq[String], measures: Seq[String]): Seq[AggQuery] =
    subsets(dims).map { s =>
      AggQuery(subsetQ(s), s, measures.map(m => NamedAgg(measureName(m), Seq(Att(m)))))
    }

  def numAggregates(k: Int, v: Int): Int = (1 << k) * v

  /** 1NF cube table: union of all subset results with `ALL` filling the
    * rolled-up dimensions (dimension columns cast to string).
    */
  def assemble(out: Map[String, DataFrame], dims: Seq[String], measures: Seq[String]): DataFrame = {
    val parts = subsets(dims).map { s =>
      val df = out(subsetQ(s))
      val cols = dims.map(d0 => if (s.contains(d0)) col(d0).cast("string").as(d0) else lit("ALL").as(d0)) ++
        measures.map(m => col(measureName(m)))
      df.select(cols: _*)
    }
    parts.reduce(_ unionByName _)
  }

  def compute(service: AggService, dims: Seq[String], measures: Seq[String]): DataFrame =
    assemble(service.run(batch(dims, measures)), dims, measures)
}
