package repro.core

import java.util.concurrent.Executors
import scala.concurrent.duration.Duration
import scala.concurrent.{Await, ExecutionContext, Future}

import org.apache.spark.sql.{Column, DataFrame, SparkSession}
import org.apache.spark.sql.functions._
import org.apache.spark.storage.StorageLevel

/** Result of executing a plan: per-view DataFrames (shared ones persisted)
  * and the final per-query outputs. Call [[close]] to unpersist everything.
  */
final class ExecResult(val plan: Plan,
                       val viewDfs: Map[Int, DataFrame],
                       val outputs: Map[String, DataFrame],
                       persisted: Seq[DataFrame]) {
  def close(): Unit = persisted.foreach(_.unpersist(blocking = false))
}

/** The Group Views + Multi-Output Optimization + Parallelization layers
  * (§§3.4–3.5), mapped to Catalyst.
  *
  * Views are executed group by group in dependency-depth order. Within a
  * group (one source relation, one depth):
  *
  *  - each distinct *body* — the relation natural-joined with one set of
  *    incoming views — is built once and cached when used by more than one
  *    aggregation pass: the Spark analogue of the paper's single shared trie
  *    scan over the common relation;
  *  - every view over that body is one multi-aggregate `groupBy().agg(...)`
  *    pass, so all its aggregates share the scan (Catalyst whole-stage
  *    codegen compiles the pass to specialized bytecode — the Compilation
  *    layer analogue);
  *  - merge case (1): a view whose aggregates have different bodies is the
  *    join of its per-body partials on the (identical) group-by attributes.
  *
  * Groups of one depth level never depend on each other and are submitted
  * concurrently (`parallel = true`), giving task parallelism on top of
  * Spark's partition parallelism.
  */
final class Executor(spark: SparkSession, dfs: Map[String, DataFrame],
                     parallel: Boolean = true) {

  /** Natural join on the common column names (cross join if none). */
  def natJoin(a: DataFrame, b: DataFrame): DataFrame = {
    val common = a.columns.toSeq.intersect(b.columns.toSeq)
    if (common.isEmpty) a.crossJoin(b) else a.join(b, common, "inner")
  }

  private def aggColName(viewId: Int, aggName: String): String = s"v${viewId}_$aggName"

  private def productCol(a: ViewAgg): Column = {
    val cols = a.local.map(_.toCol) ++ a.children.map(r => col(aggColName(r.view, r.agg)))
    if (cols.isEmpty) lit(1.0d) else cols.reduce(_ * _)
  }

  def run(plan: Plan): ExecResult = {
    val viewDfs = scala.collection.concurrent.TrieMap[Int, DataFrame]()

    // Sharing analysis: a view consumed by more than one other view (or by a
    // consumer *and* the application) is materialized — that is exactly the
    // computation LMFAO shares. Single-consumer views stay lazy and fuse
    // into their consumer's Catalyst plan (the paper's code inlining).
    val consumerCount: Map[Int, Int] =
      plan.views.flatMap(v => v.aggs.flatMap(_.children.map(_.view)).distinct.map(_ -> v.id))
        .groupBy(_._1).view.mapValues(_.map(_._2).distinct.size).toMap
    val outputUse: Map[Int, Int] =
      plan.outputs.groupBy(_.view).view.mapValues(_ => 1).toMap
    def shouldPersist(id: Int): Boolean =
      consumerCount.getOrElse(id, 0) + outputUse.getOrElse(id, 0) > 1

    // Body usage counts across the whole plan: bases used by >1 aggregation
    // pass get persisted (the shared scan).
    val bodyUse: Map[(String, Seq[Int]), Int] =
      plan.views.flatMap(v => v.aggs.map(_.signature).distinct.map(sig => (v.from, sig)))
        .groupBy(identity).view.mapValues(_.size).toMap

    val baseCache = scala.collection.concurrent.TrieMap[(String, Seq[Int]), DataFrame]()
    val persistedBases = scala.collection.concurrent.TrieMap[DataFrame, Unit]()

    def baseFor(from: String, sig: Seq[Int]): DataFrame =
      baseCache.getOrElseUpdate((from, sig), {
        val b = sig.foldLeft(dfs(from))((acc, vid) => natJoin(acc, viewDfs(vid)))
        if (bodyUse.getOrElse((from, sig), 0) > 1 && sig.nonEmpty) {
          val p = b.persist(StorageLevel.MEMORY_AND_DISK)
          persistedBases.put(p, ()); p
        } else b
      })

    def compute(v: ViewSpec): DataFrame = {
      val partials: Seq[DataFrame] = v.aggs.toSeq.groupBy(_.signature).toSeq.sortBy(_._1.mkString(",")).map {
        case (sig, aggs) =>
          val base = baseFor(v.from, sig)
          val aggCols = aggs.map(a => sum(productCol(a)).as(aggColName(v.id, a.name)))
          if (v.groupBy.isEmpty) base.agg(aggCols.head, aggCols.tail: _*)
          else base.groupBy(v.groupBy.map(col): _*).agg(aggCols.head, aggCols.tail: _*)
      }
      partials.reduce { (x, y) =>
        if (v.groupBy.isEmpty) x.crossJoin(y) else x.join(y, v.groupBy, "inner")
      }
    }

    val persistedViews = scala.collection.concurrent.TrieMap[DataFrame, Unit]()
    val levels = plan.groups.groupBy(_._1._2).toSeq.sortBy(_._1)
    val pool   = Executors.newFixedThreadPool(math.min(8, Runtime.getRuntime.availableProcessors()))
    implicit val ec: ExecutionContext = ExecutionContext.fromExecutor(pool)
    try {
      for ((_, groupsAtLevel) <- levels) {
        // Build every view's DataFrame; only shared views are persisted and
        // forced now (in parallel across the level's independent groups).
        val toForce = scala.collection.mutable.ArrayBuffer[Seq[DataFrame]]()
        for ((_, viewIds) <- groupsAtLevel) {
          val forced = viewIds.flatMap { id =>
            val df0 = compute(plan.views(id))
            if (shouldPersist(id)) {
              val df = df0.persist(StorageLevel.MEMORY_AND_DISK)
              persistedViews.put(df, ())
              viewDfs.put(id, df)
              Some(df)
            } else { viewDfs.put(id, df0); None }
          }
          if (forced.nonEmpty) toForce += forced
        }
        if (parallel && toForce.size > 1) {
          val fs = toForce.map(dfs0 => Future(dfs0.foreach(_.count())))
          Await.result(Future.sequence(fs.toSeq), Duration.Inf)
        } else toForce.foreach(_.foreach(_.count()))
      }
    } finally pool.shutdown()

    val outputs = plan.outputs.map { o =>
      val df = viewDfs(o.view)
      val cols = o.query.groupBy.map(col) ++
        o.aggNames.map { case (qName, vName) => col(aggColName(o.view, vName)).as(qName) }
      o.query.name -> df.select(cols: _*)
    }.toMap

    // Bases stay cached until close(): lazy (unpersisted) views still
    // reference them from the application's output actions.
    new ExecResult(plan, viewDfs.toMap, outputs,
      (persistedBases.keys ++ persistedViews.keys).toSeq)
  }
}
