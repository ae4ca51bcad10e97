package repro.apps

import org.apache.spark.sql.{Column, DataFrame, Row}
import org.apache.spark.sql.functions._
import repro.core._

/** CART decision trees (§2 eqs. 8–10, §4.2) driven entirely by aggregate
  * batches over the join — no training-set materialization.
  *
  * Each tree level issues ONE batch covering every open node:
  *  - regression (variance cost): COUNT/SUM(y)/SUM(y²) under the node's
  *    ancestor-condition product α, for the node total and for every
  *    candidate continuous threshold (scalar queries), plus one group-by
  *    query per categorical attribute (eq. 8 extended with a group-by);
  *  - classification (Gini): class-frequency counts, i.e. the same shape
  *    grouped by the label (eqs. 9–10).
  *
  * The candidate conditions change between iterations with the data — the
  * paper's *dynamic functions*. Here each iteration plans fresh literal
  * Catalyst expressions (the analogue of recompiling the small dynamic C++
  * file).
  *
  * The same driver runs against LMFAO or the flat-join baseline through
  * [[AggService]], so the two systems are split-for-split comparable.
  */
object DecisionTree {

  /** A chosen split: continuous `attr <= threshold` or categorical
    * `attr = value` (one-vs-rest, §2's per-category costs).
    */
  final case class Split(attr: String, isCat: Boolean, value: String, threshold: Double) {
    def leftFx: Fx  = if (isCat) Ind(attr, "=", value, numeric = false) else Ind(attr, "<=", threshold.toString)
    def rightFx: Fx = if (isCat) Ind(attr, "<>", value, numeric = false) else Ind(attr, ">", threshold.toString)
    def leftCol: Column = if (isCat) col(attr).cast("string") === value
                          else col(attr).cast("double") <= threshold
    override def toString: String =
      if (isCat) s"$attr = $value" else s"$attr <= $threshold"
  }

  /** A tree node. `prediction` is the mean label (regression) or the
    * majority class (classification); `cost` the node's impurity
    * (total squared error, or n·Gini).
    */
  final class Node(val id: Int, val depth: Int, val conds: Seq[Fx],
                   val count: Double, val prediction: String, val cost: Double) {
    var split: Option[Split] = None
    var left: Option[Node]   = None
    var right: Option[Node]  = None
    def isLeaf: Boolean = split.isEmpty
    def nodes: Seq[Node] = this +: (left.toSeq ++ right.toSeq).flatMap(_.nodes)
  }

  final case class Params(maxDepth: Int = 4, minSplit: Double = 1000.0, buckets: Int = 20)

  final case class Tree(root: Node, classification: Boolean, label: String) {
    def size: Int = root.nodes.size
    def leaves: Int = root.nodes.count(_.isLeaf)

    /** Prediction as one nested Catalyst CASE expression. */
    def predictionCol: Column = {
      def rec(n: Node): Column = n.split match {
        case None => if (classification) lit(n.prediction) else lit(n.prediction.toDouble)
        case Some(s) => when(s.leftCol, rec(n.left.get)).otherwise(rec(n.right.get))
      }
      rec(root)
    }

    def rmse(test: DataFrame): Double = math.sqrt(
      test.select(avg(pow(col(label).cast("double") - predictionCol, 2))).collect()(0).getDouble(0))

    def accuracy(test: DataFrame): Double =
      test.select(avg(when(col(label).cast("string") === predictionCol, 1.0).otherwise(0.0)))
        .collect()(0).getDouble(0)

    def describe: String = {
      def rec(n: Node, indent: String): String = n.split match {
        case None => s"$indent→ predict ${n.prediction} (n=${n.count})\n"
        case Some(s) =>
          s"$indent${s} (n=${n.count})\n" + rec(n.left.get, indent + "  ") + rec(n.right.get, indent + "  ")
      }
      rec(root, "")
    }
  }

  /** Build the aggregate batch for one level of open nodes.
    * Returns the queries; result decoding is keyed by the naming scheme
    * `t_<node>` (totals) and `l_<node>_<attrIdx>_<thresholdIdx>` (left side
    * of each candidate continuous split).
    */
  def levelBatch(nodes: Seq[Node], cont: Seq[String], cat: Seq[String], label: String,
                 classification: Boolean, thresholds: Map[String, Seq[Double]],
                 level: Int): Seq[AggQuery] = {
    def withLabel(p: Seq[Fx]): Seq[Seq[Fx]] =
      if (classification) Seq(p)
      else Seq(p, p :+ Att(label), p :+ Pow(label, 2))
    def names(prefix: String): Seq[String] =
      if (classification) Seq(s"${prefix}_c") else Seq(s"${prefix}_c", s"${prefix}_s", s"${prefix}_q")

    val gbMain = if (classification) Seq(label) else Seq.empty[String]
    val mainAggs = nodes.flatMap { n =>
      val tot = names(s"t_${n.id}").zip(withLabel(n.conds)).map { case (nm, p) => NamedAgg(nm, p) }
      val conts = for {
        (a, ai) <- cont.zipWithIndex
        (t, ti) <- thresholds(a).zipWithIndex
        (nm, p) <- names(s"l_${n.id}_${ai}_$ti").zip(withLabel(n.conds :+ Ind(a, "<=", t.toString)))
      } yield NamedAgg(nm, p)
      tot ++ conts
    }
    val main = AggQuery(s"dt_main_$level", gbMain, mainAggs)
    val perCat = cat.map { k =>
      val gb = if (classification) Seq(k, label) else Seq(k)
      AggQuery(s"dt_cat_${k}_$level", gb,
        nodes.flatMap(n => names(s"t_${n.id}").zip(withLabel(n.conds))
          .map { case (nm, p) => NamedAgg(nm, p) }))
    }
    main +: perCat
  }

  /** Regression impurity from (count, sum, sumsq): total squared error
    * Σy² − (Σy)²/n (the paper's variance cost).
    */
  private def varCost(c: Double, s: Double, q: Double): Double =
    if (c <= 0) 0.0 else q - s * s / c

  /** Classification impurity from per-class counts: n·Gini = n − Σ n_k²/n. */
  private def giniCost(byClass: Map[String, Double]): Double = {
    val n = byClass.values.sum
    if (n <= 0) 0.0 else n - byClass.values.map(x => x * x).sum / n
  }

  /** Train a CART tree against an arbitrary aggregate service. */
  def train(service: AggService, cont: Seq[String], cat: Seq[String], label: String,
            classification: Boolean, thresholds: Map[String, Seq[Double]],
            params: Params = Params()): Tree = {
    def d(r: Row, i: Int): Double = r.get(i) match {
      case null                => 0.0
      case x: java.lang.Number => x.doubleValue()
      case x                   => x.toString.toDouble
    }

    var nextId = 0
    def mkNode(depth: Int, conds: Seq[Fx], count: Double, pred: String, cost: Double): Node = {
      val n = new Node(nextId, depth, conds, count, pred, cost); nextId += 1; n
    }

    // Root statistics from a tiny bootstrap batch.
    val rootStats: (Double, String, Double) = {
      val q =
        if (classification) AggQuery("boot", Seq(label), Seq(NamedAgg("c", Seq.empty)))
        else AggQuery("boot", Seq.empty, Seq(NamedAgg("c", Seq.empty),
          NamedAgg("s", Seq(Att(label))), NamedAgg("q", Seq(Pow(label, 2)))))
      val df = service.run(Seq(q))("boot")
      if (classification) {
        val rows = df.collect()
        val by = rows.map(r => r.get(0).toString -> d(r, 1)).toMap
        val n = by.values.sum
        (n, by.maxBy(_._2)._1, giniCost(by))
      } else {
        val r = df.collect()(0)
        val (c, s, q2) = (d(r, 0), d(r, 1), d(r, 2))
        (c, (s / c).toString, varCost(c, s, q2))
      }
    }

    val root = mkNode(0, Seq.empty, rootStats._1, rootStats._2, rootStats._3)
    // CART expands one node per iteration (§2): each node issues its own
    // batch — the paper's "regression tree node" workload — whose dynamic
    // condition functions depend on the splits chosen so far.
    val queue = scala.collection.mutable.Queue(root)
    var level = 0

    while (queue.nonEmpty) {
      val n0 = queue.dequeue()
      if (n0.depth < params.maxDepth && n0.count >= params.minSplit && n0.cost > 1e-9) {
        val expandable = Seq(n0)
        val batch = levelBatch(expandable, cont, cat, label, classification, thresholds, level)
        val out = service.run(batch)

        // ---- decode the main (continuous + totals) query ----
        val mainDf   = out(s"dt_main_$level")
        val mainCols = mainDf.columns
        val mainRows = mainDf.collect()
        // classification: per-class rows; regression: single row
        def mainVal(agg: String, cls: String = ""): Double =
          if (classification)
            mainRows.find(_.get(0).toString == cls).map(r => d(r, mainCols.indexOf(agg))).getOrElse(0.0)
          else d(mainRows(0), mainCols.indexOf(agg))
        val classes: Seq[String] =
          if (classification) mainRows.map(_.get(0).toString).toSeq.distinct.sorted else Seq.empty

        // ---- decode per-categorical queries ----
        val catRows: Map[String, (Array[String], Array[Row])] = cat.map { k =>
          val df = out(s"dt_cat_${k}_$level")
          k -> (df.columns, df.collect())
        }.toMap

        for (n <- expandable) {
          // totals
          val (totCost, totByClass, totC, totS, totQ) =
            if (classification) {
              val by = classes.map(c => c -> mainVal(s"t_${n.id}_c", c)).toMap
              (giniCost(by), by, by.values.sum, 0.0, 0.0)
            } else {
              val c = mainVal(s"t_${n.id}_c"); val s = mainVal(s"t_${n.id}_s"); val q = mainVal(s"t_${n.id}_q")
              (varCost(c, s, q), Map.empty[String, Double], c, s, q)
            }

          var best: Option[(Split, Double, // cost
            (Double, Double, Double, Map[String, Double]),   // left  c,s,q,byClass
            (Double, Double, Double, Map[String, Double]))] = None  // right

          def consider(split: Split, lc: Double, ls: Double, lq: Double,
                       lBy: Map[String, Double]): Unit = {
            val (rc, rs, rq) = (totC - lc, totS - ls, totQ - lq)
            val rBy = if (classification) totByClass.map { case (k2, v) => k2 -> (v - lBy.getOrElse(k2, 0.0)) }
                      else Map.empty[String, Double]
            if (lc >= 1 && rc >= 1) {
              val cost =
                if (classification) giniCost(lBy) + giniCost(rBy)
                else varCost(lc, ls, lq) + varCost(rc, rs, rq)
              if (best.forall(cost < _._2 - 1e-12))
                best = Some((split, cost, (lc, ls, lq, lBy), (rc, rs, rq, rBy)))
            }
          }

          for ((a, ai) <- cont.zipWithIndex; (t, ti) <- thresholds(a).zipWithIndex) {
            if (classification) {
              val by = classes.map(c => c -> mainVal(s"l_${n.id}_${ai}_${ti}_c", c)).toMap
              consider(Split(a, isCat = false, "", t), by.values.sum, 0.0, 0.0, by)
            } else {
              val lc = mainVal(s"l_${n.id}_${ai}_${ti}_c")
              val ls = mainVal(s"l_${n.id}_${ai}_${ti}_s")
              val lq = mainVal(s"l_${n.id}_${ai}_${ti}_q")
              consider(Split(a, isCat = false, "", t), lc, ls, lq, Map.empty)
            }
          }
          for (k <- cat) {
            val (cols, rows) = catRows(k)
            val ki = cols.indexOf(k)
            // Sorted for determinism: mirrored one-vs-rest splits on a binary
            // domain tie in cost, and both services must break ties alike.
            val values = rows.map(_.get(ki).toString).distinct.sorted
            for (v <- values) {
              val vRows = rows.filter(_.get(ki).toString == v)
              if (classification) {
                val li = cols.indexOf(label)
                val by = vRows.map(r => r.get(li).toString -> d(r, cols.indexOf(s"t_${n.id}_c")))
                  .groupBy(_._1).map { case (c, xs) => c -> xs.map(_._2).sum }
                consider(Split(k, isCat = true, v, 0.0), by.values.sum, 0.0, 0.0, by)
              } else {
                val lc = vRows.map(r => d(r, cols.indexOf(s"t_${n.id}_c"))).sum
                val ls = vRows.map(r => d(r, cols.indexOf(s"t_${n.id}_s"))).sum
                val lq = vRows.map(r => d(r, cols.indexOf(s"t_${n.id}_q"))).sum
                consider(Split(k, isCat = true, v, 0.0), lc, ls, lq, Map.empty)
              }
            }
          }

          best match {
            case Some((split, cost, (lc, ls, lq, lBy), (rc, rs, rq, rBy))) if cost < totCost - 1e-9 =>
              n.split = Some(split)
              val (lp, lcost) = if (classification) (lBy.maxBy(_._2)._1, giniCost(lBy))
                                else ((ls / lc).toString, varCost(lc, ls, lq))
              val (rp, rcost) = if (classification) (rBy.maxBy(_._2)._1, giniCost(rBy))
                                else ((rs / rc).toString, varCost(rc, rs, rq))
              val ln = mkNode(n.depth + 1, n.conds :+ split.leftFx, lc, lp, lcost)
              val rn = mkNode(n.depth + 1, n.conds :+ split.rightFx, rc, rp, rcost)
              n.left = Some(ln); n.right = Some(rn)
              queue.enqueue(ln); queue.enqueue(rn)
            case _ => // leaf
          }
        }
      }
      level += 1
    }
    Tree(root, classification, label)
  }

  /** Equi-width candidate thresholds over each attribute's [min, max] — the
    * paper bucketizes continuous attributes into 20 buckets (§B). Ranges come
    * from the attribute's home relation, never from the join.
    */
  def bucketThresholds(dfs: Map[String, DataFrame], tree: JoinTree,
                       attrs: Seq[String], buckets: Int = 20): Map[String, Seq[Double]] = {
    attrs.map { a =>
      val home = tree.relations.find(_.attrSet.contains(a)).get.name
      val r = dfs(home).select(min(col(a).cast("double")), max(col(a).cast("double"))).collect()(0)
      val (lo, hi) = (r.getDouble(0), r.getDouble(1))
      val ts =
        if (hi <= lo) Seq(lo)
        else (1 until buckets).map(i => lo + (hi - lo) * i / buckets).distinct
      a -> ts
    }.toMap
  }
}
