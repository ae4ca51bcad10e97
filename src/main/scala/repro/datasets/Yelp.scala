package repro.datasets

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.functions._
import repro.core.{JoinTree, Relation}
import Gen._

/** Synthetic Yelp (Appendix A): star schema with many-to-many joins.
  *
  *   User — Review — Business — Category
  *                       \————— Attribute
  *
  * Each business has 2–6 categories and 3–7 attributes, so the full join
  * blows up ~20× over the Review fact — the paper's key property for Yelp
  * (8.7M input tuples vs 360M join tuples), which punishes every baseline
  * that materializes the join.
  */
object Yelp extends SchemaDataset {
  val name = "Yelp"

  val tree: JoinTree = JoinTree(
    Seq(
      Relation("Review", Seq("user_id", "business_id", "stars", "useful", "review_year")),
      Relation("User", Seq("user_id", "u_review_count", "u_avg_stars", "u_yelping_since", "u_fans")),
      Relation("Business", Seq("business_id", "b_city", "b_state", "b_stars",
        "b_review_count", "b_is_open")),
      Relation("Category", Seq("business_id", "category")),
      Relation("Attribute", Seq("business_id", "attribute", "attr_value")),
    ),
    Seq("Review" -> "User", "Review" -> "Business",
        "Business" -> "Category", "Business" -> "Attribute"),
  ).requireValid()

  val fact = "Review"
  val keys = Seq("user_id", "business_id")

  val categorical: Seq[String] = Seq("b_city", "b_state", "category", "attribute",
    "attr_value", "b_is_open")
  val continuous: Seq[String] = Seq("stars", "useful", "review_year", "u_review_count",
    "u_avg_stars", "u_yelping_since", "u_fans", "b_stars", "b_review_count")
  val label = "stars"
  val miAttrs: Seq[String] = categorical ++ Seq("stars", "b_stars", "review_year",
    "u_yelping_since", "u_fans")
  val cubeDims: Seq[String] = Seq("b_city", "category", "review_year")
  val cubeMeasures: Seq[String] = Seq("stars", "useful", "u_fans", "b_review_count",
    "u_review_count")

  private val FactBase = 1_000_000L

  def load(spark: SparkSession, sf: Double, seed: Long = 42): Map[String, DataFrame] = {
    val nUsers = scaled(40000, sf, 100).toInt
    val nBiz   = scaled(8000, sf, 50).toInt
    val s = seed

    val review = spark.range(scaled(FactBase, sf)).select(
      (hint(nUsers, s + 1, col("id")) + 1) as "user_id",
      (hint(nBiz, s + 2, col("id")) + 1) as "business_id",
      col("id"),
    ).withColumn("stars",
      // signal: business quality + user generosity + noise, clamped to 1..5
      least(lit(5), greatest(lit(1),
        hint(3, s + 20, col("business_id")) + hint(2, s + 10, col("user_id")) +
          hint(3, s + 3, col("id")) - 1)))
      .withColumn("useful", hint(12, s + 4, col("id")))
      .withColumn("review_year", hint(14, s + 5, col("id")) + 2006)
      .select("user_id", "business_id", "stars", "useful", "review_year")

    val user = spark.range(1, nUsers + 1).select(
      col("id").cast("int") as "user_id",
      hint(800, s + 9, col("id")) as "u_review_count",
      (hint(9, s + 10, col("id")) + 1) as "u_avg_stars", // 1..9 half-star grid ×2
      (hint(14, s + 11, col("id")) + 2006) as "u_yelping_since",
      hint(300, s + 12, col("id")) as "u_fans",
    )

    val business = spark.range(1, nBiz + 1).select(
      col("id").cast("int") as "business_id",
      hcat((0 until 30).map(i => s"bcity$i"), s + 19, col("id")) as "b_city",
      hcat((0 until 12).map(i => s"bstate$i"), s + 18, col("id")) as "b_state",
      // matches the review-stars signal hash (seed s+20, int-typed key)
      (hint(3, s + 20, col("id").cast("int")) + 2) as "b_stars",
      hint(2000, s + 21, col("id")) as "b_review_count",
      hcat(Seq("open", "closed"), s + 22, col("id")) as "b_is_open",
    )

    // 2–6 categories per business (many-to-many).
    val category = spark.range(nBiz.toLong * 6).select(
      (col("id") / 6 + 1).cast("int") as "business_id",
      (col("id") % 6).cast("int") as "slot",
    ).where(col("slot") < hint(5, s + 30, col("business_id")) + 2)
      .select(col("business_id"),
        hcat((0 until 24).map(i => s"cat$i"), s + 31, col("business_id"), col("slot")) as "category")

    // 3–7 attributes per business (many-to-many).
    val attribute = spark.range(nBiz.toLong * 7).select(
      (col("id") / 7 + 1).cast("int") as "business_id",
      (col("id") % 7).cast("int") as "slot",
    ).where(col("slot") < hint(5, s + 40, col("business_id")) + 3)
      .select(col("business_id"),
        hcat((0 until 18).map(i => s"attr$i"), s + 41, col("business_id"), col("slot")) as "attribute",
        hcat(Seq("true", "false", "partial"), s + 42, col("business_id"), col("slot")) as "attr_value")

    Map("Review" -> review, "User" -> user, "Business" -> business,
        "Category" -> category, "Attribute" -> attribute)
  }
}
