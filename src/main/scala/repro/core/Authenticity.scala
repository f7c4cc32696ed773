package repro.core

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.functions._

/** §V.B of the paper: authenticity-based cuisine fingerprints, after Ahn et
  * al.'s flavor-network metric.
  *
  *   prevalence          P_i^c = n_i^c / N_c
  *   relative prevalence p_i^c = P_i^c − ⟨P_i^k⟩_{k≠c}
  *
  * where n_i^c counts the recipes of cuisine c containing item i and N_c is
  * the number of recipes of cuisine c (Ahn et al.'s definition; the paper's
  * prose ambiguously says "total number of recipes in the dataset" — see
  * DESIGN.md errata). The mean over k ≠ c includes cuisines where the item
  * never occurs (P = 0), so the computation densifies over the full
  * cuisine × item grid.
  *
  * All aggregation runs through Spark SQL and is oracle-checked against
  * DuckDB in the test suite.
  */
object Authenticity {

  /** (cuisine, item, prevalence) over the full cross product of observed
    * cuisines and items appearing in `itemsCol`.
    */
  def prevalence(recipes: DataFrame, itemsCol: String = "ingredients"): DataFrame = {
    val perCuisine = recipes.groupBy("cuisine").agg(count(lit(1)).as("n_recipes"))
    val pairs = recipes
      .select(col("id"), col("cuisine"), explode(col(itemsCol)).as("item"))
      .distinct() // recipe-level presence, robust to duplicate items
      .groupBy("cuisine", "item")
      .agg(count(lit(1)).as("n_with_item"))
    val grid = perCuisine.select("cuisine").crossJoin(pairs.select("item").distinct())
    grid
      .join(pairs, Seq("cuisine", "item"), "left")
      .na.fill(0L, Seq("n_with_item"))
      .join(perCuisine, Seq("cuisine"))
      .select(
        col("cuisine"), col("item"),
        (col("n_with_item").cast("double") / col("n_recipes")).as("prevalence"),
      )
  }

  /** Adds `rel_prevalence` = P_i^c − (Σ_k P_i^k − P_i^c) / (K − 1). */
  def relativePrevalence(prev: DataFrame): DataFrame = {
    val spark = prev.sparkSession
    val k = prev.select("cuisine").distinct().count()
    require(k >= 2, "relative prevalence needs at least two cuisines")
    val sums = prev.groupBy("item").agg(sum("prevalence").as("sum_prev"))
    prev
      .join(sums, Seq("item"))
      .select(
        col("cuisine"), col("item"), col("prevalence"),
        (col("prevalence") - (col("sum_prev") - col("prevalence")) / lit((k - 1).toDouble))
          .as("rel_prevalence"),
      )
  }

  final case class Fingerprints(
      cuisines: IndexedSeq[String],
      items: IndexedSeq[String],
      matrix: Array[Array[Double]], // rel_prevalence, rows = cuisines
  )

  /** Dense relative-prevalence fingerprint matrix, rows sorted by cuisine
    * and columns by item so the result is deterministic.
    */
  def fingerprints(spark: SparkSession, recipes: DataFrame,
                   itemsCol: String = "ingredients"): Fingerprints = {
    import spark.implicits._
    val rel = relativePrevalence(prevalence(recipes, itemsCol))
    val rows = rel.select($"cuisine", $"item", $"rel_prevalence")
      .as[(String, String, Double)].collect()
    val cuisines = rows.map(_._1).distinct.sorted.toIndexedSeq
    val items = rows.map(_._2).distinct.sorted.toIndexedSeq
    val ci = cuisines.zipWithIndex.toMap
    val ii = items.zipWithIndex.toMap
    val m = Array.fill(cuisines.size)(new Array[Double](items.size))
    rows.foreach { case (c, i, v) => m(ci(c))(ii(i)) = v }
    Fingerprints(cuisines, items, m)
  }
}
