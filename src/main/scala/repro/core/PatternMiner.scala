package repro.core

import org.apache.spark.sql.DataFrame
import repro.fpm.{FPGrowth, FreqItemset}

/** §IV–V.A of the paper: per-cuisine frequent pattern mining.
  *
  * Each recipe is the unordered set ingredients ++ processes ++ utensils
  * (the `items` column of the generator); FP-Growth runs once per cuisine
  * at the paper's support threshold of 0.2.
  */
object PatternMiner {

  val PaperMinSupport = 0.2

  final case class CuisinePatterns(
      cuisine: String,
      nRecipes: Long,
      itemsets: Seq[FreqItemset],
  ) {
    lazy val bySet: Map[Set[String], Double] =
      itemsets.map(fi => fi.items.toSet -> fi.support).toMap
    def supportOf(items: Set[String]): Option[Double] = bySet.get(items)
    def nPatterns: Int = itemsets.size
  }

  /** Mine every cuisine present in `recipes` with the distributed miner.
    *
    * @param itemsCol which item view to mine ("items" = full paper setting)
    */
  def minePerCuisine(
      recipes: DataFrame,
      minSupport: Double = PaperMinSupport,
      itemsCol: String = "items",
  ): Seq[CuisinePatterns] = {
    val spark = recipes.sparkSession
    import spark.implicits._
    val cuisines = recipes.select("cuisine").distinct().as[String].collect().sorted
    val cached = recipes.select(recipes("cuisine"), recipes(itemsCol).as("t")).cache()
    try {
      cuisines.toSeq.map { c =>
        val tx = cached.filter($"cuisine" === c).select("t").as[Seq[String]]
        val n = tx.count()
        val mined = FPGrowth.mine(tx, minSupport).collect().toSeq
        CuisinePatterns(c, n, mined)
      }
    } finally {
      cached.unpersist()
    }
  }
}
