package repro.jobs

import org.apache.spark.sql.SparkSession
import repro.cluster.KMeans
import repro.core.{PatternFeatures, PatternMiner}
import repro.recipedb.RecipeGen

/** Regenerates the numbers behind Figure 1 (elbow method): WCSS of k-means
  * on the label-encoded pattern feature vectors for k = 1..10.
  *
  * Usage: spark-submit ... repro.jobs.ElbowJob [sf]   (default sf = 1.0)
  */
object ElbowJob {

  def render(wcss: Seq[(Int, Double)]): String =
    ("  k    WCSS" +: wcss.map { case (k, w) => f"$k%3d  $w%10.3f" }).mkString("\n")

  def main(args: Array[String]): Unit = {
    val sf = if (args.nonEmpty) args(0).toDouble else 1.0
    val spark = SparkSession.builder
      .master(sys.env.getOrElse("SPARK_MASTER", "local[*]"))
      .appName("elbow-job").getOrCreate()
    try {
      val recipes = RecipeGen.recipes(spark, sf)
      val features = PatternFeatures.fromPatterns(PatternMiner.minePerCuisine(recipes))
      println(render(KMeans.elbow(features.matrix, 1 to 10)))
    } finally spark.stop()
  }
}
