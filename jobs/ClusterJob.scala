package repro.jobs

import org.apache.spark.sql.SparkSession
import repro.core.Pipeline

/** Regenerates the clustering figures as text: HAC dendrograms over mined
  * patterns (Euclidean / Cosine / Jaccard — Figs 2–4), authenticity (Fig 5)
  * and geography (Fig 6), plus the tree-similarity table quantifying the
  * paper's §VII validation.
  *
  * Usage: spark-submit ... repro.jobs.ClusterJob [sf]   (default sf = 1.0)
  */
object ClusterJob {

  def render(res: Pipeline.Results): String = {
    val sb = new StringBuilder
    val labels = res.cuisines
    (Pipeline.Metrics.map(m => s"patterns/$m" -> res.patternTrees(m)) ++
      Seq("authenticity" -> res.authTree, "geography" -> res.geoTree)).foreach {
      case (name, tree) =>
        sb ++= s"== HAC ($name) ==\n"
        sb ++= tree.newick(labels) + "\n"
        sb ++= tree.ascii(labels) + "\n\n"
    }
    sb ++= "== Mean Fowlkes–Mallows similarity vs geography tree (k=2..12) ==\n"
    res.geoSimilarity.toSeq.sortBy(-_._2).foreach { case (m, v) =>
      sb ++= f"  $m%-14s $v%.4f\n"
    }
    sb.result()
  }

  def main(args: Array[String]): Unit = {
    val sf = if (args.nonEmpty) args(0).toDouble else 1.0
    val spark = SparkSession.builder
      .master(sys.env.getOrElse("SPARK_MASTER", "local[*]"))
      .appName("cluster-job").getOrCreate()
    try {
      println(render(Pipeline.runAtScale(spark, sf)))
    } finally spark.stop()
  }
}
