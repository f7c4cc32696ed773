package repro.jobs

import repro.SparkSpec
import repro.core.{PatternFeatures, PatternMiner, Pipeline}
import repro.cluster.KMeans
import repro.recipedb.{CuisineSpecs, RecipeGen}

/** The jobs' pure rendering/aggregation functions, driven at small scale —
  * the same code paths `spark-submit` users hit, minus `main`'s session
  * bootstrap.
  */
class JobsSpec extends SparkSpec {

  private lazy val recipes = RecipeGen.recipes(spark, 0.01).cache()
  private lazy val mined = PatternMiner.minePerCuisine(recipes)

  test("TableIJob.rows produces one row per named pattern in Table I order") {
    val rows = TableIJob.rows(mined)
    val expected = CuisineSpecs.all.flatMap(s => s.namedPatterns.map(_ => s.name))
    assert(rows.map(_.cuisine) == expected)
    assert(rows.size == 33) // 33 named patterns across 26 cuisines
  }

  test("TableIJob.rows carries paper numbers verbatim") {
    val rows = TableIJob.rows(mined)
    val korean = rows.filter(_.cuisine == "Korean")
    assert(korean.map(_.paperSupport).sorted == Seq(0.24, 0.34))
    assert(korean.forall(_.paperPatternCount == 85))
  }

  test("TableIJob.render emits a header plus one line per row") {
    val rows = TableIJob.rows(mined)
    val out = TableIJob.render(rows)
    assert(out.linesIterator.size == rows.size + 1)
    assert(out.linesIterator.next().contains("Region"))
  }

  test("TableIJob.render marks unmined patterns as MISS, not by crashing") {
    val rows = Seq(TableIJob.Row("X", 10, "a + b", 0.5, None, 7, 3, "t"))
    assert(TableIJob.render(rows).contains("MISS"))
  }

  test("ElbowJob.render formats the sweep") {
    val features = PatternFeatures.fromPatterns(mined)
    val sweep = KMeans.elbow(features.matrix, 1 to 3)
    val out = ElbowJob.render(sweep)
    assert(out.linesIterator.size == 4)
    assert(out.contains("WCSS"))
  }

  test("ClusterJob.render includes every tree section and the similarity table") {
    val res = Pipeline.run(spark, recipes)
    val out = ClusterJob.render(res)
    Seq("patterns/euclidean", "patterns/cosine", "patterns/jaccard",
      "authenticity", "geography", "Fowlkes").foreach { section =>
      assert(out.contains(section), section)
    }
    // 5 trees, each rendered as newick (one ';') per section
    assert(out.count(_ == ';') >= 5)
  }
}
