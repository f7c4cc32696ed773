package repro.recipedb

import org.apache.spark.sql.{DataFrame, Dataset, SparkSession}

/** One generated recipe: the unit of analysis throughout the paper. */
final case class Recipe(
    id: Long,
    cuisine: String,
    ingredients: Seq[String],
    processes: Seq[String],
    utensils: Seq[String],
    items: Seq[String], // ingredients ++ processes ++ utensils, deduplicated
)

/** Synthetic RecipeDB generator.
  *
  * Deterministic in (sf, seed): item inclusion is decided by hashing
  * (seed, recipeId, item), never by partition-local RNG state, so the same
  * DataFrame contents are produced regardless of partitioning, and the
  * DuckDB oracle sees identical rows.
  *
  * Per recipe:
  *  - every item of its cuisine's spec is included independently with the
  *    spec probability (this is what makes named-pattern supports exactly
  *    the product of member probabilities — see DESIGN.md §2);
  *  - `RarePerRecipe` long-tail ingredients are drawn from a per-cuisine
  *    pool whose size scales with sf, giving ~20k unique ingredients at
  *    SF=1 as in RecipeDB (20,280) without affecting any support >= 0.2.
  */
object RecipeGen {

  val RarePerRecipe = 4

  /** Rare-ingredient pool size per cuisine at a given scale factor. */
  def rarePoolSize(sf: Double): Int = math.max(50, (780 * sf).toInt)

  /** Cuisine of a global recipe id, by cumulative ranges in Table I order. */
  def cuisineRanges(sf: Double): Seq[(CuisineSpec, Long, Long)] = {
    var off = 0L
    CuisineSpecs.all.map { s =>
      val start = off
      off += s.nAt(sf)
      (s, start, off)
    }
  }

  def totalRecipes(sf: Double): Long = cuisineRanges(sf).last._3

  /** Generate one recipe (driver-side callable too; used by tests). */
  def genRecipe(spec: CuisineSpec, id: Long, seed: Long, poolSize: Int): Recipe = {
    val ing = Seq.newBuilder[String]
    val proc = Seq.newBuilder[String]
    val ut = Seq.newBuilder[String]
    // deterministic iteration order: sorted item names
    spec.probs.toSeq.sortBy(_._1).foreach { case (item, p) =>
      if (Rng.uniform(seed, id, item.hashCode.toLong) < p) {
        Items.category(item) match {
          case Items.Ingredient => ing += item
          case Items.Process    => proc += item
          case Items.Utensil    => ut += item
        }
      }
    }
    val cuisineIdx = CuisineSpecs.all.indexWhere(_.name == spec.name)
    var slot = 0
    while (slot < RarePerRecipe) {
      val k = Rng.uniformInt(seed + 7, id, slot.toLong, poolSize)
      ing += s"rare_${cuisineIdx}_$k"
      slot += 1
    }
    val ingredients = ing.result().distinct
    val processes = proc.result()
    val utensils = ut.result()
    Recipe(id, spec.name, ingredients, processes, utensils,
      (ingredients ++ processes ++ utensils).distinct)
  }

  /** The full synthetic RecipeDB at a scale factor, as a DataFrame with
    * columns (id, cuisine, ingredients, processes, utensils, items).
    */
  def recipes(spark: SparkSession, sf: Double = 0.05, seed: Long = 42): DataFrame =
    recipesDs(spark, sf, seed).toDF()

  /** Typed variant of [[recipes]]. */
  def recipesDs(spark: SparkSession, sf: Double = 0.05, seed: Long = 42): Dataset[Recipe] = {
    import spark.implicits._
    val ranges = cuisineRanges(sf)
    val pool = rarePoolSize(sf)
    val total = ranges.last._3
    // ranges is small (26 entries); ship it via closure.
    spark.range(total).as[Long].mapPartitions { ids =>
      ids.map { id =>
        val (spec, start, _) = ranges.find { case (_, s, e) => id >= s && id < e }.get
        // per-cuisine-local id keeps draws independent of other cuisines'
        // sizes only through the global id — fine either way; use global id.
        val _ = start
        genRecipe(spec, id, seed, pool)
      }
    }
  }

  /** Exploded (recipe id, cuisine, item) pairs — the shape the DuckDB
    * oracle queries run over (Oracle cannot compare array columns).
    */
  def explodedItems(recipes: DataFrame, itemsCol: String = "items"): DataFrame = {
    import org.apache.spark.sql.functions.explode
    recipes.select(recipes("id"), recipes("cuisine"),
      explode(recipes(itemsCol)).as("item"))
  }
}
