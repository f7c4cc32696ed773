package repro.fpm

import scala.collection.mutable

/** Exhaustive frequent-itemset enumeration for small inputs — the test
  * oracle both [[FPGrowth]] and [[Apriori]] must agree with exactly.
  *
  * For every transaction, enumerates all non-empty subsets of its frequent
  * items (restricting to frequent items first is safe by anti-monotonicity)
  * and counts them in a hash map. Guards against transactions that would
  * blow up the 2^n enumeration.
  */
object BruteForce {

  val MaxFrequentItemsPerTransaction = 22

  def mine(transactions: Seq[Seq[String]], minSupport: Double): Seq[FreqItemset] = {
    require(minSupport > 0 && minSupport <= 1, s"minSupport $minSupport outside (0,1]")
    val total = transactions.size.toLong
    require(total > 0, "cannot mine an empty transaction set")
    val minCount = FPGrowth.minCountFor(minSupport, total)

    val itemCounts = mutable.Map.empty[String, Long].withDefaultValue(0L)
    transactions.foreach(_.distinct.foreach(i => itemCounts(i) += 1))
    val frequent = itemCounts.filter(_._2 >= minCount).keySet.toSet

    val counts = mutable.Map.empty[List[String], Long].withDefaultValue(0L)
    transactions.foreach { t =>
      val items = t.distinct.filter(frequent).sorted.toArray
      require(items.length <= MaxFrequentItemsPerTransaction,
        s"transaction with ${items.length} frequent items — too large for brute force")
      val n = items.length
      var mask = 1
      val limit = 1 << n
      while (mask < limit) {
        var subset = List.empty[String]
        var b = n - 1
        while (b >= 0) {
          if ((mask & (1 << b)) != 0) subset = items(b) :: subset
          b -= 1
        }
        counts(subset) += 1
        mask += 1
      }
    }
    counts.iterator
      .filter(_._2 >= minCount)
      .map { case (is, c) => FreqItemset(is, c, c.toDouble / total) }
      .toSeq
  }
}
