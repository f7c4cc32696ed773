package repro.fpm

/** Association rules from frequent itemsets (Agrawal et al. [1], the
  * "association rule discovery" the paper applies): for every frequent
  * itemset S with |S| >= 2 and every single-item consequent c in S,
  * emit (S \ {c}) => c with confidence supp(S) / supp(S \ {c}).
  */
object AssociationRules {

  final case class Rule(
      antecedent: Seq[String],
      consequent: String,
      support: Double,
      confidence: Double,
  )

  def fromItemsets(itemsets: Seq[FreqItemset], minConfidence: Double = 0.0): Seq[Rule] = {
    require(minConfidence >= 0 && minConfidence <= 1,
      s"minConfidence $minConfidence outside [0,1]")
    val supp = Itemsets.toMap(itemsets)
    itemsets
      .filter(_.items.size >= 2)
      .flatMap { fi =>
        val s = fi.items.toSet
        fi.items.flatMap { c =>
          val antecedent = s - c
          supp.get(antecedent).flatMap { sa =>
            val conf = fi.support / sa
            if (conf >= minConfidence)
              Some(Rule(antecedent.toSeq.sorted, c, fi.support, conf))
            else None
          }
        }
      }
      .sortBy(r => (-r.confidence, r.antecedent.mkString(","), r.consequent))
  }
}
