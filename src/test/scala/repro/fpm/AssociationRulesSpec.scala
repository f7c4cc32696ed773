package repro.fpm

import org.scalatest.funsuite.AnyFunSuite

class AssociationRulesSpec extends AnyFunSuite {

  private val itemsets = Seq(
    FreqItemset(Seq("a"), 8, 0.8),
    FreqItemset(Seq("b"), 5, 0.5),
    FreqItemset(Seq("a", "b"), 4, 0.4),
  )

  test("rules carry confidence = supp(S) / supp(antecedent)") {
    val rules = AssociationRules.fromItemsets(itemsets)
    val aToB = rules.find(r => r.antecedent == Seq("a") && r.consequent == "b").get
    assert(math.abs(aToB.confidence - 0.5) < 1e-12)
    val bToA = rules.find(r => r.antecedent == Seq("b") && r.consequent == "a").get
    assert(math.abs(bToA.confidence - 0.8) < 1e-12)
  }

  test("minConfidence filters rules") {
    val rules = AssociationRules.fromItemsets(itemsets, minConfidence = 0.6)
    assert(rules.map(r => (r.antecedent, r.consequent)) == Seq((Seq("b"), "a")))
  }

  test("singletons yield no rules") {
    assert(AssociationRules.fromItemsets(Seq(FreqItemset(Seq("a"), 3, 0.3))).isEmpty)
  }

  test("three-item sets yield one rule per consequent") {
    val its = Seq(
      FreqItemset(Seq("a"), 10, 1.0),
      FreqItemset(Seq("b"), 8, 0.8),
      FreqItemset(Seq("c"), 6, 0.6),
      FreqItemset(Seq("a", "b"), 8, 0.8),
      FreqItemset(Seq("a", "c"), 6, 0.6),
      FreqItemset(Seq("b", "c"), 5, 0.5),
      FreqItemset(Seq("a", "b", "c"), 5, 0.5),
    )
    val rules = AssociationRules.fromItemsets(its).filter(_.antecedent.size == 2)
    assert(rules.size == 3)
    val abToC = rules.find(r => r.antecedent == Seq("a", "b")).get
    assert(math.abs(abToC.confidence - 5.0 / 8.0) < 1e-12)
  }

  test("confidence is bounded: support <= confidence <= 1") {
    val rules = AssociationRules.fromItemsets(itemsets)
    rules.foreach { r =>
      assert(r.confidence >= r.support - 1e-12)
      assert(r.confidence <= 1.0 + 1e-12)
    }
  }

  test("rules sort by confidence descending") {
    val rules = AssociationRules.fromItemsets(itemsets)
    assert(rules == rules.sortBy(-_.confidence))
  }

  test("invalid minConfidence is rejected") {
    intercept[IllegalArgumentException](AssociationRules.fromItemsets(itemsets, -0.1))
    intercept[IllegalArgumentException](AssociationRules.fromItemsets(itemsets, 1.1))
  }
}
