package repro.cluster

import org.scalatest.funsuite.AnyFunSuite

class TreeCompareSpec extends AnyFunSuite {

  private val line = Distance.pdist(
    Seq(Array(0.0), Array(1.0), Array(10.0), Array(12.0)), Distance.euclidean)
  private val tree = Hac.cluster(line, Hac.Average)

  test("pearson of identical arrays is 1") {
    assert(math.abs(TreeCompare.pearson(Array(1.0, 2, 3), Array(1.0, 2, 3)) - 1.0) < 1e-12)
  }

  test("pearson of anti-correlated arrays is -1") {
    assert(math.abs(TreeCompare.pearson(Array(1.0, 2, 3), Array(3.0, 2, 1)) + 1.0) < 1e-12)
  }

  test("pearson is scale and shift invariant") {
    val a = Array(1.0, 5.0, 2.0, 8.0)
    val b = a.map(x => 3 * x + 7)
    assert(math.abs(TreeCompare.pearson(a, b) - 1.0) < 1e-12)
  }

  test("pearson of a constant array is defined as 0") {
    assert(TreeCompare.pearson(Array(1.0, 1.0, 1.0), Array(1.0, 2.0, 3.0)) == 0.0)
  }

  test("cophenetic correlation of a tree with itself is 1") {
    assert(math.abs(TreeCompare.copheneticCorrelation(tree, tree) - 1.0) < 1e-12)
  }

  test("cophenetic correlation with the source distances is high for clean data") {
    val c = TreeCompare.copheneticCorrelation(tree, line)
    assert(c > 0.95, c.toString)
  }

  test("fowlkes-mallows of identical labelings is 1") {
    val l = Array(0, 0, 1, 1, 2)
    assert(TreeCompare.fowlkesMallows(l, l) == 1.0)
  }

  test("fowlkes-mallows of disjoint pairings is 0") {
    // a: {0,1}{2,3}; b: {0,2}{1,3} — no co-clustered pair is shared
    val a = Array(0, 0, 1, 1)
    val b = Array(0, 1, 0, 1)
    assert(TreeCompare.fowlkesMallows(a, b) == 0.0)
  }

  test("fowlkes-mallows known value") {
    // a: {0,1,2}{3}; b: {0,1}{2,3}: Tk=1 (pair 01), Pk=3, Qk=2
    val a = Array(0, 0, 0, 1)
    val b = Array(0, 0, 1, 1)
    assert(math.abs(TreeCompare.fowlkesMallows(a, b) - 1.0 / math.sqrt(6)) < 1e-12)
  }

  test("fowlkes-mallows is symmetric") {
    val a = Array(0, 1, 1, 2, 0)
    val b = Array(1, 1, 0, 0, 2)
    assert(TreeCompare.fowlkesMallows(a, b) == TreeCompare.fowlkesMallows(b, a))
  }

  test("meanFowlkesMallows of a tree with itself is 1 across cuts") {
    assert(TreeCompare.meanFowlkesMallows(tree, tree, 2 to 3) == 1.0)
  }

  test("meanFowlkesMallows distinguishes similar from dissimilar trees") {
    // tree2 groups {0,2} vs {1,3} — structurally opposed to `tree`
    val d2 = Distance.pdist(
      Seq(Array(0.0), Array(10.0), Array(1.0), Array(12.0)), Distance.euclidean)
    val tree2 = Hac.cluster(d2, Hac.Average)
    val simSelf = TreeCompare.meanFowlkesMallows(tree, tree, 2 to 3)
    val simOther = TreeCompare.meanFowlkesMallows(tree, tree2, 2 to 3)
    assert(simSelf > simOther)
  }

  test("mismatched leaf counts are rejected") {
    val t2 = Hac.cluster(DistMatrix(2, Array(1.0)), Hac.Average)
    intercept[IllegalArgumentException](TreeCompare.copheneticCorrelation(tree, t2))
    intercept[IllegalArgumentException](TreeCompare.meanFowlkesMallows(tree, t2, 2 to 2))
    intercept[IllegalArgumentException](
      TreeCompare.fowlkesMallows(Array(0, 1), Array(0, 1, 2)))
  }
}
