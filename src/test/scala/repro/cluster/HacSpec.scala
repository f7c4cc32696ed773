package repro.cluster

import org.scalatest.funsuite.AnyFunSuite

class HacSpec extends AnyFunSuite {

  // Four points on a line: 0, 1, 10, 12 — distances are unambiguous.
  private val line = Distance.pdist(
    Seq(Array(0.0), Array(1.0), Array(10.0), Array(12.0)), Distance.euclidean)

  test("single linkage on the line example") {
    val d = Hac.cluster(line, Hac.Single)
    // merges: {0,1}@1, {2,3}@2, then single-link distance 12-1=9... min(10-1, 12-1)=9
    assert(d.merges(0) == Merge(0, 1, 1.0, 2))
    assert(d.merges(1) == Merge(2, 3, 2.0, 2))
    assert(d.merges(2).height == 9.0)
    assert(d.merges(2).size == 4)
  }

  test("complete linkage on the line example") {
    val d = Hac.cluster(line, Hac.Complete)
    assert(d.merges(0) == Merge(0, 1, 1.0, 2))
    assert(d.merges(1) == Merge(2, 3, 2.0, 2))
    assert(d.merges(2).height == 12.0) // max(10, 11, 12) = 12
  }

  test("average linkage on the line example") {
    val d = Hac.cluster(line, Hac.Average)
    assert(d.merges(0) == Merge(0, 1, 1.0, 2))
    assert(d.merges(1) == Merge(2, 3, 2.0, 2))
    // pairs across: (0,2)=10 (0,3)=12 (1,2)=9 (1,3)=11 -> mean 10.5
    assert(math.abs(d.merges(2).height - 10.5) < 1e-9)
  }

  test("average linkage via Lance–Williams equals the true mean of cross distances") {
    // 5 random points; after each merge the inter-cluster distance must be
    // the arithmetic mean of all leaf-pair distances across the clusters.
    val rnd = new scala.util.Random(3)
    val pts = Seq.fill(6)(Array.fill(3)(rnd.nextDouble() * 10))
    val d = Distance.pdist(pts, Distance.euclidean)
    val dend = Hac.cluster(d, Hac.Average)
    // check the final merge height explicitly
    val last = dend.merges.last
    val left = dend.members(last.a)
    val right = dend.members(last.b)
    val cross = for (i <- left.toSeq; j <- right.toSeq) yield d(i, j)
    assert(math.abs(last.height - cross.sum / cross.size) < 1e-9)
  }

  test("ward linkage matches scipy on a known example") {
    // Points: (0,0), (0,1), (4,0), (4,1): ward merges the two vertical
    // pairs at height 1, then joins them at sqrt(2 * n1 n2 / (n1+n2)) *
    // ||centroid difference|| = 4 * sqrt(2) ≈ 5.6569 (scipy agrees).
    val pts = Seq(Array(0.0, 0.0), Array(0.0, 1.0), Array(4.0, 0.0), Array(4.0, 1.0))
    val dend = Hac.cluster(Distance.pdist(pts, Distance.euclidean), Hac.Ward)
    assert(math.abs(dend.merges(0).height - 1.0) < 1e-9)
    assert(math.abs(dend.merges(1).height - 1.0) < 1e-9)
    // centroids (0,0.5) and (4,0.5), 2 points each: ward distance =
    // sqrt(2*2/(2+2)) * ||c1-c2|| * sqrt(2)?? — verify against the direct
    // ESS formula: sqrt(2 * n1*n2/(n1+n2)) * ||c1 - c2||
    val expected = math.sqrt(2.0 * (2.0 * 2.0 / 4.0)) * 4.0
    assert(math.abs(dend.merges(2).height - expected) < 1e-9)
  }

  test("heights are monotonically non-decreasing for all linkages") {
    val rnd = new scala.util.Random(11)
    val pts = Seq.fill(10)(Array.fill(4)(rnd.nextDouble()))
    val d = Distance.pdist(pts, Distance.euclidean)
    Seq(Hac.Single, Hac.Complete, Hac.Average, Hac.Ward).foreach { l =>
      val dend = Hac.cluster(d, l)
      val hs = dend.merges.map(_.height)
      assert(hs.zip(hs.tail).forall { case (a, b) => b >= a - 1e-9 }, l.name)
    }
  }

  test("single observation yields an empty dendrogram") {
    val dend = Hac.cluster(DistMatrix(1, Array.empty), Hac.Average)
    assert(dend.nLeaves == 1 && dend.merges.isEmpty)
  }

  test("two observations merge at their distance") {
    val dend = Hac.cluster(DistMatrix(2, Array(3.5)), Hac.Average)
    assert(dend.merges == Vector(Merge(0, 1, 3.5, 2)))
  }

  test("cut produces the expected flat clusters") {
    val dend = Hac.cluster(line, Hac.Average)
    assert(dend.cut(1).distinct.length == 1)
    assert(dend.cut(2).toSeq == Seq(0, 0, 1, 1))
    assert(dend.cut(4).toSeq == Seq(0, 1, 2, 3))
  }

  test("cut validates k") {
    val dend = Hac.cluster(line, Hac.Average)
    intercept[IllegalArgumentException](dend.cut(0))
    intercept[IllegalArgumentException](dend.cut(5))
  }

  test("cophenetic distances reflect merge heights") {
    val dend = Hac.cluster(line, Hac.Average)
    assert(dend.copheneticOf(0, 1) == 1.0)
    assert(dend.copheneticOf(2, 3) == 2.0)
    assert(math.abs(dend.copheneticOf(0, 3) - 10.5) < 1e-9)
    assert(dend.copheneticOf(1, 0) == dend.copheneticOf(0, 1))
  }

  test("members tracks leaves through merges") {
    val dend = Hac.cluster(line, Hac.Average)
    assert(dend.members(4) == Set(0, 1))
    assert(dend.members(5) == Set(2, 3))
    assert(dend.members(6) == Set(0, 1, 2, 3))
  }

  test("newick renders all leaves exactly once") {
    val dend = Hac.cluster(line, Hac.Average)
    val nw = dend.newick(IndexedSeq("w", "x", "y", "z"))
    assert(nw.endsWith(";"))
    Seq("w", "x", "y", "z").foreach(l => assert(nw.contains(l)))
    assert(nw.count(_ == '(') == 3)
  }

  test("ascii rendering mentions every cuisine merge") {
    val dend = Hac.cluster(line, Hac.Average)
    val a = dend.ascii(IndexedSeq("w", "x", "y", "z"))
    assert(a.linesIterator.size == 3)
  }

  test("deterministic under permutation-stable input (exact ties)") {
    // four equidistant points: heights all equal, but result is stable
    val d = DistMatrix(4, Array.fill(6)(1.0))
    val a = Hac.cluster(d, Hac.Average).merges
    val b = Hac.cluster(d, Hac.Average).merges
    assert(a == b)
    assert(a.head == Merge(0, 1, 1.0, 2), "first-index tie break")
  }

  test("linkageByName resolves names") {
    assert(Hac.linkageByName("ward") == Hac.Ward)
    assert(Hac.linkageByName("Average") == Hac.Average)
    intercept[IllegalArgumentException](Hac.linkageByName("centroid"))
  }
}
