package repro.cluster

/** Quantitative dendrogram comparison. The paper validates its cuisine
  * trees against the geography tree by visual inspection; we quantify the
  * same comparison with (a) cophenetic correlation and (b) Fowlkes–Mallows
  * index averaged over flat cuts.
  */
object TreeCompare {

  /** Pearson correlation between two condensed matrices (e.g. cophenetic
    * matrices of two dendrograms over the same leaves).
    */
  def pearson(a: Array[Double], b: Array[Double]): Double = {
    require(a.length == b.length && a.length >= 2, "need matching arrays of length >= 2")
    val n = a.length
    val ma = a.sum / n
    val mb = b.sum / n
    var sab = 0.0; var sa = 0.0; var sb = 0.0
    var i = 0
    while (i < n) {
      val da = a(i) - ma
      val db = b(i) - mb
      sab += da * db; sa += da * da; sb += db * db
      i += 1
    }
    if (sa == 0 || sb == 0) 0.0 else sab / math.sqrt(sa * sb)
  }

  def copheneticCorrelation(x: Dendrogram, y: Dendrogram): Double = {
    require(x.nLeaves == y.nLeaves, "dendrograms must share the leaf set")
    pearson(x.cophenetic.condensed, y.cophenetic.condensed)
  }

  /** Cophenetic correlation between a dendrogram and raw distances — the
    * classic measure of how faithfully a tree represents its input.
    */
  def copheneticCorrelation(x: Dendrogram, d: DistMatrix): Double = {
    require(x.nLeaves == d.n, "dimension mismatch")
    pearson(x.cophenetic.condensed, d.condensed)
  }

  /** Fowlkes–Mallows index B_k between two flat labelings. */
  def fowlkesMallows(a: Array[Int], b: Array[Int]): Double = {
    require(a.length == b.length, "labelings must cover the same points")
    val n = a.length
    var tk = 0.0; var pk = 0.0; var qk = 0.0
    for (i <- 0 until n; j <- i + 1 until n) {
      val sa = a(i) == a(j)
      val sb = b(i) == b(j)
      if (sa && sb) tk += 1
      if (sa) pk += 1
      if (sb) qk += 1
    }
    if (pk == 0 || qk == 0) 0.0 else tk / math.sqrt(pk * qk)
  }

  /** Mean Fowlkes–Mallows over cuts k in `ks` of both trees — a scalar
    * "how similar are these two hierarchies" score in [0, 1].
    */
  def meanFowlkesMallows(x: Dendrogram, y: Dendrogram, ks: Seq[Int]): Double = {
    require(x.nLeaves == y.nLeaves, "dendrograms must share the leaf set")
    val vals = ks.map(k => fowlkesMallows(x.cut(k), y.cut(k)))
    vals.sum / vals.size
  }
}
