package repro.recipedb

import org.scalatest.funsuite.AnyFunSuite

class CuisineSpecSpec extends AnyFunSuite {

  test("there are exactly 26 cuisines, matching Table I") {
    assert(CuisineSpecs.all.size == 26)
    assert(CuisineSpecs.all.map(_.name).distinct.size == 26)
  }

  test("per-region recipe counts sum to the Table I total") {
    assert(CuisineSpecs.totalRecipes == 118171L)
  }

  test("every cuisine belongs to a known filler-pool family") {
    CuisineSpecs.all.foreach { s =>
      assert(Items.fillerPools.contains(s.family), s"${s.name}: family ${s.family}")
    }
  }

  test("all probabilities are in (0, 0.8]") {
    CuisineSpecs.all.foreach { s =>
      s.probs.foreach { case (item, p) =>
        assert(p > 0 && p <= 0.8, s"${s.name}/$item: $p")
      }
    }
  }

  test("byName covers all cuisines") {
    assert(CuisineSpecs.byName.size == 26)
    assert(CuisineSpecs.byName("Korean").nRecipes == 668L)
    assert(CuisineSpecs.byName("Italian").nRecipes == 16582L)
  }

  test("nAt scales with a floor of 40") {
    val s = CuisineSpecs.byName("Central American") // 460 recipes at SF=1
    assert(s.nAt(1.0) == 460L)
    assert(s.nAt(0.5) == 230L)
    assert(s.nAt(0.0001) == 40L)
  }

  test("expectedFrequentItemsets matches exhaustive enumeration on small inputs") {
    def exhaustive(ps: Seq[Double], minSup: Double): Long =
      // enumerate subsets by index so duplicate probability values count
      // as the distinct items they represent
      (1 until (1 << ps.size)).count { mask =>
        ps.indices.filter(i => (mask & (1 << i)) != 0).map(ps).product >= minSup
      }.toLong
    val cases = Seq(
      Seq(0.5, 0.4, 0.3),
      Seq(0.9, 0.8, 0.7, 0.6),
      Seq(0.2, 0.2, 0.19),
      Seq(0.45, 0.45, 0.45, 0.21, 0.21),
      Seq.empty[Double],
      Seq(0.1, 0.05),
    )
    cases.foreach { ps =>
      assert(CuisineSpecs.expectedFrequentItemsets(ps, 0.2) == exhaustive(ps, 0.2),
        s"probs $ps")
    }
  }

  test("expectedFrequentItemsets: single frequent item counts once") {
    assert(CuisineSpecs.expectedFrequentItemsets(Seq(0.25), 0.2) == 1L)
    assert(CuisineSpecs.expectedFrequentItemsets(Seq(0.19), 0.2) == 0L)
  }

  // Per-cuisine calibration invariants, one test each so failures localize.
  CuisineSpecs.all.foreach { s =>
    test(s"${s.name}: named patterns have expected support >= 0.2 (threshold + margin)") {
      s.namedPatterns.foreach { np =>
        val exp = s.expectedSupport(np.items)
        assert(exp >= 0.2, s"${np.label}: $exp")
        // and calibrated close to the paper's reported support
        assert(math.abs(exp - np.paperSupport) <= 0.035,
          s"${np.label}: expected $exp vs paper ${np.paperSupport}")
      }
    }

    test(s"${s.name}: expected frequent-itemset count is near the paper's pattern count") {
      val expected = CuisineSpecs.expectedFrequentItemsets(s.probs.values, 0.2)
      // calibration adds fillers up to the target but never overshoots it by
      // construction, except where the named-pattern structure alone already
      // exceeds the target (documented in EXPERIMENTS.md)
      val overshooters = Set("US")
      if (!overshooters.contains(s.name)) {
        assert(expected <= s.paperPatternCount,
          s"calibrated count $expected overshoots paper ${s.paperPatternCount}")
      }
      assert(expected >= math.min(s.paperPatternCount, 21).toLong,
        s"calibrated count $expected far below paper ${s.paperPatternCount}")
    }

    test(s"${s.name}: named pattern items are all modeled items") {
      s.namedPatterns.foreach { np =>
        np.items.foreach(i => assert(s.probs.contains(i), s"missing $i"))
      }
    }
  }

  test("calibration converges exactly for cuisines without heavy raised items") {
    // Fillers at 0.24 contribute exactly one itemset each when no other item
    // exceeds 0.8, so cuisines that need fillers should land exactly on the
    // paper count unless the pool ran dry or base already overshot.
    val s = CuisineSpecs.byName("Australian")
    assert(CuisineSpecs.expectedFrequentItemsets(s.probs.values, 0.2) == s.paperPatternCount.toLong)
  }

  test("family profiles correlate: Canadian's expected pattern set is euclidean-closer to French than to US") {
    // Mirrors the pipeline's feature space analytically: binary indicator
    // vectors over expected frequent itemsets, euclidean distance =
    // sqrt(symmetric difference).
    def patterns(name: String): Set[Set[String]] =
      CuisineSpecs.expectedFrequentItemsetSets(CuisineSpecs.byName(name).probs, 0.2)
    val can = patterns("Canadian")
    val fr = patterns("French")
    val us = patterns("US")
    def dist(a: Set[Set[String]], b: Set[Set[String]]) =
      math.sqrt((a.diff(b).size + b.diff(a).size).toDouble)
    assert(dist(can, fr) < dist(can, us),
      s"canadian-french ${dist(can, fr)} vs canadian-us ${dist(can, us)}")
  }

  test("expectedFrequentItemsetSets size agrees with expectedFrequentItemsets") {
    CuisineSpecs.all.foreach { s =>
      assert(
        CuisineSpecs.expectedFrequentItemsetSets(s.probs, 0.2).size.toLong ==
          CuisineSpecs.expectedFrequentItemsets(s.probs.values, 0.2),
        s.name)
    }
  }

  test("spice-belt cuisines share cumin-family items (Indian ~ Northern Africa)") {
    val ind = CuisineSpecs.byName("Indian Subcontinent").probs
    val na = CuisineSpecs.byName("Northern Africa").probs
    Seq("cumin", "coriander", "ginger", "turmeric").foreach { spice =>
      assert(ind.contains(spice) && na.contains(spice), spice)
    }
  }
}
