package repro.exp

import org.scalatest.funsuite.AnyFunSuite
import repro.core.Metrics
import repro.data.{DatasetProfile, ERGen}

class SweepsSpec extends AnyFunSuite {

  test("compositions sum to the set size with the requested diversity") {
    Sweeps.compositions(9, 4, Sweeps.Balanced).foreach { sizes =>
      assert(sizes.sum == 9)
      assert(sizes.size == 4)
      assert(sizes.forall(_ >= 1))
    }
  }
  test("balanced compositions have variation below 0.3") {
    Sweeps.compositions(9, 3, Sweeps.Balanced)
      .foreach(s => assert(Metrics.variation(s) < 0.3))
  }
  test("unbalanced compositions have variation above 0.7") {
    Sweeps.compositions(9, 3, Sweeps.Unbalanced)
      .foreach(s => assert(Metrics.variation(s) > 0.7))
  }
  test("variation bands are disjoint") {
    val bal = Sweeps.compositions(12, 3, Sweeps.Balanced).toSet
    val rel = Sweeps.compositions(12, 3, Sweeps.RelBalanced).toSet
    val unb = Sweeps.compositions(12, 3, Sweeps.Unbalanced).toSet
    assert(bal.intersect(rel).isEmpty && rel.intersect(unb).isEmpty && bal.intersect(unb).isEmpty)
  }
  test("some diversity/size combos admit no balanced composition") {
    assert(Sweeps.compositions(9, 6, Sweeps.Balanced).isEmpty)
  }

  private val recs = ERGen.recordsLocal(DatasetProfile.mini(DatasetProfile.citeseer, 400))

  test("sampleSets yields sets with the requested size and diversity") {
    val sets = Sweeps.sampleSets(recs, 9, 3, Sweeps.Balanced, Sweeps.Sequential, 20, 1L)
    assert(sets.nonEmpty)
    sets.foreach { s =>
      assert(s.size == 9)
      assert(s.map(_.entityId).distinct.size == 3)
    }
  }
  test("sequential sampling keeps same-entity records contiguous") {
    val sets = Sweeps.sampleSets(recs, 8, 4, Sweeps.Balanced, Sweeps.Sequential, 10, 2L)
    sets.foreach { s =>
      val runs = s.map(_.entityId).foldLeft(Vector.empty[Long]) {
        case (acc, e) if acc.lastOption.contains(e) => acc
        case (acc, e)                               => acc :+ e
      }
      assert(runs.size == s.map(_.entityId).distinct.size, s"entity split across runs: $runs")
    }
  }
  test("sampleSets is deterministic in the seed") {
    val a = Sweeps.sampleSets(recs, 9, 3, Sweeps.Balanced, Sweeps.Sequential, 5, 7L)
    val b = Sweeps.sampleSets(recs, 9, 3, Sweeps.Balanced, Sweeps.Sequential, 5, 7L)
    assert(a.map(_.map(_.id)) == b.map(_.map(_.id)))
  }
  test("setQuality returns NaN when no composition exists") {
    val (fp, acc) = Sweeps.setQuality(DatasetProfile.mini(DatasetProfile.citeseer, 200),
                                      9, 6, Sweeps.Balanced, Sweeps.Sequential, n = 5)
    assert(fp.isNaN && acc.isNaN)
  }
  test("setQuality is within [0,1] when defined") {
    val (fp, acc) = Sweeps.setQuality(DatasetProfile.mini(DatasetProfile.citeseer, 300),
                                      6, 3, Sweeps.Balanced, Sweeps.Sequential, n = 15)
    assert(fp >= 0 && fp <= 1)
    assert(acc >= 0 && acc <= 1)
  }
  test("optimalFactors lands in the paper's neighbourhood on a clean mini dataset") {
    val (ss, sd) = Sweeps.optimalFactors(DatasetProfile.mini(DatasetProfile.citeseer, 400),
                                         n = 40)
    assert(ss >= 6 && ss <= 12, s"optimal Ss out of range: $ss")
    assert(sd >= 2 && sd <= 6, s"optimal Sd out of range: $sd")
  }
}
