package repro.core

import org.scalatest.funsuite.AnyFunSuite
import org.scalacheck.Gen
import repro.PropHelpers.forAllSamples

class MetricsSpec extends AnyFunSuite {

  // --- Example 1 from the paper, verbatim --------------------------------

  test("Example 1: AP of {o4,o3,o2} against truth {o1,o2,o3} is 0.39") {
    val ap = Metrics.apAtK(Seq(1L, 2L, 3L), Seq(4L, 3L, 2L), 3)
    assert(math.abs(ap - (0.0 + 0.5 + 2.0 / 3) / 3) < 1e-12)
    assert(math.abs(ap - 0.3888888) < 1e-5)
  }

  test("Example 1: AP of {o3,o2,o4} is 0.67") {
    val ap = Metrics.apAtK(Seq(1L, 2L, 3L), Seq(3L, 2L, 4L), 3)
    assert(math.abs(ap - (1.0 + 1.0 + 0.0) / 3) < 1e-12)
  }

  test("Example 1: MAP of the two rankings is 0.53") {
    val map = Metrics.mapAtK(Seq(
      (Seq(1L, 2L, 3L), Seq(4L, 3L, 2L)),
      (Seq(1L, 2L, 3L), Seq(3L, 2L, 4L))), 3)
    assert(math.abs(map - ((0.0 + 0.5 + 2.0 / 3) / 3 + 2.0 / 3) / 2) < 1e-12)
    assert(math.abs(map - 0.527) < 1e-2)
  }

  // --- AP properties ------------------------------------------------------

  test("perfect ranking has AP 1") {
    assert(Metrics.apAtK(Seq(1L, 2L, 3L, 4L), Seq(1L, 2L, 3L, 4L), 4) == 1.0)
  }

  test("completely wrong ranking has AP 0") {
    assert(Metrics.apAtK(Seq(1L, 2L), Seq(8L, 9L), 2) == 0.0)
  }

  test("AP ignores ranks beyond k") {
    val a = Metrics.apAtK(Seq(1L, 2L), Seq(1L, 2L, 99L), 2)
    val b = Metrics.apAtK(Seq(1L, 2L), Seq(1L, 2L), 2)
    assert(a == b)
  }

  test("same set in reversed order scores lower when partially wrong") {
    // relevant early beats relevant late
    val early = Metrics.apAtK(Seq(1L, 2L, 3L), Seq(1L, 8L, 9L), 3)
    val late  = Metrics.apAtK(Seq(1L, 2L, 3L), Seq(8L, 9L, 1L), 3)
    assert(early > late)
  }

  test("AP of answer shorter than k treats missing tail as misses") {
    val a = Metrics.apAtK(Seq(1L, 2L, 3L), Seq(1L), 3)
    assert(math.abs(a - 1.0 / 3) < 1e-12)
  }

  test("property: AP is always within [0, 1]") {
    val gen = for {
      k     <- Gen.choose(1, 10)
      truth <- Gen.listOfN(k, Gen.choose(0L, 20L))
      ans   <- Gen.listOfN(k, Gen.choose(0L, 20L))
    } yield (truth.distinct, ans.distinct, k)
    forAllSamples(gen, n = 200) { case (truth, ans, k) =>
      if (truth.nonEmpty) {
        val ap = Metrics.apAtK(truth, ans, k)
        assert(ap >= 0.0 && ap <= 1.0)
      }
    }
  }

  test("property: AP of the exact truth prefix is maximal among permutations") {
    val truth = Seq(1L, 2L, 3L, 4L, 5L)
    val perfect = Metrics.apAtK(truth, truth, 5)
    truth.permutations.take(50).foreach { p =>
      assert(Metrics.apAtK(truth, p, 5) <= perfect + 1e-12)
    }
  }

  // --- MAP ---------------------------------------------------------------

  test("MAP is the mean of per-query APs") {
    val qs = Seq(
      (Seq(1L, 2L), Seq(1L, 2L)),   // AP 1
      (Seq(1L, 2L), Seq(9L, 8L)))   // AP 0
    assert(Metrics.mapAtK(qs, 2) == 0.5)
  }

  test("MAP on empty query set is rejected") {
    assertThrows[IllegalArgumentException](Metrics.mapAtK(Seq.empty, 5))
  }

  // --- approximation ratio ------------------------------------------------

  test("ratio of identical answers is 1") {
    assert(Metrics.approximationRatio(Seq(1.0, 2.0, 3.0), Seq(1.0, 2.0, 3.0)) == 1.0)
  }

  test("ratio averages per-rank distance ratios (Def. 1)") {
    val c = Metrics.approximationRatio(Seq(2.0, 4.0), Seq(1.0, 2.0))
    assert(c == 2.0)
  }

  test("ratio handles zero true distance (query is a DB point)") {
    assert(Metrics.approximationRatio(Seq(0.0, 2.0), Seq(0.0, 2.0)) == 1.0)
    // zero true distance with nonzero answer distance: that rank is skipped
    assert(Metrics.approximationRatio(Seq(5.0, 2.0), Seq(0.0, 2.0)) == 1.0)
  }

  test("property: ratio >= 1 when answers are no closer than truth") {
    val gen = for {
      k  <- Gen.choose(1, 8)
      td <- Gen.listOfN(k, Gen.choose(0.1, 100.0))
      extra <- Gen.listOfN(k, Gen.choose(0.0, 50.0))
    } yield (td.sorted, td.sorted.zip(extra).map { case (a, b) => a + b })
    forAllSamples(gen, n = 200) { case (truthD, ansD) =>
      assert(Metrics.approximationRatio(ansD, truthD) >= 1.0 - 1e-12)
    }
  }

  test("recall@k counts set overlap") {
    assert(Metrics.recallAtK(Seq(1L, 2L, 3L, 4L), Seq(4L, 3L, 9L, 8L), 4) == 0.5)
  }
}
