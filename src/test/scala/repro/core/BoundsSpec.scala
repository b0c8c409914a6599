package repro.core

import org.scalatest.funsuite.AnyFunSuite
import org.scalacheck.Gen
import repro.PropHelpers.forAllSamples

/** Lower-bound filters (Eqs. 5–6): both must never exceed the true distance,
  * and the Ptolemaic bound must dominate tightness-wise in aggregate.
  */
class BoundsSpec extends AnyFunSuite {

  private val vecGen: Gen[Array[Float]] =
    Gen.listOfN(8, Gen.choose(-50.0, 50.0)).map(_.map(_.toFloat).toArray)

  private def setup(q: Array[Float], o: Array[Float], refs: Array[Array[Float]]) = {
    val dq = refs.map(r => Distance.l2(q, r))
    val rd = refs.map(r => Distance.l2(o, r).toFloat)
    val matrix = Array.tabulate(refs.length, refs.length)((i, j) => Distance.l2(refs(i), refs(j)))
    (dq, rd, matrix)
  }

  test("triangular bound is a lower bound of the true distance") {
    val gen = Gen.zip(vecGen, vecGen, Gen.listOfN(5, vecGen))
    forAllSamples(gen, n = 300) { case (q, o, refs) =>
      val (dq, rd, _) = setup(q, o, refs.toArray)
      assert(HdQuery.triBound(dq, rd) <= Distance.l2(q, o) + 1e-6)
    }
  }

  test("ptolemaic bound is a lower bound of the true distance") {
    val gen = Gen.zip(vecGen, vecGen, Gen.listOfN(5, vecGen))
    forAllSamples(gen, n = 300) { case (q, o, refs) =>
      val (dq, rd, m) = setup(q, o, refs.toArray)
      assert(HdQuery.ptolemaicBound(dq, rd, m) <= Distance.l2(q, o) + 1e-6)
    }
  }

  test("triangular bound is exact when the object is a reference") {
    val q = Array(1f, 2f, 3f, 4f, 5f, 6f, 7f, 8f)
    val o = Array(0f, 0f, 0f, 0f, 0f, 0f, 0f, 0f)
    val (dq, rd, _) = setup(q, o, Array(o)) // o itself is the only reference
    assert(math.abs(HdQuery.triBound(dq, rd) - Distance.l2(q, o)) < 1e-6)
  }

  test("ptolemaic is tighter than triangular in aggregate (Sec. 5.2.5 rationale)") {
    val rng = new scala.util.Random(7)
    def rv() = Array.fill(16)((rng.nextDouble() * 100 - 50).toFloat)
    val refs = Array.fill(10)(rv())
    var triSum = 0.0; var ptoSum = 0.0; var trueSum = 0.0
    for (_ <- 1 to 300) {
      val q = rv(); val o = rv()
      val (dq, rd, m) = setup(q, o, refs)
      triSum  += HdQuery.triBound(dq, rd)
      ptoSum  += HdQuery.ptolemaicBound(dq, rd, m)
      trueSum += Distance.l2(q, o)
    }
    assert(ptoSum >= triSum * 0.98, "ptolemaic should not be materially looser than triangular")
    assert(ptoSum <= trueSum, "still a lower bound in aggregate")
  }

  test("bounds are zero when query equals object and references coincide appropriately") {
    val v = Array(1f, 1f)
    val refs = Array(Array(0f, 0f), Array(2f, 2f))
    val (dq, rd, m) = setup(v, v, refs)
    // refdists are stored as Float (the RDB-tree leaf layout), so the
    // bound of an identical point is zero only up to Float rounding.
    assert(HdQuery.triBound(dq, rd) < 1e-6)
    assert(HdQuery.ptolemaicBound(dq, rd, m) < 1e-6)
  }

  test("ptolemaic bound guards zero reference-pair distance") {
    val q = Array(1f, 2f); val o = Array(3f, 4f)
    val r = Array(0f, 0f)
    val (dq, rd, m) = setup(q, o, Array(r, r)) // duplicate references: d(R1,R2)=0
    assert(!HdQuery.ptolemaicBound(dq, rd, m).isNaN)
  }

  test("triangular bound with a single reference equals |d(q,r) - d(o,r)|") {
    val q = Array(0f, 0f); val o = Array(4f, 0f); val r = Array(10f, 0f)
    val (dq, rd, _) = setup(q, o, Array(r))
    assert(math.abs(HdQuery.triBound(dq, rd) - 4.0) < 1e-6)
  }
}
