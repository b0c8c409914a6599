package repro.imagesearch

import org.scalatest.funsuite.AnyFunSuite

class BordaSpec extends AnyFunSuite {

  // descriptors 0-9 belong to image 0, 10-19 to image 1, 20-29 to image 2
  private def imageOf(d: Long): Int = (d / 10).toInt

  test("single result list scores k+1-l per position (Eq. 7)") {
    val ranked = Borda.rankImages(Seq(Seq(0L, 10L, 20L)), imageOf, k = 3)
    // image 0 at position 1 -> 3; image 1 -> 2; image 2 -> 1
    assert(ranked == Seq((0, 3L), (1, 2L), (2, 1L)))
  }

  test("scores accumulate over multiple descriptor queries") {
    val lists = Seq(Seq(0L, 10L), Seq(1L, 10L))
    val ranked = Borda.rankImages(lists, imageOf, k = 2)
    // image 0: 2 + 2 = 4; image 1: 1 + 1 = 2
    assert(ranked == Seq((0, 4L), (1, 2L)))
  }

  test("multiple descriptors of the same image in one list all count") {
    val ranked = Borda.rankImages(Seq(Seq(0L, 1L, 2L)), imageOf, k = 3)
    assert(ranked == Seq((0, 3L + 2L + 1L)))
  }

  test("ties break by image id") {
    val ranked = Borda.rankImages(Seq(Seq(20L, 0L)), imageOf, k = 2)
    // image 2 scores 2, image 0 scores 1
    assert(ranked == Seq((2, 2L), (0, 1L)))
    val tied = Borda.rankImages(Seq(Seq(20L), Seq(0L)), imageOf, k = 1)
    assert(tied == Seq((0, 1L), (2, 1L)))
  }

  test("list depth beyond k is ignored") {
    val a = Borda.rankImages(Seq(Seq(0L, 10L, 20L)), imageOf, k = 2)
    val b = Borda.rankImages(Seq(Seq(0L, 10L)), imageOf, k = 2)
    assert(a == b)
  }

  test("topImages truncates the ranking") {
    val top = Borda.topImages(Seq(Seq(0L, 10L, 20L)), imageOf, k = 3, topK = 2)
    assert(top == Seq(0, 1))
  }

  test("empty input yields empty ranking") {
    assert(Borda.rankImages(Seq.empty, imageOf, 5).isEmpty)
    assert(Borda.rankImages(Seq(Seq.empty), imageOf, 5).isEmpty)
  }
}
