package repro.imagesearch

/** Borda-count aggregation for descriptor-level kANN results
  * (Sec. 5.5 / Appendix C, Eq. 7).
  *
  * A query image has N descriptors; each is searched for its kANN list of
  * database *descriptors*. A database image accumulates score k + 1 − l for
  * every one of its descriptors found at position l of any result list; the
  * images with the highest totals are the image-level kNN.
  */
object Borda {

  /** @param resultLists  per query-descriptor: ranked database-descriptor ids
    * @param imageOf      database-descriptor id -> owning image id
    * @param k            list depth (scores are k+1-l for l = 1..k)
    * @return image ids ranked by descending Borda count (ties by image id)
    */
  def rankImages(resultLists: Seq[Seq[Long]], imageOf: Long => Int, k: Int): Seq[(Int, Long)] = {
    val score = scala.collection.mutable.Map.empty[Int, Long]
    for (list <- resultLists; (descId, idx) <- list.take(k).zipWithIndex) {
      val img = imageOf(descId)
      score(img) = score.getOrElse(img, 0L) + (k - idx) // l = idx + 1 => k + 1 - l
    }
    score.toSeq.sortBy { case (img, s) => (-s, img) }
  }

  /** Top-k images by Borda count. */
  def topImages(resultLists: Seq[Seq[Long]], imageOf: Long => Int, k: Int, topK: Int): Seq[Int] =
    rankImages(resultLists, imageOf, k).take(topK).map(_._1)
}
