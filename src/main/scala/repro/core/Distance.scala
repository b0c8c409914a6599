package repro.core

/** Euclidean (L2) distance kernels and small top-k helpers shared by the
  * index and every baseline.
  *
  * Vectors are `Array[Float]` throughout (half the memory of doubles at the
  * 100–1400 dimensionalities the paper evaluates); accumulation is in Double
  * so results are stable enough for the DuckDB oracle's 1e-6 canonicalizer.
  */
object Distance {

  /** Squared L2 distance. Hot path — plain while loop, no allocation. */
  def l2sq(a: Array[Float], b: Array[Float]): Double = {
    require(a.length == b.length, s"dim mismatch ${a.length} vs ${b.length}")
    var s = 0.0
    var i = 0
    while (i < a.length) {
      val d = a(i).toDouble - b(i).toDouble
      s += d * d
      i += 1
    }
    s
  }

  /** L2 distance. */
  def l2(a: Array[Float], b: Array[Float]): Double = math.sqrt(l2sq(a, b))

  /** Squared L2 on a dimension slice `[from, until)` — used by per-partition
    * Hilbert subspaces and PQ sub-quantizers.
    */
  def l2sqSlice(a: Array[Float], b: Array[Float], from: Int, until: Int): Double = {
    var s = 0.0
    var i = from
    while (i < until) {
      val d = a(i).toDouble - b(i).toDouble
      s += d * d
      i += 1
    }
    s
  }

  /** ids of the k smallest scores, ties broken by id, ascending by (score, id).
    * O(n log k) via a bounded max-heap.
    */
  def topK(scored: Iterator[(Long, Double)], k: Int): Array[(Long, Double)] = {
    // max-heap on (score, id): head is the current worst of the best-k
    val ord  = Ordering.by[(Long, Double), (Double, Long)] { case (id, s) => (s, id) }
    val heap = new scala.collection.mutable.PriorityQueue[(Long, Double)]()(ord)
    while (scored.hasNext) {
      val e = scored.next()
      if (heap.size < k) heap.enqueue(e)
      else if (ord.lt(e, heap.head)) { heap.dequeue(); heap.enqueue(e) }
    }
    heap.dequeueAll.toArray.reverse
  }

  /** Merge two already-sorted top-k lists into one sorted top-k list. */
  def mergeTopK(a: Array[(Long, Double)], b: Array[(Long, Double)], k: Int): Array[(Long, Double)] =
    (a ++ b).sortBy { case (id, s) => (s, id) }.distinct.take(k)
}
