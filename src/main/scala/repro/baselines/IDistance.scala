package repro.baselines

import org.apache.spark.sql.{Dataset, SparkSession}
import repro.{VecRow, VectorData}
import repro.core.Distance

/** iDistance [74] — the *exact* kNN comparator in the paper's evaluation.
  *
  * Points are clustered; each object is keyed by
  * `pivotId · C + d(o, pivot)` and the one-dimensional keys are indexed in a
  * B+-tree (here: one sorted array per pivot, which is what the B+-tree
  * degenerates to for range scans). A query searches an expanding radius
  * r, r + Δr, …: for every pivot whose annulus
  * [d(q,p) − r, d(q,p) + r] intersects the pivot's key range, the key range
  * is scanned and exact distances computed; the search stops when the k-th
  * best distance ≤ r, which guarantees the exact answer.
  */
object IDistance extends AnnMethod {
  override def name = "idistance"

  final class Index(
      data: Array[Array[Float]],
      pivots: Array[Array[Float]],
      // per pivot: ids sorted by distance-to-pivot, plus the parallel dists
      byPivot: Array[(Array[Long], Array[Double])],
      r0: Double, dr: Double,
      val buildMillis: Long) extends AnnIndex {

    override def name = "idistance"

    override def search(q: Array[Float], k: Int): Array[(Long, Double)] = {
      val dq = pivots.map(p => Distance.l2(q, p))
      // per pivot scan state: expanding [lo, hi) window over the sorted dists
      val lo = new Array[Int](pivots.length)
      val hi = new Array[Int](pivots.length)
      var p = 0
      while (p < pivots.length) {
        val dists = byPivot(p)._2
        // start both cursors at the position of d(q, pivot)
        var l = java.util.Arrays.binarySearch(dists, dq(p))
        if (l < 0) l = -l - 1
        lo(p) = l; hi(p) = l
        p += 1
      }
      val best = scala.collection.mutable.PriorityQueue.empty[(Double, Long)] // max-heap
      def kth: Double = if (best.size < k) Double.MaxValue else best.head._1
      def offer(id: Long, d: Double): Unit = {
        if (best.size < k) best.enqueue((d, id))
        else if (d < best.head._1) { best.dequeue(); best.enqueue((d, id)) }
      }
      var r = r0
      var done = false
      while (!done) {
        var progressed = false
        p = 0
        while (p < pivots.length) {
          val (ids, dists) = byPivot(p)
          val lb = dq(p) - r
          val ub = dq(p) + r
          while (lo(p) > 0 && dists(lo(p) - 1) >= lb) {
            lo(p) -= 1
            val id = ids(lo(p)); offer(id, Distance.l2(data(id.toInt), q)); progressed = true
          }
          while (hi(p) < dists.length && dists(hi(p)) <= ub) {
            val id = ids(hi(p)); offer(id, Distance.l2(data(id.toInt), q)); hi(p) += 1; progressed = true
          }
          p += 1
        }
        val exhausted = (0 until pivots.length).forall(i => lo(i) == 0 && hi(i) == byPivot(i)._2.length)
        if ((best.size >= k && kth <= r) || exhausted) done = true
        else { r += dr; if (!progressed && r > 1e18) done = true }
      }
      best.dequeueAll.toArray.map { case (d, id) => (id, d) }.reverse
        .sortBy { case (id, d) => (d, id) }
    }

    override def indexBytes: Long =
      // key (8B) + pointer (8B) per object, plus pivot vectors
      data.length.toLong * 16 + pivots.length.toLong * pivots.headOption.map(_.length * 4L).getOrElse(0L)
  }

  def buildIndex(spark: SparkSession, data: Dataset[VecRow], localData: Array[Array[Float]],
                 nPivots: Int = 16, r0: Double = 0.01, dr: Double = 0.01,
                 seed: Long = 7): Index = {
    val t0 = System.nanoTime()
    val sample = {
      val rng = new scala.util.Random(seed)
      Array.fill(math.min(2000, localData.length))(localData(rng.nextInt(localData.length)))
    }
    val pivots = Common.kmeans(sample, nPivots, iters = 8, seed = seed)
    val bPivots = spark.sparkContext.broadcast(pivots)

    // Distributed key computation: nearest pivot + distance per object.
    val keyed: Array[(Int, Long, Double)] = data.rdd.map { r =>
      val ps = bPivots.value
      val c  = Common.nearestCentroid(r.vec, ps)
      (c, r.id, Distance.l2(r.vec, ps(c)))
    }.collect()

    val byPivot = Array.tabulate(pivots.length) { p =>
      val es = keyed.filter(_._1 == p).sortBy(e => (e._3, e._2))
      (es.map(_._2), es.map(_._3))
    }
    // Δr in absolute units: the published r0/Δr=0.01 are relative to the
    // data scale; scale by the mean pivot distance so expansion terminates
    // in a comparable number of rounds on any value domain.
    val scale = math.max(1e-9, keyed.iterator.map(_._3).sum / math.max(1, keyed.length))
    new Index(localData, pivots, byPivot, r0 * scale, dr * scale,
              (System.nanoTime() - t0) / 1000000L)
  }

  override def build(spark: SparkSession, spec: VectorData.Spec, data: Dataset[VecRow],
                     localData: Array[Array[Float]]): AnnIndex =
    buildIndex(spark, data, localData)
}
