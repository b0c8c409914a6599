package repro.baselines

import org.apache.spark.sql.{Dataset, SparkSession}
import repro.{VecRow, VectorData}
import repro.core.Distance

/** SRS (Sun et al. [65]) — the tiny-index LSH-family method.
  *
  * Every object is projected onto m = 6 Gaussian (2-stable) dimensions;
  * only the m-dim projections are indexed (hence the ~3× smaller index the
  * paper reports). A query examines points in order of *projected* distance
  * (the incremental kNN the paper runs over an R-tree), computing exact
  * distances, and stops after max(2k, t·n) points or when the early-
  * termination test succeeds: P[χ²_m < m·(τ'·d_proj/best)²] is confident —
  * here in the same simplified multiplicative form used by SRS-12's
  * threshold τ' on (projected distance / current best exact distance).
  */
object Srs extends AnnMethod {
  override def name = "srs"

  final class Index(
      data: Array[Array[Float]],
      projections: Array[Array[Float]],
      projected: Array[Array[Float]], // n × m
      t: Double, earlyTau: Double,
      val buildMillis: Long) extends AnnIndex {

    override def name = "srs"
    private val m = projections.length

    override def search(q: Array[Float], k: Int): Array[(Long, Double)] = {
      val qp = projections.map(p => Common.dot(q, p).toFloat)
      // incremental NN in projected space == scan in ascending projected distance
      val order = projected.indices.sortBy { i =>
        var s = 0.0
        var j = 0
        while (j < m) { val d = projected(i)(j) - qp(j); s += d * d; j += 1 }
        s
      }
      val maxExamine = math.max(2 * k, math.ceil(t * data.length).toInt)
      val best = scala.collection.mutable.PriorityQueue.empty[(Double, Long)]
      var examined = 0
      val it = order.iterator
      var stop = false
      while (it.hasNext && !stop) {
        val i = it.next()
        val d = Distance.l2(data(i), q)
        if (best.size < k) best.enqueue((d, i.toLong))
        else if (d < best.head._1) { best.dequeue(); best.enqueue((d, i.toLong)) }
        examined += 1
        if (examined >= maxExamine) stop = true
        else if (best.size >= k) {
          // early termination (SRS-12, simplified): sqrt(pd/m) is an unbiased
          // estimate of the next point's true distance (2-stable property);
          // once it exceeds c=2 times the current k-th exact distance the
          // c-approximation already holds with the confidence governed by
          // τ' and the search can stop.
          var pd = 0.0
          val nxt = order(math.min(examined, order.length - 1))
          var j = 0
          while (j < m) { val dd = projected(nxt)(j) - qp(j); pd += dd * dd; j += 1 }
          if (math.sqrt(pd / m) * (1.0 + earlyTau) > 2.0 * best.head._1) stop = true
        }
      }
      best.dequeueAll.toArray.map { case (d, id) => (id, d) }.sortBy { case (id, d) => (d, id) }
    }

    override def indexBytes: Long = data.length.toLong * (m * 4L + 8L)
  }

  def buildIndex(spark: SparkSession, data: Dataset[VecRow], localData: Array[Array[Float]],
                 m: Int = 6, t: Double = 0.00242, earlyTau: Double = 0.1809,
                 seed: Long = 7): Index = {
    val t0 = System.nanoTime()
    val dim = localData.head.length
    val projections = Common.gaussianProjections(dim, m, seed)
    val bP = spark.sparkContext.broadcast(projections)
    // Distributed projection of the whole database.
    val projPairs = data.rdd
      .map(r => r.id -> bP.value.map(p => Common.dot(r.vec, p).toFloat))
      .collect()
    val projected = new Array[Array[Float]](localData.length)
    projPairs.foreach { case (id, p) => projected(id.toInt) = p }
    new Index(localData, projections, projected, t, earlyTau,
              (System.nanoTime() - t0) / 1000000L)
  }

  override def build(spark: SparkSession, spec: VectorData.Spec, data: Dataset[VecRow],
                     localData: Array[Array[Float]]): AnnIndex =
    buildIndex(spark, data, localData)
}
