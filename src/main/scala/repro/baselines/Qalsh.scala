package repro.baselines

import org.apache.spark.sql.{Dataset, SparkSession}
import repro.{VecRow, VectorData}
import repro.core.Distance

/** QALSH (Huang et al. [34]) — query-aware LSH.
  *
  * Unlike C2LSH there is no pre-quantized grid: the raw projections
  * a_i·o are kept (in B+-trees in the paper; sorted arrays here) and
  * bucket *boundaries are decided at query time*, centred on a_i·q with
  * half-width (w/2)·c^r that expands with the virtual-rehash level r.
  * The first level at which projection i collides is therefore
  * ceil(log_c(2|a_i·o − a_i·q| / w)); a point's qualifying level is the
  * l-th smallest over the m projections, and candidates are examined in
  * qualifying-level order until βn + k of them — query-centred continuous
  * intervals are what buys QALSH its better MAP over C2LSH.
  */
object Qalsh extends AnnMethod {
  override def name = "qalsh"

  final class Index(
      data: Array[Array[Float]],
      projections: Array[Array[Float]],
      w: Double,
      projs: Array[Array[Float]], // n × m raw projections
      collisionThreshold: Int, betaN: Int,
      val buildMillis: Long) extends AnnIndex {

    override def name = "qalsh"
    private val m = projections.length

    override def search(q: Array[Float], k: Int): Array[(Long, Double)] = {
      val qp = Array.tabulate(m)(i => Common.dot(q, projections(i)))
      val nCand = math.min(data.length, betaN + k)
      val levels = new Array[Double](data.length)
      val tmp = new Array[Double](m)
      var i = 0
      while (i < data.length) {
        var j = 0
        while (j < m) {
          // clamp away subnormal gaps: on [-1,1]-domain data the projection
          // differences can be denormal floats, and feeding those through
          // log costs a ~100x FP slow path on x86
          val gap = math.max(1e-12, math.abs(projs(i)(j) - qp(j)))
          // smallest r (continuous) with gap <= (w/2)·2^r
          tmp(j) = if (gap <= w / 2) 0.0 else math.log(2 * gap / w) / math.log(2.0)
          j += 1
        }
        java.util.Arrays.sort(tmp)
        levels(i) = tmp(collisionThreshold - 1)
        i += 1
      }
      val order = data.indices.sortBy(i => (levels(i), i)).take(nCand)
      Distance.topK(order.iterator.map(i => i.toLong -> Distance.l2(data(i), q)), k)
    }

    override def indexBytes: Long = data.length.toLong * m * (4L + 8L) // proj + B+-tree ptr
  }

  def buildIndex(spark: SparkSession, data: Dataset[VecRow], localData: Array[Array[Float]],
                 m: Int = 20, alphaFrac: Double = 0.6, betaFrac: Double = 0.01,
                 seed: Long = 17): Index = {
    val t0 = System.nanoTime()
    val dim = localData.head.length
    val projections = Common.gaussianProjections(dim, m, seed)
    val sampleSpread = {
      val s = (0 until math.min(500, localData.length))
        .map(i => Common.dot(localData(i), projections(0)))
      val mean = s.sum / s.size
      math.sqrt(s.map(x => (x - mean) * (x - mean)).sum / s.size)
    }
    val w = math.max(1e-9, sampleSpread / 8.0)
    val bP = spark.sparkContext.broadcast(projections)
    val pairs = data.rdd.map { r =>
      val ps = bP.value
      r.id -> Array.tabulate(ps.length)(i => Common.dot(r.vec, ps(i)).toFloat)
    }.collect()
    val projs = new Array[Array[Float]](localData.length)
    pairs.foreach { case (id, p) => projs(id.toInt) = p }
    val threshold = math.max(1, math.ceil(alphaFrac * m).toInt)
    val betaN = math.max(1, math.ceil(betaFrac * localData.length).toInt)
    new Index(localData, projections, w, projs, threshold, betaN,
              (System.nanoTime() - t0) / 1000000L)
  }

  override def build(spark: SparkSession, spec: VectorData.Spec, data: Dataset[VecRow],
                     localData: Array[Array[Float]]): AnnIndex =
    buildIndex(spark, data, localData)
}
