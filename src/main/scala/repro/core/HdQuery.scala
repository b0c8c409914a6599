package repro.core

import org.apache.spark.sql.SparkSession
import repro.VecRow

/** Query-time parameters (Algo. 2). Paper recommendations (Sec. 5.2):
  * triangular-only filtering with α/γ = 4; when Ptolemaic is enabled,
  * α/β = 1 and β/γ = 4.
  */
final case class QueryParams(k: Int, alpha: Int, beta: Int, gamma: Int,
                             usePtolemaic: Boolean = false)

object QueryParams {
  /** Recommended setting for a dataset of size n: α = 4096 scaled with n
    * (the paper's α at SIFT1M examined ~0.4% of the DB; we keep the α/γ = 4
    * ratio and never let α drop below 16k-neighbourhood of k).
    */
  def recommended(k: Int, alpha: Int, usePtolemaic: Boolean = false): QueryParams =
    if (usePtolemaic) QueryParams(k, alpha, alpha, math.max(k, alpha / 4), usePtolemaic = true)
    else QueryParams(k, alpha, math.max(k, alpha / 4), math.max(k, alpha / 4))
}

/** Per-query cost counters using the paper's disk model (Sec. 4.4.1):
  * leaf pages touched (tree descents + sequential leaf scan of the α-window)
  * and random accesses for the κ candidate descriptors.
  */
final case class QueryStats(leafPages: Long, randomAccesses: Long, kappa: Int)

/** kANN querying over a built HD-Index (Algo. 2). Two equivalent paths:
  *
  *  - [[searchLocal]] walks the driver-side sorted trees (the per-query
  *    timing path — one binary search + window scan per tree);
  *  - [[searchSpark]] runs the candidate-window retrieval as a distributed
  *    `mapPartitions` scan over the range-partitioned index Dataset with
  *    per-partition pruning, then applies the identical filter pipeline.
  *
  * A test asserts both return identical answers.
  */
object HdQuery {

  // ---- lower bounds ----------------------------------------------------

  /** Eq. 5: best triangular lower bound over the m references. */
  def triBound(dq: Array[Double], rd: Array[Float]): Double = {
    var best = 0.0
    var i = 0
    while (i < dq.length) {
      val b = math.abs(dq(i) - rd(i))
      if (b > best) best = b
      i += 1
    }
    best
  }

  /** Eq. 6: best Ptolemaic lower bound over the (m choose 2) reference pairs. */
  def ptolemaicBound(dq: Array[Double], rd: Array[Float], refMatrix: Array[Array[Double]]): Double = {
    var best = 0.0
    var i = 0
    while (i < dq.length) {
      var j = i + 1
      while (j < dq.length) {
        val denom = refMatrix(i)(j)
        if (denom > 0) {
          val b = math.abs(dq(i) * rd(j) - dq(j) * rd(i)) / denom
          if (b > best) best = b
        }
        j += 1
      }
      i += 1
    }
    best
  }

  // ---- window retrieval -------------------------------------------------

  /** Index of the first key >= qkey (lower bound) in a sorted key array. */
  def lowerBound(keys: Array[Array[Byte]], qkey: Array[Byte]): Int = {
    var lo = 0
    var hi = keys.length
    while (lo < hi) {
      val mid = (lo + hi) >>> 1
      if (Hilbert.compareKeys(keys(mid), qkey) < 0) lo = mid + 1 else hi = mid
    }
    lo
  }

  /** The α entries nearest to qkey in one-dimensional key order: a
    * contiguous window around the insertion point, grown outward one entry
    * at a time toward the numerically closer side (ties go left). Returns
    * [start, end) over `keys`.
    */
  def selectWindow(keys: Array[Array[Byte]], qkey: Array[Byte], alpha: Int): (Int, Int) = {
    if (keys.isEmpty) return (0, 0)
    val pos = lowerBound(keys, qkey)
    // scratch buffers: keys(l) < qkey <= keys(r) by construction, so both
    // differences are non-negative and comparable byte-wise
    val dl = new Array[Byte](qkey.length)
    val dr = new Array[Byte](qkey.length)
    var l = pos - 1
    var r = pos
    var taken = 0
    while (taken < alpha && (l >= 0 || r < keys.length)) {
      val takeLeft =
        if (l < 0) false
        else if (r >= keys.length) true
        else {
          Hilbert.subtract(qkey, keys(l), dl)
          Hilbert.subtract(keys(r), qkey, dr)
          Hilbert.compareKeys(dl, dr) <= 0
        }
      if (takeLeft) l -= 1 else r += 1
      taken += 1
    }
    (l + 1, r)
  }

  // ---- filter pipeline (shared by both paths) ---------------------------

  /** Sort window positions by a non-negative bound: pack the bound's float
    * bits (order-preserving for non-negative floats) with the position into
    * one long and primitive-sort — no boxing on the α-sized hot path. Ties
    * break by window position, i.e. (hilbert key, id) order, identically in
    * the local and distributed paths.
    */
  private def orderByBound(n: Int, bound: Int => Double): Array[Long] = {
    val packed = new Array[Long](n)
    var i = 0
    while (i < n) {
      packed(i) = (java.lang.Float.floatToIntBits(bound(i).toFloat).toLong << 32) | i.toLong
      i += 1
    }
    java.util.Arrays.sort(packed)
    packed
  }

  /** Algo. 2 lines 5–10 for one tree: window candidates -> triangular filter
    * -> (optional) Ptolemaic filter -> γ surviving ids.
    */
  private def filterTree(ids: Array[Long], refdists: Int => Array[Float],
                         dq: Array[Double], refMatrix: Array[Array[Double]],
                         p: QueryParams): Array[Long] = {
    val n = ids.length
    val byTri = orderByBound(n, i => triBound(dq, refdists(i)))
    if (!p.usePtolemaic) {
      byTri.take(math.min(n, p.gamma)).map(pk => ids((pk & 0xffffffffL).toInt))
    } else {
      val beta = byTri.take(math.min(n, p.beta)).map(pk => (pk & 0xffffffffL).toInt)
      val byPto = orderByBound(beta.length, j => ptolemaicBound(dq, refdists(beta(j)), refMatrix))
      byPto.take(math.min(beta.length, p.gamma)).map(pk => ids(beta((pk & 0xffffffffL).toInt)))
    }
  }

  /** Algo. 2 lines 11–16: fetch candidate descriptors, rank by exact
    * distance, return top-k (sorted ascending by (distance, id)).
    */
  private def finalizeAnswer(cands: Set[Long], q: Array[Float], getVec: Long => Array[Float],
                             k: Int): Array[(Long, Double)] =
    Distance.topK(cands.iterator.map(id => id -> Distance.l2(getVec(id), q)), k)

  // ---- local path -------------------------------------------------------

  def searchLocal(model: HdIndexModel, q: Array[Float], p: QueryParams,
                  getVec: Long => Array[Float]): (Array[(Long, Double)], QueryStats) = {
    val cfg = model.cfg
    val dq  = model.refs.map(r => Distance.l2(q, r))
    var pages = 0L
    val cands = scala.collection.mutable.Set.empty[Long]
    var t = 0
    while (t < model.trees.length) {
      val tree  = model.trees(t)
      val qkey  = Hilbert(tree.width, cfg.omega).encodeVector(q, tree.fromDim, cfg.lo, cfg.hi)
      val (s, e) = selectWindow(tree.keys, qkey, p.alpha)
      val ids = java.util.Arrays.copyOfRange(tree.ids, s, e)
      cands ++= filterTree(ids, i => model.refdistsById(ids(i).toInt), dq, model.refMatrix, p)
      pages += model.treeHeight(t) + (e - s + model.leafOrder(t) - 1) / model.leafOrder(t)
      t += 1
    }
    cands --= model.deleted // Sec. 3.6: marked objects are never answers
    val ans = finalizeAnswer(cands.toSet, q, getVec, p.k)
    (ans, QueryStats(pages, cands.size.toLong, cands.size))
  }

  // ---- distributed path -------------------------------------------------

  /** Distributed candidate retrieval: each index partition (a (treeId, hkey)
    * range) scans only its own entries, emitting for every query the ≤ 2α
    * entries adjacent to the query key's local insertion point. The union of
    * these per-partition runs provably contains the global α-window, which
    * is then re-selected with the same [[selectWindow]] and filtered with
    * the same pipeline, so results match [[searchLocal]] exactly.
    */
  def searchSpark(spark: SparkSession, model: HdIndexModel, queries: Array[VecRow],
                  p: QueryParams, getVec: Long => Array[Float]): Array[Array[(Long, Double)]] = {
    import spark.implicits._
    val cfg  = model.cfg
    val qKeys: Array[Array[Array[Byte]]] = queries.map { qr =>
      model.trees.map(tr => Hilbert(tr.width, cfg.omega).encodeVector(qr.vec, tr.fromDim, cfg.lo, cfg.hi))
    }
    val bQKeys = spark.sparkContext.broadcast(qKeys)
    val alpha  = p.alpha

    // (queryIdx, treeId, hkey, id, refdists)
    val windows = model.entries.mapPartitions { it =>
      val es = it.toArray // partition is already sorted by (treeId, hkey, id)
      val byTree = es.zipWithIndex.groupBy(_._1.treeId)
      val qk = bQKeys.value
      byTree.iterator.flatMap { case (tid, arr) =>
        val keys = arr.map(_._1.hkey)
        (qk.indices).iterator.flatMap { qi =>
          val pos = lowerBound(keys, qk(qi)(tid))
          val s = math.max(0, pos - alpha)
          val e = math.min(keys.length, pos + alpha)
          (s until e).iterator.map { i =>
            val en = arr(i)._1
            (qi, tid, en.hkey, en.id, en.refdists)
          }
        }
      }
    }.collect()

    val byQuery = windows.groupBy(_._1)
    queries.indices.toArray.map { qi =>
      val dq = model.refs.map(r => Distance.l2(queries(qi).vec, r))
      val cands = scala.collection.mutable.Set.empty[Long]
      val perTree = byQuery.getOrElse(qi, Array.empty).groupBy(_._2)
      model.trees.foreach { tr =>
        val es = perTree.getOrElse(tr.treeId, Array.empty)
          .sortWith { (a, b) =>
            val c = Hilbert.compareKeys(a._3, b._3)
            if (c != 0) c < 0 else a._4 < b._4
          }
        val keys = es.map(_._3)
        val (s, e) = selectWindow(keys, qKeys(qi)(tr.treeId), p.alpha)
        val ids = es.slice(s, e).map(_._4)
        val rds = es.slice(s, e).map(_._5)
        cands ++= filterTree(ids, i => rds(i), dq, model.refMatrix, p)
      }
      cands --= model.deleted
      finalizeAnswer(cands.toSet, queries(qi).vec, getVec, p.k)
    }
  }
}
