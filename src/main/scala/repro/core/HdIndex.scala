package repro.core

import org.apache.spark.sql.{Dataset, SparkSession}
import repro.{VecRow, VectorData}

/** HD-Index build configuration (defaults = the paper's recommendations,
  * Sec. 5.2: m = 10, f = 0.3, B = 4096, SSS reference selection).
  */
final case class HdIndexConfig(
    dim: Int, tau: Int, omega: Int, lo: Double, hi: Double,
    m: Int = 10, f: Double = 0.3, pageSize: Int = 4096,
    refMethod: String = "sss", seed: Long = 7)

/** Driver-side view of one RDB-tree: entries in global Hilbert-key order.
  * `keys`, `ids` are aligned; reference distances are looked up through the
  * shared by-id table in the model (physically shared, logically replicated
  * per leaf — the size accounting uses the paper's per-leaf layout).
  */
final case class LocalTree(treeId: Int, fromDim: Int, width: Int,
                           keys: Array[Array[Byte]], ids: Array[Long])

/** The built HD-Index: τ RDB-trees + reference objects + the pre-computed
  * reference-to-reference distance matrix (needed by the Ptolemaic filter).
  */
final class HdIndexModel(
    val cfg: HdIndexConfig,
    val n: Long,
    val refIds: Array[Int],
    val refs: Array[Array[Float]],
    val refMatrix: Array[Array[Double]],
    val entries: Dataset[IndexEntry],
    val trees: Array[LocalTree],
    val refdistsById: Array[Array[Float]],
    val buildMillis: Long) extends Serializable {

  /** Sec. 3.6: deletions are handled by marking — marked objects are never
    * returned as answers but stay in the tree pages.
    */
  val deleted: scala.collection.mutable.Set[Long] = scala.collection.mutable.Set.empty

  /** Leaf order Ω of tree t (trees can differ when the last dimension slice
    * is narrower).
    */
  def leafOrder(t: Int): Int = RdbTree.leafOrder(trees(t).width, cfg.omega, cfg.m, cfg.pageSize)

  def treeHeight(t: Int): Int = RdbTree.height(n, trees(t).width, cfg.omega, cfg.m, cfg.pageSize)

  /** Index size estimate in bytes using the paper's page model: leaf pages
    * of each tree (entries of η·ω/8 + 4m + 8 bytes packed Ω per B-byte page)
    * plus internal pages.
    */
  def indexBytes: Long =
    trees.indices.map { t =>
      val om     = leafOrder(t)
      val leaves = (n + om - 1) / om
      val theta  = RdbTree.internalFanout(trees(t).width, cfg.omega, cfg.pageSize)
      var pages  = leaves
      var level  = leaves
      while (level > 1) { level = (level + theta - 1) / theta; pages += level }
      pages * cfg.pageSize.toLong
    }.sum
}

/** HD-Index construction (Algo. 1): choose references, compute reference
  * distances, build the τ RDB-trees.
  */
object HdIndex {

  def configFor(spec: VectorData.Spec): HdIndexConfig =
    HdIndexConfig(spec.dim, spec.tau, spec.omega, spec.lo, spec.hi)

  /** Build from a distributed dataset. `localData` is the driver-side copy
    * used for reference selection (the paper scans the dataset for SSS) and
    * must equal the distributed content.
    */
  def build(spark: SparkSession, data: Dataset[VecRow], localData: Array[Array[Float]],
            cfg: HdIndexConfig): HdIndexModel = {
    val t0 = System.nanoTime()

    val refIds = cfg.refMethod match {
      case "sss"     => ReferenceSelection.sss(localData, cfg.m, cfg.f, cfg.seed)
      case "sss-dyn" => ReferenceSelection.sssDyn(localData, cfg.m, cfg.f, seed = cfg.seed)
      case "random"  => ReferenceSelection.random(localData, cfg.m, cfg.seed)
      case other     => sys.error(s"unknown reference selection method $other")
    }
    val refs = refIds.map(localData(_))
    val refMatrix = Array.tabulate(refs.length, refs.length) {
      (i, j) => Distance.l2(refs(i), refs(j))
    }

    val entries = RdbTree.build(spark, data, refs, cfg.dim, cfg.tau, cfg.omega,
                                cfg.lo, cfg.hi, cfg.pageSize).cache()

    // Materialize the driver-side sorted view of each tree (the query path's
    // "disk pages"); a defensive driver-side sort makes the view independent
    // of collect() partition-order guarantees.
    val collected = entries.collect()
    val parts = RdbTree.partitions(cfg.dim, cfg.tau)
    val n = localData.length.toLong
    val refdistsById = new Array[Array[Float]](localData.length)
    val trees = parts.zipWithIndex.map { case ((from, width), t) =>
      val es = collected.filter(_.treeId == t).sortWith { (a, b) =>
        val c = Hilbert.compareKeys(a.hkey, b.hkey)
        if (c != 0) c < 0 else a.id < b.id
      }
      require(es.length == n, s"tree $t has ${es.length} entries, expected $n")
      es.foreach(e => refdistsById(e.id.toInt) = e.refdists)
      LocalTree(t, from, width, es.map(_.hkey), es.map(_.id))
    }

    new HdIndexModel(cfg, n, refIds, refs, refMatrix, entries, trees, refdistsById,
                     (System.nanoTime() - t0) / 1000000L)
  }

  def buildForSpec(spark: SparkSession, spec: VectorData.Spec,
                   cfg: HdIndexConfig = null): HdIndexModel = {
    val c = Option(cfg).getOrElse(configFor(spec))
    build(spark, spec.data(spark), spec.localData, c)
  }

  /** Sec. 3.6 insertion: B+-trees are update-friendly, so a new object only
    * needs its τ Hilbert keys and its m reference distances — the reference
    * set R is *not* recomputed (random references perform close to SSS,
    * Fig. 4, and updates are few relative to n). Updates the driver-side
    * tree view in place conceptually; the distributed `entries` Dataset is
    * the bulk-build form and is refreshed by re-running the build job.
    *
    * @param id must be the next dense id (== current n)
    * @return a new model sharing cfg/references with the entry inserted
    */
  def insert(model: HdIndexModel, id: Long, vec: Array[Float]): HdIndexModel = {
    require(id == model.n, s"ids must stay dense: expected ${model.n}, got $id")
    val cfg = model.cfg
    val rd  = model.refs.map(r => Distance.l2(vec, r).toFloat)
    val trees = model.trees.map { tr =>
      val key = Hilbert(tr.width, cfg.omega).encodeVector(vec, tr.fromDim, cfg.lo, cfg.hi)
      // insertion point: first entry with (key, id) greater than the new one
      var lo = 0
      var hi = tr.keys.length
      while (lo < hi) {
        val mid = (lo + hi) >>> 1
        val c = Hilbert.compareKeys(tr.keys(mid), key)
        if (c < 0 || (c == 0 && tr.ids(mid) < id)) lo = mid + 1 else hi = mid
      }
      val nk = new Array[Array[Byte]](tr.keys.length + 1)
      val ni = new Array[Long](tr.ids.length + 1)
      System.arraycopy(tr.keys, 0, nk, 0, lo); nk(lo) = key
      System.arraycopy(tr.keys, lo, nk, lo + 1, tr.keys.length - lo)
      System.arraycopy(tr.ids, 0, ni, 0, lo); ni(lo) = id
      System.arraycopy(tr.ids, lo, ni, lo + 1, tr.ids.length - lo)
      tr.copy(keys = nk, ids = ni)
    }
    val nrd = java.util.Arrays.copyOf(model.refdistsById, model.refdistsById.length + 1)
    nrd(id.toInt) = rd
    val m2 = new HdIndexModel(cfg, model.n + 1, model.refIds, model.refs, model.refMatrix,
                              model.entries, trees, nrd, model.buildMillis)
    m2.deleted ++= model.deleted
    m2
  }

  /** Sec. 3.6 deletion: mark only. */
  def markDeleted(model: HdIndexModel, id: Long): Unit = { model.deleted += id }
}
