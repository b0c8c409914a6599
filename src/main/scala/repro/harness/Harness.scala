package repro.harness

import org.apache.spark.sql.SparkSession
import repro.{VecRow, VectorData}
import repro.baselines._
import repro.core._

/** Per-method result row for the comparison tables. */
final case class MethodResult(
    method: String, dataset: String,
    buildMillis: Long, indexMB: Double,
    queryMillis: Double, map: Double, ratio: Double)

/** Shared measurement harness behind the Table 5 bench, the parameter
  * benches and the spark-submit jobs: builds every method on a dataset,
  * times the full query set, and computes MAP@k / approximation ratio
  * against the distributed linear-scan ground truth.
  */
object Harness {

  /** The comparison roster of Sec. 2.2.6 (HD-Index first). */
  def methods(hdAlpha: Int = -1): Seq[AnnMethod] = Seq(
    new HdIndexMethod(alphaOverride = hdAlpha),
    C2Lsh, Srs, Multicurves, Qalsh, Pq, Hnsw, IDistance)

  final case class Prepared(
      spec: VectorData.Spec,
      local: Array[Array[Float]],
      queries: Array[VecRow],
      truth: Array[Array[(Long, Double)]])

  def prepare(spark: SparkSession, spec: VectorData.Spec, k: Int): Prepared = {
    val local = spec.localData
    val queries = spec.queries
    val truth = LinearScan.groundTruth(spark, spec.data(spark), queries, k)
    Prepared(spec, local, queries, truth)
  }

  /** Build one method and measure it over the whole query set. The warmup
    * pass runs a sizeable slice of the query set first so JIT compilation
    * (which the paper's C++ baselines do not pay) is excluded from the
    * reported per-query time for every method equally.
    */
  def measure(spark: SparkSession, prep: Prepared, method: AnnMethod, k: Int,
              warmup: Int = 15): MethodResult = {
    val idx = method.build(spark, prep.spec, prep.spec.data(spark), prep.local)
    prep.queries.take(warmup).foreach(q => idx.search(q.vec, k))
    val t0 = System.nanoTime()
    val answers = prep.queries.map(q => idx.search(q.vec, k))
    val queryMs = (System.nanoTime() - t0) / 1e6 / prep.queries.length

    val map = Metrics.mapAtK(
      prep.queries.indices.map(qi =>
        (prep.truth(qi).map(_._1).toSeq, answers(qi).map(_._1).toSeq)), k)
    val ratio = prep.queries.indices.map { qi =>
      val t = prep.truth(qi)
      val a = answers(qi)
      val kk = math.min(t.length, a.length)
      if (kk == 0) 1.0
      else Metrics.approximationRatio(a.take(kk).map(_._2).toSeq, t.take(kk).map(_._2).toSeq)
    }.sum / prep.queries.length

    MethodResult(idx.name, prep.spec.name, idx.buildMillis,
                 idx.indexBytes / 1e6, queryMs, map, ratio)
  }

  /** Full comparison on one dataset. */
  def compareAll(spark: SparkSession, spec: VectorData.Spec, k: Int,
                 hdAlpha: Int = -1,
                 skip: Set[String] = Set.empty): Seq[MethodResult] = {
    val prep = prepare(spark, spec, k)
    methods(hdAlpha).filterNot(m => skip.contains(m.name)).map { m =>
      val r = measure(spark, prep, m, k)
      Console.err.println(f"[harness] ${spec.name}%-8s ${r.method}%-12s " +
        f"build=${r.buildMillis}%6d ms  idx=${r.indexMB}%9.2f MB  " +
        f"q=${r.queryMillis}%8.3f ms  MAP@$k=${r.map}%.3f  ratio=${r.ratio}%.3f")
      r
    }
  }

  /** Render results as a fixed-width table (one row per method). */
  def formatTable(rows: Seq[MethodResult], k: Int): String = {
    val header = f"${"dataset"}%-8s ${"method"}%-12s ${"build(ms)"}%10s ${"index(MB)"}%10s " +
      f"${"query(ms)"}%10s ${s"MAP@$k"}%8s ${"ratio"}%7s"
    (header +: rows.map(r =>
      f"${r.dataset}%-8s ${r.method}%-12s ${r.buildMillis}%10d ${r.indexMB}%10.2f " +
      f"${r.queryMillis}%10.3f ${r.map}%8.3f ${r.ratio}%7.3f")).mkString("\n")
  }

  /** The Table 5 gain view: HD-Index query-time and MAP gains over others. */
  def formatGains(rows: Seq[MethodResult], k: Int): String = {
    val hd = rows.find(_.method == "hdindex").getOrElse(sys.error("no hdindex row"))
    val others = rows.filterNot(r => r.method == "hdindex" || r.method == "idistance")
    val sb = new StringBuilder
    sb.append(f"${hd.dataset}%-8s HD-Index: q=${hd.queryMillis}%.2f ms  MAP@$k=${hd.map}%.3f\n")
    others.foreach { o =>
      sb.append(f"  vs ${o.method}%-12s  time-gain=${o.queryMillis / hd.queryMillis}%8.2fx  " +
        f"MAP-gain=${hd.map / math.max(o.map, 1e-4)}%8.2fx\n")
    }
    sb.toString
  }
}
