package repro.bench

import repro.{SparkSpec, VectorData}
import repro.harness.{Harness, MethodResult}

/** Table 5: the main comparison — per dataset, HD-Index query time and
  * MAP@100, plus its time-gain and MAP-gain over C2LSH, SRS, Multicurves,
  * QALSH, OPQ and HNSW (iDistance included as the exact reference).
  *
  * Absolute milliseconds differ from the paper's disk-bound C++ testbed;
  * what must reproduce is the *shape*: which methods HD-Index beats on
  * quality, by roughly what class of factor, and the quality ordering
  * iDistance = 1 ≥ HNSW ≈ HD-Index ≥ Multicurves ≥ QALSH ≥ C2LSH/SRS ≫ OPQ.
  */
class Table5Bench extends SparkSpec {

  private val k = 100

  // scaled datasets (DESIGN.md §3): every method runs on every dataset.
  private val datasets = Seq(
    VectorData.sift10k, VectorData.audio, VectorData.sun,
    VectorData.sift1m, VectorData.yorck, VectorData.enron, VectorData.glove)

  private var all: Map[String, Seq[MethodResult]] = Map.empty

  private def resultsFor(spec: VectorData.Spec): Seq[MethodResult] = synchronized {
    all.getOrElse(spec.name, {
      val rs = Harness.compareAll(spark, spec, k)
      all += spec.name -> rs
      rs
    })
  }

  // "opq" falls back to plain "pq" on ultra-high-dim datasets (Enron),
  // where the PCA rotation is disabled — same method family, same row.
  private def alias(m: String): Set[String] = if (m == "opq") Set("opq", "pq") else Set(m)

  private def map(rs: Seq[MethodResult], m: String): Double =
    rs.find(r => alias(m)(r.method)).map(_.map).getOrElse(Double.NaN)

  for (spec <- datasets) {
    test(s"Table 5 row: ${spec.name}") {
      val rs = resultsFor(spec)
      println(s"== Table 5: ${spec.name} (k=$k) ==")
      println(Harness.formatTable(rs, k))
      println(Harness.formatGains(rs, k))

      // exactness of the reference method
      assert(map(rs, "idistance") > 0.999, "iDistance is exact; MAP must be 1")
      // HD-Index quality dominates the LSH family and OPQ (Table 5 MAP gains > 1)
      assert(map(rs, "hdindex") >= map(rs, "srs") - 0.02,
             s"hdindex=${map(rs, "hdindex")} srs=${map(rs, "srs")}")
      assert(map(rs, "hdindex") >= map(rs, "c2lsh") - 0.02)
      assert(map(rs, "hdindex") > map(rs, "opq"),
             s"hdindex=${map(rs, "hdindex")} opq=${map(rs, "opq")}")
      // HD-Index itself is accurate on clustered data
      assert(map(rs, "hdindex") > 0.5, s"hdindex MAP=${map(rs, "hdindex")}")
    }
  }

  test("Table 5 summary: MAP quality ordering matches the paper's shape") {
    val names = datasets.map(_.name)
    val rows = names.flatMap(n => all.get(n).toSeq.flatten)
    assert(rows.nonEmpty, "dataset rows must have run first")
    def meanMap(m: String): Double = {
      val vs = rows.filter(r => alias(m)(r.method)).map(_.map)
      vs.sum / vs.length
    }
    println("== Table 5 aggregate: mean MAP@100 over datasets ==")
    Seq("idistance", "hnsw", "hdindex", "multicurves", "qalsh", "c2lsh", "srs", "opq")
      .foreach(m => println(f"  $m%-12s ${meanMap(m)}%.3f"))
    assert(meanMap("hdindex") > meanMap("c2lsh"))
    assert(meanMap("hdindex") > meanMap("srs"))
    assert(meanMap("hdindex") > meanMap("qalsh"))
    // the paper's OPQ row is near zero; on our clustered substitute PQ codes
    // retain some signal, but M=2 coarseness must still cost it heavily
    assert(meanMap("hdindex") > meanMap("opq") + 0.2)
    assert(meanMap("hdindex") > meanMap("opq") * 1.5, "OPQ(M=2) must trail far behind")
  }

  test("Table 5 summary: index-size ordering matches Fig. 9 (multicurves largest family)") {
    val rows = all.values.flatten.toSeq
    assert(rows.nonEmpty)
    def meanMB(m: String): Double = {
      val vs = rows.filter(r => alias(m)(r.method)).map(_.indexMB)
      vs.sum / vs.length
    }
    println("== index size (MB, mean over datasets) ==")
    Seq("multicurves", "hnsw", "hdindex", "qalsh", "srs", "c2lsh", "opq", "idistance")
      .foreach(m => println(f"  $m%-12s ${meanMB(m)}%.2f"))
    assert(meanMB("multicurves") > meanMB("hdindex"), "multicurves stores vectors in leaves")
    assert(meanMB("hdindex") > meanMB("srs"), "SRS has the tiny projection index")
    assert(meanMB("opq") < meanMB("srs"), "PQ codes are the smallest")
  }
}
