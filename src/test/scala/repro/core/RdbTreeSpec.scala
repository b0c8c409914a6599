package repro.core

import repro.{Oracle, SparkSpec, TestFixtures, VectorData}

class RdbTreeSpec extends SparkSpec {

  // --- Eq. 4 / Table 3 ----------------------------------------------------

  test("Table 3: SIFT leaf order is 63 (eta=16, omega=8, m=10)") {
    assert(RdbTree.leafOrder(16, 8, 10) == 63)
  }
  test("Table 3: Yorck leaf order is 36 (eta=16, omega=32)") {
    assert(RdbTree.leafOrder(16, 32, 10) == 36)
  }
  test("Table 3: SUN leaf order is 13 (eta=64, omega=32)") {
    assert(RdbTree.leafOrder(64, 32, 10) == 13)
  }
  test("Table 3: Audio leaf order is 28 (eta=24, omega=32)") {
    assert(RdbTree.leafOrder(24, 32, 10) == 28)
  }
  test("Table 3: Enron leaf order is 18 (eta=86, omega=16)") {
    assert(RdbTree.leafOrder(86, 16, 10) == 18)
  }
  test("Table 3: Glove leaf order is 40 (eta=13, omega=32)") {
    assert(RdbTree.leafOrder(13, 32, 10) == 40)
  }
  test("leaf order satisfies Eq. 4 tightly (Ω fits, Ω+1 does not)") {
    for ((eta, om) <- Seq((16, 8), (16, 32), (64, 32), (24, 32), (86, 16), (13, 32))) {
      val entry = eta * om / 8.0 + 4 * 10 + 8
      val o = RdbTree.leafOrder(eta, om, 10)
      assert(entry * o + 17 <= 4096)
      assert(entry * (o + 1) + 17 > 4096)
    }
  }
  test("leaf order grows when references shrink (m < nu scaling argument, Sec. 3.2)") {
    assert(RdbTree.leafOrder(16, 8, 5) > RdbTree.leafOrder(16, 8, 10))
    // storing the full 128-dim descriptor instead would fit only ~7 entries:
    val bPlusLeaf = math.floor((4096 - 17) / (16 * 1.0 + 4 * 128 + 8)).toInt
    assert(RdbTree.leafOrder(16, 8, 10) > 8 * bPlusLeaf)
  }
  test("page too small for one entry is rejected") {
    assertThrows[IllegalArgumentException](RdbTree.leafOrder(2000, 32, 10, pageSize = 64))
  }

  test("internal fanout and height are sane") {
    val theta = RdbTree.internalFanout(16, 8)
    assert(theta == math.floor((4096 - 17) / 24.0).toInt)
    assert(RdbTree.height(1, 16, 8, 10) == 1)
    assert(RdbTree.height(63, 16, 8, 10) == 1)
    assert(RdbTree.height(64, 16, 8, 10) == 2)
    assert(RdbTree.height(1000000, 16, 8, 10) >= 3)
  }

  // --- dimension partitioning --------------------------------------------

  test("partitions cover all dims exactly once, contiguously") {
    for ((dim, tau) <- Seq((128, 8), (512, 16), (100, 8), (1369, 16), (32, 4))) {
      val ps = RdbTree.partitions(dim, tau)
      assert(ps.map(_._2).sum == dim)
      var expect = 0
      ps.foreach { case (from, width) => assert(from == expect); expect += width }
    }
  }
  test("Glove partitioning: 7 curves of 13 dims + 1 of 9") {
    val ps = RdbTree.partitions(100, 8)
    assert(ps.length == 8)
    assert(ps.take(7).forall(_._2 == 13))
    assert(ps.last._2 == 9)
  }
  test("bad tau rejected") {
    assertThrows[IllegalArgumentException](RdbTree.partitions(10, 0))
    assertThrows[IllegalArgumentException](RdbTree.partitions(10, 11))
  }

  // --- distributed build --------------------------------------------------

  lazy val spec: VectorData.Spec = TestFixtures.tiny
  lazy val model: HdIndexModel = TestFixtures.tinyModel

  test("build produces tau trees with n entries each") {
    assert(model.trees.length == spec.tau)
    model.trees.foreach(t => assert(t.keys.length == spec.n && t.ids.length == spec.n))
  }

  test("every tree contains every object id exactly once") {
    model.trees.foreach { t =>
      assert(t.ids.sorted.toSeq == (0L until spec.n.toLong).toSeq)
    }
  }

  test("tree entries are sorted by (hilbert key, id)") {
    model.trees.foreach { t =>
      for (i <- 1 until t.keys.length) {
        val c = Hilbert.compareKeys(t.keys(i - 1), t.keys(i))
        assert(c < 0 || (c == 0 && t.ids(i - 1) < t.ids(i)))
      }
    }
  }

  test("stored keys equal recomputed Hilbert keys of the raw vectors") {
    val local = TestFixtures.tinyLocal
    val rng = new scala.util.Random(0)
    model.trees.foreach { t =>
      val h = Hilbert(t.width, model.cfg.omega)
      for (_ <- 1 to 50) {
        val i = rng.nextInt(t.ids.length)
        val expect = h.encodeVector(local(t.ids(i).toInt), t.fromDim, model.cfg.lo, model.cfg.hi)
        assert(t.keys(i).toSeq == expect.toSeq)
      }
    }
  }

  test("stored reference distances match direct computation") {
    val local = TestFixtures.tinyLocal
    for (id <- 0 until spec.n by 97) {
      val expect = model.refs.map(r => Distance.l2(local(id), r).toFloat)
      assert(model.refdistsById(id).toSeq == expect.toSeq)
    }
  }

  test("reference matrix is symmetric with zero diagonal") {
    val m = model.refMatrix
    for (i <- m.indices; j <- m.indices) {
      assert(math.abs(m(i)(j) - m(j)(i)) < 1e-9)
      if (i == j) assert(m(i)(j) == 0.0)
    }
  }

  test("leaf ids pack Ω entries per leaf in key order (DuckDB oracle)") {
    import spark.implicits._
    // our leaf assignment for tree 0, vs SQL row_number over the same ordering
    val omega0 = model.leafOrder(0)
    val entries = model.entries.filter(_.treeId == 0)
      .map(e => (Hilbert.hex(e.hkey), e.id, e.leafId))
      .toDF("hkeyhex", "id", "leafid")
    val got = entries.selectExpr("hkeyhex", "cast(id as string) as id", "cast(leafid as string) as leafid")
    Oracle.assertEquivalent(
      got,
      s"""SELECT hkeyhex, id,
         |       CAST( (row_number() OVER (ORDER BY hkeyhex, CAST(id AS BIGINT)) - 1) // $omega0 AS VARCHAR) AS leafid
         |FROM t""".stripMargin,
      "t" -> entries.selectExpr("hkeyhex", "cast(id as string) as id"))
  }

  test("index size estimate is linear-ish in n (Sec. 3.5.2)") {
    val bytesPerObj = model.indexBytes.toDouble / model.n
    // tau trees, entry ~ (eta*omega/8 + 4m + 8) bytes + page slack
    assert(bytesPerObj > 0)
    assert(bytesPerObj < 10000, s"index unexpectedly large: $bytesPerObj B/object")
  }
}
