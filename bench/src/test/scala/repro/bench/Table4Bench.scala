package repro.bench

import repro.{SparkSpec, VectorData}

/** Table 4: the dataset roster. Real corpora are replaced by the synthetic
  * registry (DESIGN.md §3); this bench prints paper-n next to our scaled n
  * and validates the distributed generators at their working scale.
  */
class Table4Bench extends SparkSpec {

  test("Table 4: dataset registry (paper vs scaled synthetic)") {
    println("== Table 4: datasets (synthetic substitution; n scaled ~100-1000x) ==")
    println(f"${"Dataset"}%-9s ${"nu"}%5s ${"paper n"}%12s ${"our n"}%8s ${"Domain"}%18s ${"#Queries"}%9s")
    VectorData.all.foreach { s =>
      val dom = s"[${s.lo.toInt},${s.hi.toInt}]"
      println(f"${s.name}%-9s ${s.dim}%5d ${s.paperN}%12d ${s.n}%8d $dom%18s ${s.nQueries}%9d")
    }
    assert(VectorData.all.map(_.name) ==
      Seq("sift10k", "audio", "sun", "sift1m", "yorck", "enron", "glove"))
  }

  test("every registry dataset generates distributed data with the declared shape") {
    VectorData.all.foreach { s =>
      val sample = s.data(spark).limit(5).collect()
      assert(sample.length == 5)
      sample.foreach { r =>
        assert(r.vec.length == s.dim)
        r.vec.foreach(x => assert(x >= s.lo && x <= s.hi))
      }
    }
  }

  test("scaled sizes preserve the paper's tiny < small < medium ordering") {
    assert(VectorData.sift10k.n <= VectorData.sift1m.n)
    assert(VectorData.enron.n <= VectorData.glove.n)
    assert(VectorData.sun.n <= VectorData.yorck.n)
  }
}
