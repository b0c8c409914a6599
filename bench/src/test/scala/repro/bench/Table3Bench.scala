package repro.bench

import org.scalatest.funsuite.AnyFunSuite
import repro.core.RdbTree

/** Table 3: RDB-tree leaf order Ω per dataset (page size 4 KB, m = 10).
  * Eq. 4 is deterministic, so these reproduce the paper's numbers *exactly*.
  */
class Table3Bench extends AnyFunSuite {

  // dataset -> (nu, omega, eta, paper leaf order)
  private val rows = Seq(
    ("SIFTn", 128, 8, 16, 63),
    ("Yorck", 128, 32, 16, 36),
    ("SUN", 512, 32, 64, 13),
    ("Audio", 192, 32, 24, 28),
    ("Enron", 1369, 16, 86, 18),
    ("Glove", 100, 32, 13, 40))

  test("Table 3 reproduces exactly") {
    println("== Table 3: RDB-tree leaf order (page size = 4 KB, m = 10) ==")
    println(f"${"Dataset"}%-8s ${"nu"}%5s ${"omega"}%6s ${"eta"}%5s ${"paper"}%6s ${"ours"}%6s")
    rows.foreach { case (name, nu, omega, eta, paper) =>
      val ours = RdbTree.leafOrder(eta, omega, m = 10, pageSize = 4096)
      println(f"$name%-8s $nu%5d $omega%6d $eta%5d $paper%6d $ours%6d")
      assert(ours == paper, s"$name leaf order mismatch: paper=$paper ours=$ours")
    }
  }

  test("leaf order scales inversely with entry size") {
    val os = rows.map { case (_, _, omega, eta, _) => RdbTree.leafOrder(eta, omega, 10) }
    val entries = rows.map { case (_, _, omega, eta, _) => eta * omega / 8.0 + 48 }
    // larger entry => smaller order, pairwise
    for (i <- rows.indices; j <- rows.indices if entries(i) < entries(j))
      assert(os(i) >= os(j))
  }
}
