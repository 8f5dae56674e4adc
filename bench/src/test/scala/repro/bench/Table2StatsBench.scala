package repro.bench

/** Table 2: dataset and partition statistics of the six real-graph analogs. */
class Table2StatsBench extends BenchSpec {
  private lazy val rows = Tables.table2Rows()

  test("Table 2 renders") {
    printTable("Table 2: dataset and partition statistics (lite analogs)",
               Tables.renderTable2(rows))
    assert(rows.size == 6)
  }

  test("block counts match the paper's partitioning") {
    val paper = Map("LJ" -> 17, "TW" -> 18, "FR" -> 27, "UK" -> 25, "Kron29" -> 13, "CW" -> 9)
    rows.foreach(r => assert(r.nBlocks == paper(r.dataset)))
  }

  test("power-law analogs have high sequential edge-cut (paper: 76-93%)") {
    for (n <- Seq("LJ", "TW", "FR", "Kron29"))
      assert(rows.find(_.dataset == n).get.edgeCutPct > 75, n)
  }

  test("web-graph analogs have low sequential edge-cut (paper UK: 32%)") {
    for (n <- Seq("UK", "CW"))
      assert(rows.find(_.dataset == n).get.edgeCutPct < 40, n)
  }

  test("every analog is non-trivial (>= 100k edges)") {
    rows.foreach(r => assert(r.nE > 100000, r.dataset))
  }
}
