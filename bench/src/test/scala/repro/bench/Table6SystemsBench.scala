package repro.bench

/** Table 6: SOGW vs SGSC vs GraSorw on the synthetic family.
  * Paper shape: GraSorw wins clearly on the sparse/medium graphs for both
  * tasks and on every PRNV workload; on the extremely dense graphs with a
  * light RWNV workload (the top density rungs and the SBM graphs) the
  * baselines catch up or win, because GraSorw's block-sweep cost is fixed
  * while the baselines' vertex I/Os shrink with the walk count.
  */
class Table6SystemsBench extends BenchSpec {
  private lazy val rows = Tables.table6Rows()

  private def wall(d: String, t: String, s: String) =
    rows.find(r => r.dataset == d && r.taskKind == t && r.system == s).get.wallSec

  test("Table 6 renders") {
    printTable("Table 6: wall time of the three systems on synthetic graphs",
               Tables.renderTable6(rows))
    assert(rows.size == 66)
  }

  test("GraSorw wins RWNV on the sparse and medium graphs (paper: 2.7x-6.1x)") {
    for (d <- Seq("CirculantG", "RandomG", "BASF", "RandomG1", "RandomG2", "RandomG3")) {
      assert(wall(d, "RWNV", "GraSorw") < wall(d, "RWNV", "SOGW"), d)
      assert(wall(d, "RWNV", "GraSorw") < wall(d, "RWNV", "SGSC"), d)
    }
  }

  test("GraSorw wins every PRNV workload (paper: 2.4x-8.8x)") {
    for (d <- rows.map(_.dataset).distinct) {
      assert(wall(d, "PRNV", "GraSorw") < wall(d, "PRNV", "SOGW"), d)
      assert(wall(d, "PRNV", "GraSorw") < wall(d, "PRNV", "SGSC"), d)
    }
  }

  test("the dense-graph crossover: GraSorw loses its edge on the densest RWNV workloads") {
    // Paper: on RandomG4/RandomG5/SBM* the baselines win RWNV outright.
    // The lite reproduction must show the *advantage collapsing* on the
    // dense rungs: GraSorw's best-case speedup over SOGW on sparse graphs
    // must exceed its speedup on every dense graph by a wide margin.
    val sparseBest = Seq("CirculantG", "RandomG", "BASF", "RandomG1")
      .map(d => wall(d, "RWNV", "SOGW") / wall(d, "RWNV", "GraSorw")).max
    for (d <- Seq("RandomG4", "RandomG5", "SBM1", "SBM2", "SBM3")) {
      val dense = wall(d, "RWNV", "SOGW") / wall(d, "RWNV", "GraSorw")
      assert(dense < sparseBest / 2, s"$d speedup $dense vs sparse best $sparseBest")
    }
  }

  test("RWNV is heavier than PRNV on every system (workload sanity)") {
    for (d <- rows.map(_.dataset).distinct; s <- Seq("SOGW", "SGSC", "GraSorw"))
      assert(wall(d, "RWNV", s) > wall(d, "PRNV", s), s"$d $s")
  }
}
