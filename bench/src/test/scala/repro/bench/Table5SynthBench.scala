package repro.bench

import repro.graph.Datasets

/** Table 5: statistics of the synthetic graph family (skewness, density
  * ladder, community structure).
  */
class Table5SynthBench extends BenchSpec {
  private lazy val rows = Tables.table5Rows()

  test("Table 5 renders") {
    printTable("Table 5: synthetic graph statistics (lite analogs)", Tables.renderTable5(rows))
    assert(rows.size == 11)
  }

  test("the skewness trio shares vertex and edge scale") {
    val trio = rows.filter(r => Seq("CirculantG", "RandomG", "BASF").contains(r.dataset))
    assert(trio.map(_.nV).distinct.size == 1)
    val es = trio.map(_.nE.toDouble)
    assert(es.max / es.min < 1.3, es.toString)
  }

  test("BASF is the skewed member of the trio (hub degree far above average)") {
    val basf = Datasets.csr(Datasets.basf)
    val maxDeg = (0 until basf.nV).map(basf.degree).max
    assert(maxDeg > 8 * basf.avgDegree, s"max $maxDeg avg ${basf.avgDegree}")
    val circ = Datasets.csr(Datasets.circulantG)
    assert((0 until circ.nV).map(circ.degree).max == circ.avgDegree.round)
  }

  test("the density ladder increases in density from RandomG1 to RandomG5") {
    val ladder = Seq("RandomG1", "RandomG2", "RandomG3", "RandomG4", "RandomG5")
      .map(n => rows.find(_.dataset == n).get)
    val density = ladder.map(r => r.avgDeg / (r.nV - 1))
    assert(density == density.sorted, density.toString)
    assert(density.last > 0.99) // RandomG5 is complete, as in the paper
  }

  test("SBM community mass shifts outward from SBM1 to SBM3") {
    val cuts = Seq(Datasets.sbm1, Datasets.sbm2, Datasets.sbm3)
      .map(sp => Datasets.blocked(sp, "seq").edgeCut)
    assert(cuts == cuts.sorted, cuts.toString) // pOut 0.3 -> 0.6 -> 0.9
  }
}
