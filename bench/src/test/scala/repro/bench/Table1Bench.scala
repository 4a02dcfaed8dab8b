package repro.bench

import repro.SparkSpec

/** Reproduces the paper's Table 1 over the 12 synthetic analogs and checks its
  * structural invariants (the quantities whose *shape* the analogs must preserve).
  */
class Table1Bench extends SparkSpec {

  private lazy val ms = BenchRun.results

  test("Table 1 renders for all configured datasets") {
    println("\n== Table 1: datasets (paper Table 1) ==")
    println(Experiments.renderTable1(ms))
    assert(ms.size === BenchRun.cfg.maxDatasets)
  }

  test("|V| spans more than an order of magnitude smallest to largest") {
    val vs = ms.map(_.stats.numV)
    assert(vs.max >= 10 * vs.min, s"range too small: ${vs.min}..${vs.max}")
  }

  test("super-hub analogs (YT, WK, TW, CW) have the extreme max degrees") {
    val byAbbrev = ms.map(m => m.spec.abbrev -> m).toMap
    val hubMax = Seq("YT", "WK", "TW", "CW").flatMap(byAbbrev.get).map(_.stats.maxDeg)
    val flatMax = Seq("OR", "FR").flatMap(byAbbrev.get).map(_.stats.maxDeg)
    if (hubMax.nonEmpty && flatMax.nonEmpty)
      assert(hubMax.max > 5 * flatMax.max,
        s"hub analogs should dominate max degree: $hubMax vs $flatMax")
  }

  test("average distances fall in the small-world 2-9 range (paper Fig. 7)") {
    ms.foreach { m =>
      assert(m.stats.avgDist >= 2.0 && m.stats.avgDist <= 9.0,
        s"${m.spec.name}: avgDist=${m.stats.avgDist}")
    }
  }

  test("average degree equals 2|E|/|V|") {
    ms.foreach { m =>
      assert(math.abs(m.stats.avgDeg - 2.0 * m.stats.numE / m.stats.numV) < 1e-6,
        m.spec.name)
    }
  }
}
