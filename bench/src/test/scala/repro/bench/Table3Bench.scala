package repro.bench

import repro.SparkSpec
import repro.baselines.Ppl

/** Reproduces the paper's Table 3 (labelling sizes) and asserts its shape:
  * QbS labels are far smaller than PPL/ParentPPL labels wherever the latter exist,
  * size(Δ) stays small relative to the graph, and ParentPPL is roughly 2× PPL.
  */
class Table3Bench extends SparkSpec {

  private lazy val ms = BenchRun.results

  test("Table 3 renders") {
    println("\n== Table 3: labelling sizes (paper Table 3) ==")
    println(Experiments.renderTable3(ms))
    assert(ms.nonEmpty)
  }

  test("QbS size(L) is much smaller than PPL labels wherever PPL completed") {
    val comparable = ms.filter(_.pplStatus == Ppl.Ok)
    assert(comparable.nonEmpty)
    comparable.foreach { m =>
      assert(Experiments.qbsLabelBytes(m) < Experiments.pplBytes(m) / 2,
        s"${m.spec.name}: QbS ${Experiments.qbsLabelBytes(m)} vs PPL ${Experiments.pplBytes(m)}")
    }
  }

  test("ParentPPL labels are larger than PPL labels wherever both completed") {
    ms.filter(m => m.pplStatus == Ppl.Ok && m.parentStatus == Ppl.Ok).foreach { m =>
      assert(Experiments.parentBytes(m) > Experiments.pplBytes(m), m.spec.name)
    }
  }

  test("QbS label size stays below the graph size (paper §1: labels smaller than G)") {
    ms.foreach { m =>
      assert(Experiments.qbsLabelBytes(m) <= m.stats.bytes,
        s"${m.spec.name}: labels ${Experiments.qbsLabelBytes(m)} vs |G| ${m.stats.bytes}")
    }
  }

  test("size(Δ) is small relative to size(L) on sparse analogs") {
    // the paper notes Δ can be comparatively large only on the densest graphs
    val sparse = ms.filter(m => m.stats.avgDeg < 10)
    sparse.foreach { m =>
      assert(Experiments.qbsDeltaBytes(m) < 10 * Experiments.qbsLabelBytes(m),
        m.spec.name)
    }
  }

  test("QbS label entries are bounded by |V| * |R|") {
    ms.foreach { m =>
      assert(m.qbsLabelEntries <= m.stats.numV * m.numLandmarks, m.spec.name)
    }
  }
}
