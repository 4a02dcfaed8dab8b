package repro.bench

import repro.SparkSpec
import repro.baselines.Ppl
import repro.graph.Generators

/** End-to-end smoke of the measurement harness (the machinery behind the
  * Table-1/2/3 jobs and benches) on the smallest analog at a tiny tier.
  */
class ExperimentsSpec extends SparkSpec {

  private lazy val cfg = Experiments.Config(tier = 0.05, numLandmarks = 5,
    queriesPerGraph = 3, pplBudgetMillis = 60000, pplMaxEntries = 10000000,
    maxDatasets = 1, seed = 7)
  private lazy val m = Experiments.measure(spark, Generators.datasets(cfg.tier).head, cfg)

  test("measure() populates all construction phases") {
    assert(m.qbsPBuildSec > 0 && m.qbsBuildSec > 0)
    assert(m.pplStatus === Ppl.Ok && m.parentStatus === Ppl.Ok)
  }

  test("measure() runs queries for every method") {
    assert(m.qbs.n === 3 && m.bibfs.n === 3)
    assert(m.ppl.exists(_.n === 3) && m.parent.exists(_.n === 3))
    assert(m.qbs.avgMs > 0 && m.bibfs.avgMs > 0)
  }

  test("coverage counts sum to the number of queries") {
    assert(m.coverage.values.sum === 3)
  }

  test("size conventions are the paper's") {
    assert(Experiments.qbsLabelBytes(m) === m.stats.numV.toDouble * 5)
    assert(Experiments.pplBytes(m) === m.pplEntries.toDouble * 5)
    assert(Experiments.parentBytes(m) ===
      m.parentEntries.toDouble * 5 + m.parentRefs.toDouble * 4)
    assert(Experiments.qbsDeltaBytes(m) === m.qbsDeltaEntries.toDouble * 8)
  }

  test("renderers emit one row per measurement plus a header") {
    for (render <- Seq(Experiments.renderTable1 _, Experiments.renderTable2 _,
                       Experiments.renderTable3 _)) {
      assert(render(Seq(m)).linesIterator.size === 2)
    }
  }

  test("statusStr marks failures") {
    assert(Experiments.statusStr(Ppl.Ok, 1.25) === "1.3" ||
           Experiments.statusStr(Ppl.Ok, 1.25) === "1.2")
    assert(Experiments.statusStr(Ppl.Dnf, 9.9) === "DNF")
    assert(Experiments.statusStr(Ppl.Ooe, 9.9) === "OOE")
  }

  test("fromEnv defaults match the calibrated caps") {
    val c = Experiments.fromEnv()
    assert(c.numLandmarks === 20 || sys.env.contains("REPRO_LANDMARKS"))
    assert(c.pplBudgetMillis === 8500L || sys.env.contains("REPRO_PPL_BUDGET_MS"))
    assert(c.pplMaxEntries === 2000000L || sys.env.contains("REPRO_PPL_MAX_ENTRIES"))
  }
}
