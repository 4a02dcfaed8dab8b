package repro.baselines

import repro.{Fixtures, SparkSpec}
import repro.graph.{GraphOps, GraphOracle}

/** The in-Spark reference SPG vs the local reference and the DuckDB oracle. */
class GroundTruthSpec extends SparkSpec {

  private lazy val fig3 = Fixtures.fig3Df(spark).cache()
  private lazy val fig4 = Fixtures.fig4Df(spark).cache()

  test("fig3: SPG(3,7) equals the paper's answer") {
    val r = GroundTruth.spg(fig3, 3L, 7L)
    assert(r.edges === Fixtures.fig3Spg37)
    assert(r.distance === Some(4))
  }

  test("fig4: SPG(6,11) equals Figure 6(f)") {
    val r = GroundTruth.spg(fig4, 6L, 11L)
    assert(r.edges === Fixtures.fig4Spg611)
    assert(r.distance === Some(5))
  }

  test("fig4: SPG(6,11) matches the DuckDB recursive oracle") {
    val r = GroundTruth.spg(fig4, 6L, 11L)
    GraphOracle.assertSpg(fig4, 6L, 11L,
      GraphOps.fromPairs(spark, r.edges.toSeq))
  }

  test("adjacent pair returns the single edge") {
    val r = GroundTruth.spg(fig3, 5L, 7L)
    assert(r.edges === Set((5L, 7L)))
    assert(r.distance === Some(1))
  }

  test("same vertex returns empty with distance 0") {
    val r = GroundTruth.spg(fig3, 4L, 4L)
    assert(r.edges.isEmpty && r.distance === Some(0))
  }

  test("disconnected pair returns empty with no distance") {
    val df = GraphOps.fromPairs(spark, Seq((1L, 2L), (3L, 4L)))
    val r = GroundTruth.spg(df, 1L, 4L)
    assert(r.edges.isEmpty && r.distance === None)
  }

  for (seed <- 1L to 3L) {
    test(s"random graph seed=$seed: GroundTruth equals the local reference") {
      val local = Fixtures.randomLocal(70, 3, seed)
      val df = GraphOps.fromPairs(spark, local.edges.toSeq).cache()
      val rnd = new scala.util.Random(seed)
      val vs = local.vertices
      for (_ <- 1 to 3) {
        val u = vs(rnd.nextInt(vs.length)); val v = vs(rnd.nextInt(vs.length))
        val r = GroundTruth.spg(df, u, v)
        assert(r.edges === local.spg(u, v), s"pair ($u,$v)")
      }
      df.unpersist()
    }
  }

  test("random graph: GroundTruth matches the DuckDB oracle") {
    val local = Fixtures.randomLocal(60, 2, 5L)
    val df = GraphOps.fromPairs(spark, local.edges.toSeq)
    val vs = local.vertices
    val (u, v) = (vs(3), vs(vs.length - 2))
    val r = GroundTruth.spg(df, u, v)
    GraphOracle.assertSpg(df, u, v, GraphOps.fromPairs(spark, r.edges.toSeq))
  }
}
