package repro.graph

import org.apache.spark.sql.functions._
import repro.{Fixtures, SparkSpec}

/** GraphX multi-source BFS vs the local reference and the DuckDB recursive oracle. */
class BfsSpec extends SparkSpec {

  private lazy val fig4 = Fixtures.fig4Df(spark).cache()

  test("distancesFrom matches LocalGraph BFS on fig4 (sources 6 and 11)") {
    val got = Bfs.distanceMaps(spark, fig4, Seq(6L, 11L))
    val g = Fixtures.fig4Local
    assert(got(6L) === g.bfs(6L))
    assert(got(11L) === g.bfs(11L))
  }

  test("distancesFrom matches the DuckDB recursive-CTE oracle (source 3, fig4)") {
    val d = Bfs.distancesFrom(spark, fig4, Seq(3L))
      .filter(col("src") === 3L).select("v", "dist")
    GraphOracle.assertDistances(fig4, 3L, d)
  }

  test("distancesFrom matches the DuckDB oracle on a random graph") {
    val local = Fixtures.randomLocal(80, 3, 11L)
    val df = GraphOps.fromPairs(spark, local.edges.toSeq)
    val src = local.vertices.head
    val d = Bfs.distancesFrom(spark, df, Seq(src))
      .filter(col("src") === src).select("v", "dist")
    GraphOracle.assertDistances(df, src, d)
  }

  test("multi-source run covers every source") {
    val sources = Seq(1L, 2L, 3L, 7L)
    val got = Bfs.distanceMaps(spark, fig4, sources)
    assert(got.keySet === sources.toSet)
    val g = Fixtures.fig4Local
    for (s <- sources) assert(got(s) === g.bfs(s), s"source $s")
  }

  test("distances on a disconnected graph only cover the component") {
    val df = GraphOps.fromPairs(spark, Seq((1L, 2L), (2L, 3L), (10L, 11L)))
    val got = Bfs.distanceMaps(spark, df, Seq(1L))(1L)
    assert(got === Map(1L -> 0, 2L -> 1, 3L -> 2))
  }
}
