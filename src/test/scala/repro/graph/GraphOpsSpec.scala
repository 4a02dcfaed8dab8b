package repro.graph

import org.apache.spark.sql.functions._
import repro.{Fixtures, Oracle, SparkSpec}

/** DataFrame graph operations, cross-checked against DuckDB where SQL-expressible. */
class GraphOpsSpec extends SparkSpec {

  private lazy val fig3 = Fixtures.fig3Df(spark).cache()

  test("canonical drops loops, dups and orders endpoints") {
    val raw = spark.createDataFrame(Seq((2L, 1L), (1L, 2L), (3L, 3L), (1L, 3L)))
      .toDF("src", "dst")
    val got = GraphOps.canonical(raw).collect().map(r => (r.getLong(0), r.getLong(1))).toSet
    assert(got === Set((1L, 2L), (1L, 3L)))
  }

  test("symmetric doubles the canonical edge count") {
    assert(GraphOps.symmetric(fig3).count() === 2 * fig3.count())
  }

  test("vertices lists each endpoint once") {
    val vs = GraphOps.vertices(fig3).collect().map(_.getLong(0)).toSet
    assert(vs === (1L to 7L).toSet)
  }

  test("degrees match DuckDB (oracle)") {
    Oracle.assertEquivalent(
      GraphOps.degrees(fig3).select(col("v").cast("long") as "v",
        col("degree").cast("long") as "degree"),
      "SELECT CAST(src AS BIGINT) AS v, COUNT(*) AS degree FROM edges GROUP BY 1",
      "edges" -> GraphOps.symmetric(fig3))
  }

  test("degrees match the local graph") {
    val got = GraphOps.degrees(fig3).collect()
      .map(r => r.getLong(0) -> r.getLong(1).toInt).toMap
    val g = Fixtures.fig3Local
    assert(got === g.vertices.map(v => v -> g.degree(v)).toMap)
  }

  test("topDegreeLandmarks picks highest degree first, ties by id") {
    // fig3 degrees: 2->4, 5->3, 1,3,4,6->2, 7->1
    assert(GraphOps.topDegreeLandmarks(fig3, 3) === Seq(2L, 5L, 1L))
  }

  test("sparsify removes all edges incident to landmarks") {
    val sp = GraphOps.sparsify(fig3, Seq(2L)).collect()
      .map(r => (r.getLong(0), r.getLong(1))).toSet
    assert(sp === Set((1L, 3L), (3L, 4L), (5L, 6L), (5L, 7L)))
  }

  test("toLocal round-trips the edge set") {
    assert(GraphOps.toLocal(fig3).edges.toSet === Fixtures.fig3Edges.toSet)
  }

  test("fromPairs canonicalizes arbitrary pair input") {
    val df = GraphOps.fromPairs(spark, Seq((5L, 2L), (2L, 5L), (1L, 1L)))
    assert(df.collect().map(r => (r.getLong(0), r.getLong(1))).toSeq === Seq((2L, 5L)))
  }

  test("materialize caches and returns the same rows") {
    val m = GraphOps.materialize(fig3)
    assert(m.count() === 8)
  }
}
