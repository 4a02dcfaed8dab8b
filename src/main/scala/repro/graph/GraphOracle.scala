package repro.graph

import org.apache.spark.sql.DataFrame
import org.apache.spark.sql.functions._
import repro.Oracle

/** DuckDB correctness oracle for graph queries.
  *
  * Distances and shortest-path graphs are expressed as recursive CTEs (level-
  * synchronous BFS: `UNION` dedupes `(vertex, depth)` rows, so the recursion is
  * polynomial) and checked against Spark results with [[repro.Oracle]].
  *
  * The `edges` table registered with DuckDB must be SYMMETRIC (both orientations);
  * pass a canonical edge DataFrame and this module symmetrizes it.
  */
object GraphOracle {

  private def bfsCte(name: String, source: Long, cap: Int): String =
    s"""$name(v, d) AS (
       |  SELECT CAST($source AS BIGINT), 0
       |  UNION
       |  SELECT CAST(e.dst AS BIGINT), $name.d + 1
       |  FROM $name JOIN edges e ON CAST(e.src AS BIGINT) = $name.v
       |  WHERE $name.d < $cap
       |)""".stripMargin

  /** Assert that `sparkDists` (columns `v`, `dist`) equals DuckDB BFS distances from
    * `source`, restricted to vertices within `cap` hops.
    */
  def assertDistances(canonicalEdges: DataFrame, source: Long,
                      sparkDists: DataFrame, cap: Int = 20): Unit = {
    val sql =
      s"""WITH RECURSIVE
         |${bfsCte("bfs", source, cap)}
         |SELECT v AS v, MIN(d) AS dist FROM bfs GROUP BY v""".stripMargin
    Oracle.assertEquivalent(
      sparkDists.select(col("v").cast("long") as "v", col("dist").cast("int") as "dist"),
      sql,
      "edges" -> GraphOps.symmetric(canonicalEdges))
  }

  /** Assert that `sparkSpg` (canonical edge columns `src`, `dst`) is exactly the
    * shortest path graph between `u` and `v` per DuckDB BFS.
    */
  def assertSpg(canonicalEdges: DataFrame, u: Long, v: Long,
                sparkSpg: DataFrame, cap: Int = 20): Unit = {
    val sql =
      s"""WITH RECURSIVE
         |${bfsCte("du", u, cap)},
         |${bfsCte("dv", v, cap)},
         |mu AS (SELECT v, MIN(d) AS d FROM du GROUP BY v),
         |mv AS (SELECT v, MIN(d) AS d FROM dv GROUP BY v),
         |duv AS (SELECT d FROM mu WHERE v = CAST($v AS BIGINT))
         |SELECT DISTINCT
         |  LEAST(CAST(e.src AS BIGINT), CAST(e.dst AS BIGINT)) AS src,
         |  GREATEST(CAST(e.src AS BIGINT), CAST(e.dst AS BIGINT)) AS dst
         |FROM edges e
         |JOIN mu ON mu.v = CAST(e.src AS BIGINT)
         |JOIN mv ON mv.v = CAST(e.dst AS BIGINT)
         |JOIN duv ON TRUE
         |WHERE mu.d + 1 + mv.d = duv.d""".stripMargin
    Oracle.assertEquivalent(
      sparkSpg.select(
        least(col("src"), col("dst")).cast("long") as "src",
        greatest(col("src"), col("dst")).cast("long") as "dst").distinct(),
      sql,
      "edges" -> GraphOps.symmetric(canonicalEdges))
  }
}
