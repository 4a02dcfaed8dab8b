package repro.graph

import org.apache.spark.graphx.{Edge, Graph => XGraph}
import org.apache.spark.graphx.lib.ShortestPaths
import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.storage.StorageLevel

/** Multi-source BFS distances on an undirected graph via GraphX Pregel.
  *
  * Wraps `graphx.lib.ShortestPaths` (a Pregel computation) over a symmetrized edge
  * RDD so distances are undirected. Used for Table-1 statistics and for the
  * ground-truth shortest-path-graph reference.
  */
object Bfs {

  /** Build an (unattributed) GraphX graph with both edge orientations. */
  def toGraphX(spark: SparkSession, canonicalEdges: DataFrame): XGraph[Int, Int] = {
    val edgeRdd = canonicalEdges.rdd.flatMap { r =>
      val (a, b) = (r.getLong(0), r.getLong(1))
      Iterator(Edge(a, b, 1), Edge(b, a, 1))
    }
    XGraph.fromEdges(edgeRdd, defaultValue = 0,
      edgeStorageLevel = StorageLevel.MEMORY_AND_DISK,
      vertexStorageLevel = StorageLevel.MEMORY_AND_DISK)
  }

  /** BFS distances from every vertex in `sources`.
    *
    * @return DataFrame `(v, src, dist)` — one row per (reachable vertex, source).
    */
  def distancesFrom(spark: SparkSession, canonicalEdges: DataFrame,
                    sources: Seq[Long]): DataFrame = {
    import spark.implicits._
    val g = toGraphX(spark, canonicalEdges)
    val res = ShortestPaths.run(g, sources)
    val out = res.vertices
      .flatMap { case (v, spmap) => spmap.iterator.map { case (s, d) => (v, s, d) } }
      .toDF("v", "src", "dist")
    out
  }

  /** Driver-side map variant of [[distancesFrom]]: `source -> (v -> dist)`. */
  def distanceMaps(spark: SparkSession, canonicalEdges: DataFrame,
                   sources: Seq[Long]): Map[Long, Map[Long, Int]] =
    distancesFrom(spark, canonicalEdges, sources)
      .collect()
      .groupBy(_.getLong(1))
      .map { case (s, rows) => s -> rows.map(r => r.getLong(0) -> r.getInt(2)).toMap }
}
