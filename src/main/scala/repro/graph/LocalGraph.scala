package repro.graph

import scala.collection.mutable

/** Driver-side adjacency view of an undirected graph.
  *
  * Used where the algorithm is inherently sequential (PPL's one-pruned-BFS-at-a-time
  * construction), for brute-force reference computations in tests, and for the
  * sampled average-distance statistic in Table 1.
  */
final case class LocalGraph(edges: Array[(Long, Long)]) {

  /** Adjacency lists keyed by vertex id; every edge appears in both lists. */
  val adj: Map[Long, Array[Long]] = {
    val m = mutable.HashMap.empty[Long, mutable.ArrayBuffer[Long]]
    edges.foreach { case (a, b) =>
      m.getOrElseUpdate(a, mutable.ArrayBuffer.empty) += b
      m.getOrElseUpdate(b, mutable.ArrayBuffer.empty) += a
    }
    m.view.mapValues(_.toArray.sorted).toMap
  }

  val vertices: Array[Long] = adj.keys.toArray.sorted
  def numVertices: Int = vertices.length
  def numEdges: Int = edges.length
  def degree(v: Long): Int = adj.getOrElse(v, Array.empty).length
  def neighbors(v: Long): Array[Long] = adj.getOrElse(v, Array.empty)

  /** Single-source BFS distances; unreachable vertices are absent from the map. */
  def bfs(source: Long): Map[Long, Int] = bfsAvoiding(source, Set.empty)

  /** BFS distances from `source` on `G[V \ avoid]` (`source` itself is never avoided).
    * Used by tests as the brute-force reference for sparsified-graph searches.
    */
  def bfsAvoiding(source: Long, avoid: Set[Long]): Map[Long, Int] = {
    val dist = mutable.HashMap[Long, Int](source -> 0)
    var frontier = List(source)
    var d = 0
    while (frontier.nonEmpty) {
      d += 1
      frontier = for {
        u <- frontier
        v <- neighbors(u).toList
        if !avoid.contains(v) && !dist.contains(v)
      } yield { dist(v) = d; v }
    }
    dist.toMap
  }

  def distance(u: Long, v: Long): Option[Int] = bfs(u).get(v)

  def connected: Boolean =
    vertices.isEmpty || bfs(vertices.head).size == numVertices

  /** Reference shortest path graph: canonical edges `(a,b)` with
    * `d(u,a) + 1 + d(b,v) = d(u,v)` in either orientation.
    */
  def spg(u: Long, v: Long): Set[(Long, Long)] = {
    val du = bfs(u)
    if (!du.contains(v)) return Set.empty
    val dv = bfs(v)
    val d = du(v)
    edges.iterator.filter { case (a, b) =>
      (du.get(a), dv.get(b), du.get(b), dv.get(a)) match {
        case (da, db, da2, db2) =>
          da.zip(db).exists { case (x, y) => x + 1 + y == d } ||
          da2.zip(db2).exists { case (x, y) => x + 1 + y == d }
      }
    }.toSet
  }

  /** Brute-force check of Definition 4.2: does a shortest `u`–`r` path exist whose only
    * landmark is `r`? (Used to verify the labelling scheme in tests.)
    */
  def landmarkFreeDistance(u: Long, r: Long, landmarks: Set[Long]): Option[Int] = {
    val d = distance(u, r)
    d.flatMap { duv =>
      // BFS from u avoiding landmarks except r; a path of the same length must exist.
      val avoided = bfsAvoiding(u, landmarks - r - u)
      avoided.get(r).filter(_ == duv)
    }
  }
}
