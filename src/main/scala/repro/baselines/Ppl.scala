package repro.baselines

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.functions.col
import repro.graph.LocalGraph
import scala.collection.mutable

/** Pruned Path Labelling (paper §3.2, Algorithm 1) and its parent-augmented variant
  * ParentPPL.
  *
  * Construction is driver-local: each pruned BFS consumes every label written by all
  * previous BFSs, so the |V| BFSs are inherently sequential — exactly like the
  * paper's in-memory implementation (see DESIGN.md §3.4). The paper's ">24h" DNF and
  * "512 GB" OOE limits are scaled down to a wall-clock budget and a label-entry
  * budget; exceeding them yields status Dnf/Ooe with no usable index, reproducing
  * Table 2/3's failure pattern.
  *
  * SOUNDNESS NOTE (found by this reproduction's tests): Algorithm 1 as written does
  * NOT guarantee the 2-hop path cover it targets. In the `d_L = depth` case the label
  * is stored but traversal stops, so vertices beyond the stopped frontier never
  * receive the root's label; a shortest path between such a vertex and a far endpoint
  * can end up with NO internal vertex common to both labels (concrete counterexample
  * in `PplSpec`). Consequently PPL/ParentPPL answers are sound (every returned edge
  * is on a shortest path, the distance is exact — 2-hop DISTANCE cover does hold, and
  * at least one full shortest path is always returned) but can be incomplete. We keep
  * the algorithm faithful to the paper and assert exactly that contract in tests; QbS
  * remains the exact method, which only sharpens the paper's point.
  *
  * Queries run level-batched over a pluggable label fetcher so the same engine can be
  * timed against driver-local maps (tests) or a label DataFrame (benches, sharing the
  * online substrate with QbS).
  */
object Ppl {

  sealed trait Status
  case object Ok  extends Status
  case object Dnf extends Status // exceeded the (scaled) time budget
  case object Ooe extends Status // exceeded the (scaled) label-entry budget

  /** One label entry of vertex `v`: landmark rank, `d_G(v, landmark)`, and (ParentPPL
    * only) all neighbours of `v` one step closer to the landmark.
    */
  final case class Entry(lmRank: Int, dist: Int, parents: Array[Long])

  /** @param order       rank -> vertex id (descending degree, the landmark order)
    * @param labels      vertex id -> entries sorted by `lmRank`
    * @param entries     total number of label entries
    * @param parentRefs  total number of stored parent references (ParentPPL)
    * @param edgeScans   construction work: edges relaxed across all BFSs
    */
  final case class Index(order: Array[Long], labels: Map[Long, Array[Entry]],
                         entries: Long, parentRefs: Long, edgeScans: Long,
                         buildMillis: Double, status: Status) {
    def vertexOf(rank: Int): Long = order(rank)
  }

  /** Distance query over two sorted entry sequences (2-hop lookup). */
  private def distOf(a: collection.IndexedSeq[Entry], b: collection.IndexedSeq[Entry]): Int = {
    var i = 0; var j = 0; var best = Int.MaxValue / 4
    while (i < a.length && j < b.length) {
      if (a(i).lmRank == b(j).lmRank) {
        val s = a(i).dist + b(j).dist
        if (s < best) best = s
        i += 1; j += 1
      } else if (a(i).lmRank < b(j).lmRank) i += 1
      else j += 1
    }
    best
  }

  /** Build PPL (`withParents = false`, Algorithm 1 verbatim) or ParentPPL
    * (`withParents = true`: the same pruned BFS, additionally storing with each label
    * every visited parent — neighbours one level closer to the root. The extra
    * adjacency scan per stored label is why the paper finds ParentPPL slower, and the
    * parent references roughly double the labelling size, matching Table 3).
    */
  def build(g: LocalGraph, withParents: Boolean,
            budgetMillis: Long = Long.MaxValue,
            maxEntries: Long = Long.MaxValue,
            orderOverride: Option[Array[Long]] = None): Index = {
    val t0 = System.nanoTime()
    def elapsed: Double = (System.nanoTime() - t0) / 1e6

    val order = orderOverride.getOrElse(g.vertices.sortBy(v => (-g.degree(v), v)))
    val n = order.length
    val rankOf = order.zipWithIndex.toMap
    val adjR: Array[Array[Int]] =
      order.map(v => g.neighbors(v).map(rankOf)) // rank-space adjacency
    val labels = Array.fill(n)(mutable.ArrayBuffer.empty[Entry])
    var entries = 0L; var parentRefs = 0L; var edgeScans = 0L
    val depth = Array.fill(n)(-1)
    val touched = mutable.ArrayBuffer.empty[Int]

    def finish(status: Status): Index = {
      val lm = if (status == Ok)
        order.zipWithIndex.map { case (v, r) => v -> labels(r).toArray }.toMap
      else Map.empty[Long, Array[Entry]]
      Index(order, lm, entries, parentRefs, edgeScans, elapsed, status)
    }

    var k = 0
    while (k < n) {
      if (elapsed > budgetMillis) return finish(Dnf)
      if (entries + parentRefs > maxEntries) return finish(Ooe)
      touched.clear()
      val queue = mutable.ArrayDeque[Int](k)
      depth(k) = 0; touched += k
      val lk = labels(k)
      // Algorithm 1: prune both storage (q < depth) and traversal (q <= depth) at
      // dequeue time. ParentPPL additionally scans the adjacency of each stored
      // vertex for visited parents (neighbours one BFS level closer to the root) —
      // level order guarantees all ever-visited parents are already enqueued.
      while (queue.nonEmpty) {
        val u = queue.removeHead()
        val q = distOf(lk, labels(u))
        if (q >= depth(u)) {
          val parents =
            if (!withParents || u == k) Array.empty[Long]
            else {
              edgeScans += adjR(u).length
              adjR(u).iterator.filter(w => depth(w) == depth(u) - 1)
                .map(order(_)).toArray
            }
          labels(u) += Entry(k, depth(u), parents)
          entries += 1; parentRefs += parents.length
          if (q > depth(u)) {
            edgeScans += adjR(u).length
            for (w <- adjR(u)) if (depth(w) == -1) {
              depth(w) = depth(u) + 1; touched += w; queue += w
            }
          }
        }
      }
      touched.foreach(depth(_) = -1)
      k += 1
    }
    finish(Ok)
  }

  // ------------------------------------------------------------------ queries ----

  /** Batch label fetcher: vertex ids -> (landmark VERTEX id -> (dist, parents)). */
  type Fetch = Set[Long] => Map[Long, Map[Long, (Int, Array[Long])]]

  /** Fetcher over the driver-local index (tests). */
  def localFetcher(index: Index): Fetch = vs =>
    vs.iterator.map { v =>
      v -> index.labels.getOrElse(v, Array.empty[Entry])
        .map(e => index.vertexOf(e.lmRank) -> (e.dist, e.parents)).toMap
    }.toMap

  /** Label DataFrame `(v, lm, dist, parents)` for the bench-substrate fetcher. */
  def toLabelsDf(spark: SparkSession, index: Index): DataFrame = {
    import spark.implicits._
    val rows = index.labels.iterator.flatMap { case (v, es) =>
      es.iterator.map(e => (v, index.vertexOf(e.lmRank), e.dist, e.parents.toSeq))
    }.toSeq
    spark.createDataset(rows).toDF("v", "lm", "dist", "parents")
  }

  /** Fetcher over a cached label DataFrame (one filter+collect per query round). */
  def dfFetcher(labelsDf: DataFrame): Fetch = vs => {
    if (vs.isEmpty) Map.empty
    else labelsDf.filter(col("v").isin(vs.toSeq: _*)).collect()
      .groupBy(_.getLong(0))
      .map { case (v, rows) =>
        v -> rows.map { r =>
          r.getLong(1) -> (r.getInt(2), r.getSeq[Long](3).toArray)
        }.toMap
      }
  }

  final case class QueryResult(edges: Set[(Long, Long)], distance: Option[Int],
                               rounds: Int, entriesFetched: Long, millis: Double)

  /** Level-batched recursive SPG query (paper §3.2).
    *
    * Each round fetches labels for all pending pairs at once, computes per-pair
    * distances and either emits an edge (`d = 1`), walks parent sets one step
    * (ParentPPL fast path), or splits via the common landmarks `V_xy` (PPL).
    */
  def spgQuery(fetch: Fetch, u: Long, v: Long, withParents: Boolean): QueryResult = {
    val t0 = System.nanoTime()
    val INF = Int.MaxValue / 4
    val edges = mutable.Set.empty[(Long, Long)]
    val memo = mutable.Set.empty[(Long, Long)]
    def canon(a: Long, b: Long): (Long, Long) = (math.min(a, b), math.max(a, b))
    var pending = Set(canon(u, v))
    memo += canon(u, v)
    var rounds = 0
    var fetched = 0L
    var topDistance: Option[Int] = None

    while (pending.nonEmpty) {
      rounds += 1
      val verts = pending.flatMap(p => Set(p._1, p._2))
      val lab = fetch(verts)
      fetched += lab.valuesIterator.map(_.size.toLong).sum
      val next = mutable.Set.empty[(Long, Long)]
      for ((x, y) <- pending) {
        val lx = lab.getOrElse(x, Map.empty)
        val ly = lab.getOrElse(y, Map.empty)
        val common = lx.keySet.intersect(ly.keySet)
        val d = if (common.isEmpty) INF
                else common.iterator.map(r => lx(r)._1 + ly(r)._1).min
        if (rounds == 1) topDistance = if (d >= INF) None else Some(d)
        if (d < INF && d > 0) {
          if (d == 1) edges += canon(x, y)
          else if (withParents && ly.contains(x)) {
            // x is a landmark stored in y's label: walk y's parents toward x
            val (_, parents) = ly(x)
            for (w <- parents) {
              edges += canon(y, w)
              if (d == 2) edges += canon(w, x)
              else if (memo.add(canon(w, x))) next += canon(w, x)
            }
          } else if (withParents && lx.contains(y)) {
            val (_, parents) = lx(y)
            for (w <- parents) {
              edges += canon(x, w)
              if (d == 2) edges += canon(w, y)
              else if (memo.add(canon(w, y))) next += canon(w, y)
            }
          } else {
            val splits = common.filter(r => r != x && r != y &&
              lx(r)._1 + ly(r)._1 == d)
            // splits can be empty when the only covering landmark is an endpoint
            // itself and no parent info is stored — part of the documented
            // incompleteness of Algorithm 1 (see the class doc).
            for (r <- splits) {
              if (memo.add(canon(x, r))) next += canon(x, r)
              if (memo.add(canon(r, y))) next += canon(r, y)
            }
          }
        }
      }
      pending = next.toSet
    }
    QueryResult(edges.toSet, topDistance, rounds, fetched,
      (System.nanoTime() - t0) / 1e6)
  }
}
