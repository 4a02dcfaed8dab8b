package repro.core

import org.apache.spark.graphx.{EdgeDirection, EdgeTriplet, Graph => XGraph, Pregel, VertexId}
import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.functions._
import repro.graph.{Bfs, GraphOps}

/** Offline phase of QbS: Algorithm 2 of the paper as a GraphX Pregel computation.
  *
  * Algorithm 2's two queues (`Q_L` = reached via a landmark-free path, `Q_N` = reached
  * only through landmarks) reduce to one per-level rule: a vertex newly reached at
  * level `n+1` of the BFS from landmark `r` carries flag `anyL = true` iff at least one
  * of its level-`n` predecessors was in `Q_L` (the root counts; other landmarks never
  * propagate the flag). Non-landmarks with `anyL` get label `(r, n+1)`; landmarks with
  * `anyL` yield meta-graph edge `(r, v)` with weight `n+1`.
  *
  * The labelling scheme is deterministic w.r.t. `(G, R)` (paper Lemma 5.2), so the
  * per-landmark BFSs can be fused into one multi-source Pregel run — the Spark analog
  * of the paper's thread-parallel QbS-P. `parallel = false` runs one Pregel per
  * landmark instead, mirroring sequential QbS for the Table-2 comparison.
  */
object Labelling {

  /** Per-vertex Pregel state.
    *
    * @param isLm    vertex is a landmark
    * @param reached landmark -> (BFS depth, anyL flag) for landmarks whose BFS has
    *                reached this vertex
    * @param fresh   the subset of `reached` added in the latest superstep (drives
    *                message sending)
    */
  private final case class LState(isLm: Boolean,
                                  reached: Map[Long, (Int, Boolean)],
                                  fresh: Map[Long, (Int, Boolean)])

  private type Msg = Map[Long, (Int, Boolean)]

  /** Result of the labelling phase.
    *
    * @param labels    DataFrame `(v, lm, dist)` — the path labelling `L` (Def. 4.2)
    * @param metaEdges canonical `(r, r', σ)` rows of the meta-graph (Def. 4.1)
    */
  final case class Result(landmarks: Seq[Long], labels: DataFrame,
                          metaEdges: Seq[(Long, Long, Int)])

  /** Run the labelling BFSs from `sources` (a subset of `landmarks`) on one Pregel. */
  private def pregelFrom(graph: XGraph[Boolean, Int], landmarkSet: Set[Long],
                         sources: Set[Long], maxIters: Int): XGraph[LState, Int] = {
    val init = graph.mapVertices { (id, isLm) =>
      val self: Map[Long, (Int, Boolean)] =
        if (sources.contains(id)) Map(id -> (0, true)) else Map.empty
      LState(isLm, self, self)
    }

    def vprog(id: VertexId, st: LState, msg: Msg): LState =
      if (msg.isEmpty) st // only the initial message is empty; keep initial `fresh`
      else {
        // Store the received anyL as-is: for landmarks it marks a meta edge, for
        // non-landmarks a label. Landmark-ness only gates propagation (sendMsg).
        val added = msg.filter { case (lm, _) => !st.reached.contains(lm) }
        LState(st.isLm, st.reached ++ added, added)
      }

    def sendMsg(t: EdgeTriplet[LState, Int]): Iterator[(VertexId, Msg)] = {
      val src = t.srcAttr
      if (src.fresh.isEmpty) Iterator.empty
      else {
        val out: Msg = src.fresh.collect {
          case (lm, (d, flag)) if !t.dstAttr.reached.contains(lm) =>
            // Landmarks are Q_N (never propagate the flag) except the BFS root itself.
            lm -> (d + 1, flag && (!src.isLm || lm == t.srcId))
        }
        if (out.isEmpty) Iterator.empty else Iterator((t.dstId, out))
      }
    }

    def mergeMsg(a: Msg, b: Msg): Msg =
      (a.keySet ++ b.keySet).iterator.map { lm =>
        (a.get(lm), b.get(lm)) match {
          case (Some((d1, f1)), Some((d2, f2))) => lm -> (math.min(d1, d2), f1 || f2)
          case (Some(x), None)                  => lm -> x
          case (None, Some(y))                  => lm -> y
          case _ => throw new IllegalStateException("unreachable")
        }
      }.toMap

    Pregel(init, Map.empty: Msg, maxIterations = maxIters,
      activeDirection = EdgeDirection.Out)(vprog, sendMsg, mergeMsg)
  }

  /** Extract labels and meta edges from a finished Pregel graph. */
  private def extract(spark: SparkSession, g: XGraph[LState, Int]): Result = {
    import spark.implicits._
    val verts = g.vertices.cache()
    val labels = verts.flatMap { case (v, st) =>
      if (st.isLm) Iterator.empty
      else st.reached.iterator.collect { case (lm, (d, true)) => (v, lm, d) }
    }.toDF("v", "lm", "dist")
    val metaEdges = verts.flatMap { case (v, st) =>
      if (!st.isLm) Iterator.empty
      else st.reached.iterator.collect {
        case (lm, (d, true)) if lm != v => (math.min(lm, v), math.max(lm, v), d)
      }
    }.distinct().collect().toSeq.sortBy(e => (e._1, e._2))
    val out = Result(Seq.empty, GraphOps.materialize(labels), metaEdges)
    verts.unpersist(blocking = false)
    g.unpersistVertices(blocking = false)
    g.edges.unpersist(blocking = false)
    out
  }

  /** Construct the labelling scheme.
    *
    * @param parallel true: one multi-source Pregel (QbS-P); false: one Pregel per
    *                 landmark, results unioned (sequential QbS). Identical output
    *                 either way (Lemma 5.2).
    */
  def run(spark: SparkSession, canonicalEdges: DataFrame, landmarks: Seq[Long],
          parallel: Boolean = true, maxIters: Int = 200): Result = {
    val lmSet = landmarks.toSet
    val base = Bfs.toGraphX(spark, canonicalEdges).mapVertices((id, _) => lmSet.contains(id))
    base.cache()
    val res =
      if (parallel) extract(spark, pregelFrom(base, lmSet, lmSet, maxIters))
      else {
        val parts = landmarks.map { r =>
          extract(spark, pregelFrom(base, lmSet, Set(r), maxIters))
        }
        val labels = GraphOps.materialize(
          parts.map(_.labels).reduce(_ unionByName _))
        parts.foreach(_.labels.unpersist(blocking = false))
        Result(Seq.empty, labels,
          parts.flatMap(_.metaEdges).distinct.sortBy(e => (e._1, e._2)))
      }
    base.unpersist(blocking = false)
    res.copy(landmarks = landmarks)
  }

  /** Precompute `Δ`: for every meta-edge `(r, r', σ)`, the shortest path graph of the
    * landmark-free shortest `r`–`r'` paths in `G`.
    *
    * Edge `(a, b)` (oriented `a` closer to `r`) lies on such a path iff
    * `δ_L(a, r) + 1 + δ_L(b, r') = σ`, with `δ_L(x, s) = 0` when `x = s` and the label
    * distance otherwise (other landmarks have no labels, so they are excluded
    * automatically). One three-way DataFrame join computes all pairs at once.
    *
    * @return DataFrame `(r, rp, src, dst)` with `r < rp` and `src < dst`.
    */
  def delta(spark: SparkSession, canonicalEdges: DataFrame, lab: Result): DataFrame = {
    import spark.implicits._
    val labelOrSelf = lab.labels.select($"v", $"lm", $"dist")
      .unionByName(lab.landmarks.map(r => (r, r, 0)).toDF("v", "lm", "dist"))
    val metaDf = lab.metaEdges
      .flatMap { case (r, rp, s) => Seq((r, rp, s), (rp, r, s)) }
      .toDF("mr", "mrp", "sigma")
    val sym = GraphOps.symmetric(canonicalEdges)
    val la = labelOrSelf.select($"v" as "av", $"lm" as "alm", $"dist" as "adist")
    val lb = labelOrSelf.select($"v" as "bv", $"lm" as "blm", $"dist" as "bdist")
    sym
      .join(la, col("src") === col("av"))
      .join(lb, col("dst") === col("bv"))
      .join(metaDf, col("alm") === col("mr") && col("blm") === col("mrp"))
      .filter(col("adist") + 1 + col("bdist") === col("sigma"))
      .select(
        least(col("mr"), col("mrp")) as "r",
        greatest(col("mr"), col("mrp")) as "rp",
        least(col("src"), col("dst")) as "src",
        greatest(col("src"), col("dst")) as "dst")
      .distinct()
  }
}
