package repro.core

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.functions._
import repro.graph.GraphOps

/** Query-by-Sketch, end to end: offline index construction (labelling + meta-graph +
  * `Δ` + sparsified graph) and online query answering (sketch + guided search).
  */
object QbS {

  /** The offline-built QbS index.
    *
    * @param labels     cached `(v, lm, dist)` path labelling `L`
    * @param meta       driver-side meta-graph with APSP (§5.2 precomputation)
    * @param delta      cached `(r, rp, src, dst)` landmark-pair SPG segments `Δ`
    * @param gMinusSym  cached symmetric edges of `G⁻ = G[V \ R]`
    * @param edges      cached canonical edges of `G` (landmark-endpoint fallback)
    */
  final case class Index(landmarks: Seq[Long], labels: DataFrame, meta: MetaGraph,
                         delta: DataFrame, gMinusSym: DataFrame, edges: DataFrame,
                         labelEntries: Long, deltaEntries: Long, buildMillis: Double)

  /** Result of one `SPG(u, v)` query: canonical edge set plus diagnostics. */
  final case class Answer(u: Long, v: Long, edges: Set[(Long, Long)],
                          distance: Option[Int], usedReverse: Boolean,
                          usedRecover: Boolean, levels: Int, edgesTraversed: Long,
                          millis: Double)

  /** Build the index.
    *
    * @param numLandmarks `|R|` (paper default 20), picked by descending degree
    * @param parallel     multi-source labelling (QbS-P) vs per-landmark (QbS)
    */
  def build(spark: SparkSession, canonicalEdges: DataFrame, numLandmarks: Int = 20,
            parallel: Boolean = true): Index = {
    val t0 = System.nanoTime()
    val landmarks = GraphOps.topDegreeLandmarks(canonicalEdges, numLandmarks)
    val lab = Labelling.run(spark, canonicalEdges, landmarks, parallel)
    assemble(spark, canonicalEdges, lab, t0)
  }

  /** Assemble the index around an already-computed labelling (lets benches time the
    * labelling phase separately from the shared Δ/sparsify/cache phase).
    */
  def assemble(spark: SparkSession, canonicalEdges: DataFrame,
               lab: Labelling.Result, t0: Long = System.nanoTime()): Index = {
    val landmarks = lab.landmarks
    val meta = new MetaGraph(landmarks, lab.metaEdges)
    val delta = GraphOps.materialize(Labelling.delta(spark, canonicalEdges, lab))
    val gMinusSym = GraphOps.materialize(
      GraphOps.symmetric(GraphOps.sparsify(canonicalEdges, landmarks)))
    val cached = GraphOps.materialize(canonicalEdges)
    Index(landmarks, lab.labels, meta, delta, gMinusSym, cached,
      labelEntries = lab.labels.count(), deltaEntries = delta.count(),
      buildMillis = (System.nanoTime() - t0) / 1e6)
  }

  /** Answer `SPG(u, v)`.
    *
    * Landmark endpoints are not covered by the labelling scheme (Def. 4.2 assigns
    * labels to `V \ R` only); the paper's random query pairs virtually never hit the
    * 20 landmarks, and ours are excluded in benches. For API robustness a landmark
    * endpoint falls back to the ground-truth double-BFS (documented in DESIGN.md).
    */
  def query(index: Index, u: Long, v: Long): Answer = {
    val t0 = System.nanoTime()
    if (u == v)
      return Answer(u, v, Set.empty, Some(0), usedReverse = false,
        usedRecover = false, 0, 0, (System.nanoTime() - t0) / 1e6)
    if (index.landmarks.contains(u) || index.landmarks.contains(v)) {
      val gt = repro.baselines.GroundTruth.spg(index.edges, u, v)
      return Answer(u, v, gt.edges, gt.distance, usedReverse = false,
        usedRecover = true, 0, 0, (System.nanoTime() - t0) / 1e6)
    }
    val lab = index.labels.filter(col("v").isin(u, v))
      .select("v", "lm", "dist").collect()
    val labelsU = lab.filter(_.getLong(0) == u)
      .map(r => r.getLong(1) -> r.getInt(2)).toMap
    val labelsV = lab.filter(_.getLong(0) == v)
      .map(r => r.getLong(1) -> r.getInt(2)).toMap
    val sketch = Sketch.compute(index.meta, u, v, labelsU, labelsV)
    val res = GuidedSearch.run(index.gMinusSym, index.labels, index.delta, sketch)
    Answer(u, v, res.edges, res.distance, res.usedReverse, res.usedRecover,
      res.levels, res.edgesTraversed, (System.nanoTime() - t0) / 1e6)
  }

  /** Figure-8-style pair-coverage class of an answer: do all, some, or none of the
    * shortest paths between the pair go through a landmark? Derived from which
    * guided-search stages contributed edges (Eq. 5).
    */
  def coverage(a: Answer): String = (a.usedReverse, a.usedRecover) match {
    case (false, true) => "all"
    case (true, true)  => "some"
    case _             => "none"
  }

  /** Canonical-edge DataFrame view of an answer (for oracle checks and jobs). */
  def toDf(spark: SparkSession, answer: Answer): DataFrame = {
    import spark.implicits._
    spark.createDataset(answer.edges.toSeq).toDF("src", "dst")
  }
}
