package repro.graph

import org.apache.spark.sql.{DataFrame, SparkSession}
import scala.collection.mutable
import scala.util.Random

/** Synthetic graph generators standing in for the paper's 12 real datasets.
  *
  * All generators are attachment models: vertex `i` (in insertion order) connects
  * to `k` previously inserted vertices, with the target drawn
  *   - proportional to current degree      (`powerLaw`  — BA-style hubs),
  *   - uniformly                           (`uniform`   — even degrees), or
  *   - mostly from a tiny super-hub pool   (`superHub`  — web/communication tails).
  * Each spec additionally has a `locality` share: that fraction of attachments go to
  * a recently inserted vertex, which stretches the average distance to the paper's
  * Table-1 values (complex networks are small-world but not 2-hop worlds).
  *
  * Every generated graph is connected by construction (each new vertex attaches to at
  * least one existing vertex) and deterministic in `(params, seed)` so the DuckDB
  * oracle and repeated bench runs see identical input.
  *
  * Edges are returned undirected-canonical: one row per edge with `src < dst`.
  */
object Generators {

  /** Structural class of a generated graph. */
  sealed trait Kind
  case object PowerLaw extends Kind
  case object Uniform  extends Kind
  /** `hubs` super-hubs absorb `hubBias` of the attachment mass. */
  final case class SuperHub(hubs: Int, hubBias: Double) extends Kind

  /** A named synthetic analog of one of the paper's Table-1 datasets.
    *
    * @param locality fraction of attachments drawn from the `window` most recent
    *                 vertices (raises the diameter); the rest follow `kind`.
    */
  final case class Spec(name: String, abbrev: String, kind: Kind, n: Int, k: Int,
                        seed: Long, locality: Double = 0.0, window: Int = 32)

  /** Generate the undirected-canonical edge list of `spec` on the driver.
    *
    * Kept driver-side because attachment models are inherently sequential; sizes here
    * are ≤ a few hundred thousand edges. Result has no self loops or duplicates.
    */
  def localEdges(spec: Spec): Array[(Long, Long)] = {
    val rnd = new Random(spec.seed)
    val edges = mutable.LinkedHashSet.empty[(Long, Long)]
    // endpoints of GLOBAL (non-local) edges, repeated by degree — preferential
    // attachment concentrates on long-range hubs, not on the local window chatter
    val degreeUrn = mutable.ArrayBuffer.empty[Int]
    val nHubs = spec.kind match { case SuperHub(h, _) => h; case _ => 0 }
    var lastWasLocal = false

    def addEdge(a: Int, b: Int): Boolean = {
      if (a == b) return false
      val e = if (a < b) (a.toLong, b.toLong) else (b.toLong, a.toLong)
      val added = edges.add(e)
      if (added && !lastWasLocal) { degreeUrn += a; degreeUrn += b }
      added
    }

    var i = 1
    while (i < spec.n) {
      val targets = math.min(i, spec.k)
      var added = 0
      var attempts = 0
      while (added < targets && attempts < 20 * targets + 20) {
        attempts += 1
        lastWasLocal = rnd.nextDouble() < spec.locality
        val t =
          if (lastWasLocal)
            math.max(0, i - 1 - rnd.nextInt(math.min(spec.window, i)))
          else spec.kind match {
            case PowerLaw =>
              if (degreeUrn.isEmpty) rnd.nextInt(i)
              else degreeUrn(rnd.nextInt(degreeUrn.size))
            case Uniform => rnd.nextInt(i)
            case SuperHub(h, bias) =>
              if (rnd.nextDouble() < bias) rnd.nextInt(math.min(h, i))
              else rnd.nextInt(i)
          }
        if (addEdge(i, t)) added += 1
      }
      if (added == 0) { lastWasLocal = true; addEdge(i, rnd.nextInt(i)) } // connectivity backstop
      i += 1
    }
    // SuperHub graphs additionally wire the hubs together so landmark removal
    // leaves a sparse residue, as in real web graphs.
    lastWasLocal = false
    if (nHubs > 1) for (a <- 0 until nHubs; b <- a + 1 until math.min(nHubs, spec.n))
      addEdge(a, b)
    edges.toArray
  }

  /** Same as [[localEdges]] but as a DataFrame `(src, dst)` with `src < dst`. */
  def edges(spark: SparkSession, spec: Spec, partitions: Int = 4): DataFrame = {
    import spark.implicits._
    spark.createDataset(localEdges(spec).toSeq).repartition(partitions).toDF("src", "dst")
  }

  /** The 12 dataset analogs, ordered as in the paper's Table 1.
    *
    * `n`/`k` scale the paper's graphs down to laptop-Spark size while keeping the
    * ordering of |V| and avg-degree and the degree-shape class of each network
    * (see DESIGN.md §3.1). `tier` scales all vertex counts, e.g. 0.25 for unit tests.
    */
  def datasets(tier: Double = 1.0): Seq[Spec] = {
    def sz(n: Int) = math.max(32, (n * tier).toInt)
    Seq(
      Spec("Douban",      "DO", PowerLaw,             sz(2000),  2, 101L, 0.50, 16),
      Spec("DBLP",        "DB", PowerLaw,             sz(2600),  3, 102L, 0.92, 6),
      Spec("Youtube",     "YT", SuperHub(12, 0.45),   sz(4400),  3, 103L, 0.85, 8),
      Spec("WikiTalk",    "WK", SuperHub(8, 0.60),    sz(6000),  2, 104L, 0.55, 12),
      Spec("Skitter",     "SK", SuperHub(16, 0.35),   sz(5000),  6, 105L, 0.92, 12),
      Spec("Baidu",       "BA", SuperHub(10, 0.50),   sz(5600),  8, 106L, 0.85, 12),
      Spec("LiveJournal", "LJ", PowerLaw,             sz(8000),  9, 107L, 0.94, 12),
      Spec("Orkut",       "OR", Uniform,              sz(6400), 18, 108L, 0.94, 32),
      Spec("Twitter",     "TW", SuperHub(14, 0.55),  sz(12000), 16, 109L, 0.85, 16),
      Spec("Friendster",  "FR", Uniform,             sz(14000), 14, 110L, 0.94, 32),
      Spec("uk2007",      "UK", SuperHub(20, 0.40),  sz(16000), 16, 111L, 0.93, 16),
      Spec("ClueWeb09",   "CW", SuperHub(24, 0.55),  sz(22000),  5, 112L, 0.97, 8),
    )
  }

  /** Small ad-hoc random connected graph for property tests. */
  def randomSpec(n: Int, k: Int, seed: Long): Spec = {
    val kinds = Seq[Kind](PowerLaw, Uniform, SuperHub(4, 0.5))
    Spec(s"rand-$seed", s"R$seed", kinds((seed % 3).toInt.abs), n, k, seed)
  }
}
