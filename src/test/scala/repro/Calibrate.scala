package repro

import repro.graph.{Generators, LocalGraph}
import repro.baselines.Ppl
import scala.util.Random

/** Driver-only calibration runner (`sbt "Test/runMain repro.Calibrate"`):
  * per dataset analog, prints |V|, |E|, max/avg degree, sampled average distance,
  * and PPL / ParentPPL build cost — used to tune the generator specs against the
  * paper's Table 1 and to pick the scaled DNF/OOE caps. Not a test.
  */
object Calibrate {
  def main(args: Array[String]): Unit = {
    val withPpl = args.contains("--ppl")
    for (spec <- Generators.datasets(1.0)) {
      val g = LocalGraph(Generators.localEdges(spec))
      val rnd = new Random(7)
      val sources = rnd.shuffle(g.vertices.toSeq).take(8)
      val maps = sources.map(s => g.bfs(s))
      val dists = (1 to 400).flatMap { _ =>
        val m = maps(rnd.nextInt(maps.size))
        m.get(g.vertices(rnd.nextInt(g.numVertices))).filter(_ > 0)
      }
      val avgDist = dists.sum.toDouble / dists.size
      val maxDeg = g.vertices.map(g.degree).max
      val avgDeg = 2.0 * g.numEdges / g.numVertices
      var pplInfo = ""
      if (withPpl) {
        val t0 = System.nanoTime()
        val ppl = Ppl.build(g, withParents = false,
          budgetMillis = 60000, maxEntries = 50000000L)
        val t1 = System.nanoTime()
        val par = Ppl.build(g, withParents = true,
          budgetMillis = 60000, maxEntries = 50000000L)
        val t2 = System.nanoTime()
        pplInfo = f" | PPL ${(t1 - t0) / 1e9}%6.1fs ${ppl.entries}%9d ent " +
          f"(${ppl.status}) | PRNT ${(t2 - t1) / 1e9}%6.1fs " +
          f"${par.entries + par.parentRefs}%9d ent+refs (${par.status})"
      }
      println(f"${spec.abbrev} ${spec.name}%-12s |V|=${g.numVertices}%6d " +
        f"|E|=${g.numEdges}%7d maxdeg=$maxDeg%5d avgdeg=$avgDeg%6.1f " +
        f"avgdist=$avgDist%5.2f$pplInfo")
    }
  }
}
