package repro.graph

import org.scalatest.funsuite.AnyFunSuite
import repro.graph.Generators._
import scala.util.Random

/** Properties of the locality attachment share used to calibrate the analogs. */
class LocalitySpec extends AnyFunSuite {

  private def avgDist(g: LocalGraph, samples: Int = 200, seed: Long = 3): Double = {
    val rnd = new Random(seed)
    val src = g.vertices(rnd.nextInt(g.numVertices))
    val m = g.bfs(src)
    val ds = (1 to samples).flatMap(_ => m.get(g.vertices(rnd.nextInt(g.numVertices))))
      .filter(_ > 0)
    ds.sum.toDouble / ds.size
  }

  test("higher locality stretches the average distance") {
    val lo = LocalGraph(localEdges(Spec("a", "A", Uniform, 1200, 3, 5L, locality = 0.0)))
    val hi = LocalGraph(localEdges(Spec("a", "A", Uniform, 1200, 3, 5L, locality = 0.9, window = 10)))
    assert(avgDist(hi) > avgDist(lo) + 0.5,
      s"locality should stretch distances: ${avgDist(lo)} vs ${avgDist(hi)}")
  }

  test("locality graphs stay connected") {
    for (loc <- Seq(0.5, 0.9, 0.97)) {
      val g = LocalGraph(localEdges(Spec("a", "A", PowerLaw, 800, 2, 9L, locality = loc, window = 8)))
      assert(g.connected, s"locality $loc")
    }
  }

  test("preferential hubs survive high locality (global-only urn)") {
    val g = LocalGraph(localEdges(Spec("a", "A", PowerLaw, 2000, 3, 7L, locality = 0.9, window = 10)))
    val maxDeg = g.vertices.map(g.degree).max
    assert(maxDeg > 30, s"hubs starved: maxDeg=$maxDeg")
  }

  test("locality edges land inside the window") {
    val spec = Spec("a", "A", Uniform, 500, 2, 11L, locality = 1.0, window = 5)
    val g = LocalGraph(localEdges(spec))
    // with locality 1.0 every non-backstop edge spans at most the window
    val spans = g.edges.map { case (a, b) => math.abs(a - b) }
    assert(spans.count(_ <= 5) >= g.numEdges * 9 / 10)
  }

  test("the 12 analogs order avg distance with CW longest and TW shortest") {
    val tiny = datasets(0.25)
    val byAb = tiny.map(s => s.abbrev -> LocalGraph(localEdges(s))).toMap
    val d = byAb.view.mapValues(avgDist(_)).toMap
    assert(d("CW") > d("TW"), s"CW=${d("CW")} TW=${d("TW")}")
  }
}
