package repro.graph

import org.scalatest.funsuite.AnyFunSuite
import repro.Fixtures

/** Driver-side graph utilities: BFS, SPG reference, landmark-free distances. */
class LocalGraphSpec extends AnyFunSuite {

  private val g3 = Fixtures.fig3Local
  private val g4 = Fixtures.fig4Local

  test("fig3: adjacency and degrees") {
    assert(g3.numVertices === 7)
    assert(g3.numEdges === 8)
    assert(g3.degree(2L) === 4)
    assert(g3.neighbors(5L).toSet === Set(2L, 6L, 7L))
  }

  test("fig3: BFS distances from vertex 3") {
    val d = g3.bfs(3L)
    assert(d === Map(3L -> 0, 1L -> 1, 4L -> 1, 2L -> 2, 5L -> 3, 6L -> 3, 7L -> 4))
  }

  test("fig3: reference SPG(3,7) matches the paper's green answer") {
    assert(g3.spg(3L, 7L) === Fixtures.fig3Spg37)
  }

  test("fig4: reference SPG(6,11) matches Figure 6(f)") {
    assert(g4.spg(6L, 11L) === Fixtures.fig4Spg611)
  }

  test("fig4: distance d(6,11) = 5") {
    assert(g4.distance(6L, 11L) === Some(5))
  }

  test("spg of adjacent vertices is the single edge") {
    assert(g3.spg(5L, 7L) === Set((5L, 7L)))
  }

  test("spg(u,u) is empty") {
    assert(g3.spg(4L, 4L) === Set.empty)
  }

  test("spg over disconnected vertices is empty") {
    val g = LocalGraph(Array((1L, 2L), (3L, 4L)))
    assert(g.spg(1L, 4L) === Set.empty)
    assert(!g.connected)
  }

  test("bfsAvoiding excludes paths through avoided vertices") {
    // avoid 1: distance 3->7 must route 3-4-2-5-7
    val d = g3.bfsAvoiding(3L, Set(1L))
    assert(d(7L) === 4)
    // avoid 2 and 1: no path from 3 to 7
    assert(!g3.bfsAvoiding(3L, Set(1L, 2L)).contains(7L))
  }

  test("fig4: landmark-free distances reproduce the label table") {
    val lms = Fixtures.fig4Landmarks.toSet
    for ((v, entries) <- Fixtures.fig4Labels) {
      val got = lms.flatMap(r =>
        g4.landmarkFreeDistance(v, r, lms).map(d => (r, d)))
      assert(got === entries, s"vertex $v")
    }
  }

  test("fig4: meta edges via landmark-free distances between landmarks") {
    val lms = Fixtures.fig4Landmarks.toSet
    val got = for {
      r <- Fixtures.fig4Landmarks; rp <- Fixtures.fig4Landmarks if r < rp
      d <- g4.landmarkFreeDistance(r, rp, lms)
    } yield (r, rp, d)
    assert(got.toSet === Fixtures.fig4MetaEdges)
  }
}
