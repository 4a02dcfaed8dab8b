package repro.core

import org.scalatest.funsuite.AnyFunSuite
import repro.Fixtures

/** Algorithm 3 (sketching) against the paper's Example 4.7/4.8 and its properties. */
class SketchSpec extends AnyFunSuite {

  private val meta = new MetaGraph(Fixtures.fig4Landmarks, Fixtures.fig4MetaEdges.toSeq)
  private def labelsOf(v: Long): Map[Long, Int] =
    Fixtures.fig4Labels(v).toMap

  private val s611 = Sketch.compute(meta, 6L, 11L, labelsOf(6L), labelsOf(11L))

  test("fig4: d⊤(6,11) = 5 (Example 4.7)") {
    assert(s611.dTop === Some(5))
  }

  test("fig4: sketch terminals of SPG(6,11)") {
    assert(s611.terminalsU === Map(1L -> 1))            // σ_S(1,6) = 1
    assert(s611.terminalsV === Map(2L -> 3, 3L -> 2))   // σ_S(2,11)=3, σ_S(3,11)=2
  }

  test("fig4: sketch meta edges are (1,2), (2,3), (1,3) — Figure 6(b)") {
    assert(s611.metaEdges === Set((1L, 2L), (2L, 3L), (1L, 3L)))
  }

  test("fig4: search bounds d*_6 = 0 and d*_11 = 2 (Example 4.8, Eq. 4)") {
    assert(s611.dStarU === 0)
    assert(s611.dStarV === 2)
  }

  test("single-landmark paths (r = r') are considered") {
    // u and v both adjacent to landmark 1 only: d⊤ = 1 + d_M(1,1) + 1 = 2
    val m = new MetaGraph(Seq(1L), Seq.empty)
    val s = Sketch.compute(m, 100L, 200L, Map(1L -> 1), Map(1L -> 1))
    assert(s.dTop === Some(2))
    assert(s.terminalsU === Map(1L -> 1))
    assert(s.metaEdges.isEmpty)
  }

  test("empty labels yield an unbounded sketch") {
    val s = Sketch.compute(meta, 100L, 200L, Map.empty, Map(1L -> 1))
    assert(s.dTop === None)
    assert(s.terminalsU.isEmpty && s.terminalsV.isEmpty && s.metaEdges.isEmpty)
  }

  test("d⊤ upper-bounds the true distance (Corollary 4.6) on fig4 pairs") {
    val g = Fixtures.fig4Local
    val lms = Fixtures.fig4Landmarks.toSet
    for {
      u <- Fixtures.fig4Labels.keys
      v <- Fixtures.fig4Labels.keys if u < v
    } {
      val s = Sketch.compute(meta, u, v, labelsOf(u), labelsOf(v))
      val d = g.distance(u, v).get
      assert(s.dTop.exists(_ >= d), s"pair ($u,$v): dTop=${s.dTop} < d=$d")
    }
  }

  test("non-minimizing landmark pairs contribute no terminals") {
    // L(6) = {(1,1)} so pairs through other U-landmarks do not exist;
    // for V side, both (2,3) and (3,2) hit dTop=5 and are kept.
    assert(s611.terminalsV.keySet === Set(2L, 3L))
  }
}
