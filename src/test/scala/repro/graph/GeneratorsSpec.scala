package repro.graph

import org.scalatest.funsuite.AnyFunSuite
import repro.graph.Generators._

/** Generator invariants: connectivity, determinism, canonical form, degree shape. */
class GeneratorsSpec extends AnyFunSuite {

  private val tier = 0.05 // tiny graphs for unit tests

  for (spec <- datasets(tier)) {
    test(s"${spec.name}: generated graph is connected") {
      assert(LocalGraph(localEdges(spec)).connected)
    }
    test(s"${spec.name}: edges are canonical (src < dst, no dups, no loops)") {
      val es = localEdges(spec)
      assert(es.forall { case (a, b) => a < b })
      assert(es.distinct.length === es.length)
    }
    test(s"${spec.name}: generation is deterministic in the seed") {
      assert(localEdges(spec).toSeq === localEdges(spec).toSeq)
    }
  }

  test("datasets() returns the paper's 12 analogs in Table-1 order") {
    val names = datasets().map(_.abbrev)
    assert(names === Seq("DO", "DB", "YT", "WK", "SK", "BA", "LJ", "OR", "TW", "FR", "UK", "CW"))
  }

  test("tier scales vertex counts down") {
    val full = datasets(1.0).map(_.n)
    val small = datasets(0.1).map(_.n)
    assert(small.zip(full).forall { case (s, f) => s <= f })
  }

  test("power-law graphs have a heavier-tailed degree distribution than uniform") {
    val pl = LocalGraph(localEdges(Spec("pl", "PL", PowerLaw, 1500, 3, 42L)))
    val un = LocalGraph(localEdges(Spec("un", "UN", Uniform, 1500, 3, 42L)))
    val plMax = pl.vertices.map(pl.degree).max
    val unMax = un.vertices.map(un.degree).max
    assert(plMax > unMax, s"power-law max degree $plMax should exceed uniform $unMax")
  }

  test("super-hub graphs concentrate degree on the hub vertices") {
    val sh = LocalGraph(localEdges(Spec("sh", "SH", SuperHub(5, 0.7), 1500, 3, 42L)))
    val hubDeg = (0L until 5L).map(sh.degree).min
    val medianDeg = sh.vertices.map(sh.degree).sorted.apply(sh.numVertices / 2)
    assert(hubDeg > 20 * medianDeg)
  }

  test("different seeds give different graphs") {
    val a = localEdges(Spec("a", "A", PowerLaw, 300, 2, 1L)).toSet
    val b = localEdges(Spec("a", "A", PowerLaw, 300, 2, 2L)).toSet
    assert(a !== b)
  }

  test("randomSpec cycles through generator kinds") {
    val kinds = (0L to 5L).map(s => randomSpec(100, 2, s).kind).toSet
    assert(kinds.size === 3)
  }
}
