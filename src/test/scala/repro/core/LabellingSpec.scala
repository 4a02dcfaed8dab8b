package repro.core

import repro.{Fixtures, SparkSpec}
import repro.graph.GraphOps

/** Algorithm 2 (labelling scheme) against the paper's Figure 4/5 example, the
  * brute-force Definition 4.2 check, and the Lemma 5.2 determinism property.
  */
class LabellingSpec extends SparkSpec {

  private lazy val fig4 = Fixtures.fig4Df(spark).cache()
  private lazy val result =
    Labelling.run(spark, fig4, Fixtures.fig4Landmarks, parallel = true)
  private lazy val gotLabels: Map[Long, Set[(Long, Int)]] =
    result.labels.collect()
      .groupBy(_.getLong(0))
      .map { case (v, rows) =>
        v -> rows.map(r => (r.getLong(1), r.getInt(2))).toSet
      }

  for ((v, expected) <- Fixtures.fig4Labels.toSeq.sortBy(_._1)) {
    test(s"fig4: L($v) matches the paper's label table") {
      assert(gotLabels.getOrElse(v, Set.empty) === expected)
    }
  }

  test("fig4: landmarks themselves carry no labels") {
    assert(Fixtures.fig4Landmarks.forall(r => !gotLabels.contains(r)))
  }

  test("fig4: meta-graph edges and weights match Figure 4(b)") {
    assert(result.metaEdges.toSet === Fixtures.fig4MetaEdges)
  }

  test("fig4: sequential (QbS) labelling equals parallel (QbS-P) — Lemma 5.2") {
    val seq = Labelling.run(spark, fig4, Fixtures.fig4Landmarks, parallel = false)
    val seqLabels = seq.labels.collect()
      .map(r => (r.getLong(0), r.getLong(1), r.getInt(2))).toSet
    val parLabels = result.labels.collect()
      .map(r => (r.getLong(0), r.getLong(1), r.getInt(2))).toSet
    assert(seqLabels === parLabels)
    assert(seq.metaEdges.toSet === result.metaEdges.toSet)
  }

  test("fig4: Δ contains exactly the landmark-free landmark-pair SPGs") {
    val d = Labelling.delta(spark, fig4, result).collect()
      .map(r => ((r.getLong(0), r.getLong(1)), (r.getLong(2), r.getLong(3))))
      .groupBy(_._1).view.mapValues(_.map(_._2).toSet).toMap
    assert(d((1L, 2L)) === Set((1L, 2L)))
    assert(d((2L, 3L)) === Set((2L, 3L)))
    assert(d((1L, 3L)) === Set((1L, 4L), (3L, 4L))) // via vertex 4, not landmark 2
  }

  for (seed <- 1L to 3L) {
    test(s"random graph seed=$seed: labels satisfy Definition 4.2 (brute force)") {
      val local = Fixtures.randomLocal(60, 2, seed)
      val df = GraphOps.fromPairs(spark, local.edges.toSeq).cache()
      val landmarks = GraphOps.topDegreeLandmarks(df, 4)
      val lmSet = landmarks.toSet
      val res = Labelling.run(spark, df, landmarks)
      val got = res.labels.collect()
        .map(r => (r.getLong(0), r.getLong(1), r.getInt(2))).toSet
      val expected = (for {
        v <- local.vertices.toSeq if !lmSet.contains(v)
        r <- landmarks
        d <- local.landmarkFreeDistance(v, r, lmSet)
      } yield (v, r, d)).toSet
      assert(got === expected)
      val expectedMeta = (for {
        r <- landmarks; rp <- landmarks if r < rp
        d <- local.landmarkFreeDistance(r, rp, lmSet)
      } yield (r, rp, d)).toSet
      assert(res.metaEdges.toSet === expectedMeta)
      df.unpersist()
    }
  }

  test("labelling of a graph with an unreachable component leaves it unlabelled") {
    val df = GraphOps.fromPairs(spark,
      Seq((1L, 2L), (2L, 3L), (1L, 3L), (10L, 11L), (11L, 12L)))
    val res = Labelling.run(spark, df, Seq(1L))
    val labelled = res.labels.collect().map(_.getLong(0)).toSet
    assert(labelled === Set(2L, 3L))
    assert(res.metaEdges.isEmpty)
  }
}
