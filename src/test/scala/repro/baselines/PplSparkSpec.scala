package repro.baselines

import repro.{Fixtures, SparkSpec}

/** The DataFrame-backed label fetcher (the bench substrate) returns the same
  * answers as the driver-local fetcher, plus QbS.coverage sanity.
  */
class PplSparkSpec extends SparkSpec {

  private lazy val g3 = Fixtures.fig3Local
  private lazy val index = Ppl.build(g3, withParents = false,
    orderOverride = Some((1L to 7L).toArray))
  private lazy val parentIndex = Ppl.build(g3, withParents = true,
    orderOverride = Some((1L to 7L).toArray))

  test("dfFetcher equals localFetcher on fig3") {
    val df = repro.graph.GraphOps.materialize(Ppl.toLabelsDf(spark, index))
    val f = Ppl.dfFetcher(df)
    val l = Ppl.localFetcher(index)
    for (v <- 1L to 7L) {
      val a = f(Set(v))(v).view.mapValues(_._1).toMap
      val b = l(Set(v))(v).view.mapValues(_._1).toMap
      assert(a === b, s"vertex $v")
    }
    df.unpersist()
  }

  test("spgQuery over the DataFrame fetcher equals the reference on fig3") {
    val df = repro.graph.GraphOps.materialize(Ppl.toLabelsDf(spark, index))
    val f = Ppl.dfFetcher(df)
    val r = Ppl.spgQuery(f, 3L, 7L, withParents = false)
    assert(r.edges === Fixtures.fig3Spg37)
    df.unpersist()
  }

  test("ParentPPL parents survive the DataFrame round-trip") {
    val df = repro.graph.GraphOps.materialize(Ppl.toLabelsDf(spark, parentIndex))
    val f = Ppl.dfFetcher(df)
    val (d, parents) = f(Set(7L))(7L)(1L)
    assert(d === 3 && parents.toSet === Set(5L))
    val r = Ppl.spgQuery(f, 3L, 7L, withParents = true)
    assert(r.edges === Fixtures.fig3Spg37)
    df.unpersist()
  }

  test("query counters are populated") {
    val f = Ppl.localFetcher(index)
    val r = Ppl.spgQuery(f, 3L, 7L, withParents = false)
    assert(r.rounds >= 2 && r.entriesFetched > 0)
  }

  test("QbS.coverage classifies answers") {
    import repro.core.QbS
    val fig4 = Fixtures.fig4Df(spark).cache()
    val idx = QbS.build(spark, fig4, numLandmarks = 3)
    assert(QbS.coverage(QbS.query(idx, 6L, 11L)) === "some") // meets at 8 AND via landmarks
    assert(QbS.coverage(QbS.query(idx, 8L, 9L)) === "none")  // adjacent in G⁻
    assert(QbS.coverage(QbS.query(idx, 5L, 12L)) === "all")  // only through landmarks
  }
}
