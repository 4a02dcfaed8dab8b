package repro.jobs

import org.apache.spark.sql.SparkSession
import repro.bench.Experiments
import repro.graph.{Generators, GraphOps, GraphStats}

/** spark-submit entrypoint reproducing Table 1 (dataset statistics) over the 12
  * synthetic analogs. Configure via REPRO_TIER / REPRO_DATASETS.
  *
  *   spark-submit --class repro.jobs.Table1Job target/scala-2.13/repro_*.jar
  */
object Table1Job {
  def main(args: Array[String]): Unit = {
    val spark = SparkSession.builder.appName("qbs-table1")
      .master(sys.env.getOrElse("SPARK_MASTER", "local[*]")).getOrCreate()
    val cfg = Experiments.fromEnv()
    val rows = Generators.datasets(cfg.tier).take(cfg.maxDatasets).map { spec =>
      val edges = GraphOps.materialize(Generators.edges(spark, spec))
      val stats = GraphStats.compute(edges, seed = cfg.seed)
      edges.unpersist(blocking = false)
      (spec, stats)
    }
    println("== Table 1: datasets ==")
    println(f"${"Dataset"}%-14s ${"|V|"}%8s ${"|E|"}%9s ${"maxdeg"}%7s ${"avgdeg"}%7s " +
      f"${"avgdist"}%8s ${"bytes"}%12s")
    rows.foreach { case (spec, s) =>
      println(f"${spec.name}%-14s ${s.numV}%8d ${s.numE}%9d ${s.maxDeg}%7d " +
        f"${s.avgDeg}%7.2f ${s.avgDist}%8.1f ${s.bytes}%12d")
    }
    spark.stop()
  }
}
