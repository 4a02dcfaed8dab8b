package repro.jobs

import org.apache.spark.sql.SparkSession
import repro.bench.Experiments

/** spark-submit entrypoint reproducing Table 3 (labelling sizes for QbS `size(L)` /
  * `size(Δ)` vs PPL and ParentPPL, under the paper's byte conventions).
  *
  *   spark-submit --class repro.jobs.Table3Job target/scala-2.13/repro_*.jar
  */
object Table3Job {
  def main(args: Array[String]): Unit = {
    val spark = SparkSession.builder.appName("qbs-table3")
      .master(sys.env.getOrElse("SPARK_MASTER", "local[*]")).getOrCreate()
    val cfg = Experiments.fromEnv()
    val ms = Experiments.measureAll(spark, cfg)
    println("== Table 3: labelling sizes ==")
    println(Experiments.renderTable3(ms))
    spark.stop()
  }
}
