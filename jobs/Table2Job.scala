package repro.jobs

import org.apache.spark.sql.SparkSession
import repro.bench.Experiments

/** spark-submit entrypoint reproducing Table 2 (construction time and average
  * query time for QbS-P / QbS / PPL / ParentPPL / Bi-BFS).
  *
  *   spark-submit --class repro.jobs.Table2Job target/scala-2.13/repro_*.jar
  */
object Table2Job {
  def main(args: Array[String]): Unit = {
    val spark = SparkSession.builder.appName("qbs-table2")
      .master(sys.env.getOrElse("SPARK_MASTER", "local[*]")).getOrCreate()
    val cfg = Experiments.fromEnv()
    val ms = Experiments.measureAll(spark, cfg)
    println("== Table 2: construction and query time ==")
    println(Experiments.renderTable2(ms))
    spark.stop()
  }
}
