package repro.bench

import java.nio.file.{Files, Paths, StandardOpenOption}
import repro.SparkSpec

/** One shared measurement pass for all three table benches (builds are expensive;
  * Table 2 and Table 3 render different columns of the same run).
  *
  * Results are also written to `bench/results/` so EXPERIMENTS.md can be diffed
  * against the paper's numbers.
  */
object BenchRun {
  lazy val cfg: Experiments.Config = Experiments.fromEnv()
  lazy val results: Seq[Experiments.Measurement] = {
    // bench graphs are ~10^5 edges: a few shuffle partitions keep per-job overhead low
    SparkSpec.shared.conf.set("spark.sql.shuffle.partitions", "16")
    val ms = Experiments.measureAll(SparkSpec.shared, cfg)
    save("table1.txt", Experiments.renderTable1(ms))
    save("table2.txt", Experiments.renderTable2(ms))
    save("table3.txt", Experiments.renderTable3(ms))
    ms
  }

  private def save(name: String, content: String): Unit = {
    val dir = Paths.get("results")
    Files.createDirectories(dir)
    Files.write(dir.resolve(name), (content + "\n").getBytes("UTF-8"),
      StandardOpenOption.CREATE, StandardOpenOption.TRUNCATE_EXISTING)
  }
}
