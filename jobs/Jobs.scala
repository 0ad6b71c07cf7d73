package repro.jobs

import org.apache.spark.sql.SparkSession
import repro.core.MiningConfig
import repro.data.{SequenceBuilder, Symbolizer, PatternedData}
import repro.experiments._

/** Shared session bootstrap for the spark-submit entrypoints. */
object JobSession {
  def build(name: String): SparkSession =
    SparkSession.builder
      .master(sys.env.getOrElse("SPARK_MASTER", "local[*]"))
      .appName(name)
      .config("spark.sql.shuffle.partitions", sys.env.getOrElse("SPARK_SHUFFLE_PARTITIONS", "64"))
      .config("spark.ui.enabled", "false")
      .getOrCreate()
}

/** Table IV: dataset characteristics. `spark-submit --class repro.jobs.TableIVJob`. */
object TableIVJob {
  def main(args: Array[String]): Unit = println(TableIV.run(JobSession.build("table-iv")))
}

/** Table V: number of extracted patterns over the σ×δ grid. */
object TableVJob {
  def main(args: Array[String]): Unit = println(TableV.run(JobSession.build("table-v")))
}

/** Table VI: example interesting patterns. */
object TableVIJob {
  def main(args: Array[String]): Unit = println(TableVI.run(JobSession.build("table-vi")))
}

/** Tables VII and VIII: runtime and memory comparison of all miners. */
object TableVIIJob {
  def main(args: Array[String]): Unit = println(TableVIIVIII.run(JobSession.build("table-vii-viii")))
}

/** Table IX: accuracy of A-HTPGM. */
object TableIXJob {
  def main(args: Array[String]): Unit = println(TableIX.run(JobSession.build("table-ix")))
}

/** Pruning ablation (Figs. 6–7 as a table). */
object PruningJob {
  def main(args: Array[String]): Unit = println(PruningAblation.run(JobSession.build("pruning")))
}

/** End-to-end FTPMfTS demo: generate (or read) a raw time-series frame,
  * transform, mine distributed, and print the top frequent temporal
  * patterns. Args: [sigmaPct] [deltaPct] [topN].
  */
object MineFTPMfTSJob {
  def main(args: Array[String]): Unit = {
    val spark = JobSession.build("ftpmfts")
    val sigma = args.headOption.map(_.toInt).getOrElse(40)
    val delta = args.lift(1).map(_.toInt).getOrElse(40)
    val topN = args.lift(2).map(_.toInt).getOrElse(20)

    val raw = PatternedData.energy(spark, nSeqs = 60, nVars = 12,
      slotsPerSeq = Workloads.SlotsPerSeq, seed = 7L)
    val sym = Symbolizer.byThreshold(raw)
    val inst = SequenceBuilder.instances(sym, Workloads.SlotsPerSeq.toLong, 0L).cache()
    val cfg = MiningConfig(sigma / 100.0, delta / 100.0, tMax = Tables.TMaxSlots)

    val res = repro.spark.SparkHTPGM.mine(inst, cfg)
    val names = SequenceBuilder.toLocal(inst).eventNames
    println(s"Mined ${res.patterns.size} frequent temporal patterns " +
      s"(sigma=$sigma%, delta=$delta%) from ${res.dbSize} sequences in " +
      s"${Tables.fmtSeconds(res.stats.runtimeMillis)}s")
    res.ranked.take(topN).foreach { case (p, s, c) =>
      println(f"  supp=${s * 100}%5.1f%%  conf=${c * 100}%5.1f%%  ${p.render(names)}")
    }
    spark.stop()
  }
}
