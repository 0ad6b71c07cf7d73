package repro.jobs

import repro.experiments._

/** Scratch calibration entrypoint: times E-HTPGM and the slowest baseline
  * at the loosest grid cell on each dataset so the workload sizes in
  * `Workloads` can be tuned to CI-scale runtimes.
  */
object CalibrateJob {
  def main(args: Array[String]): Unit = {
    val spark = JobSession.build("calibrate")
    for (ds <- Workloads.all(spark)) {
      val c = Tables.cfg(20, 20)
      val e0 = repro.core.HTPGM.mine(ds.db, c)
      println(s"CAL ${ds.name}: E-HTPGM-cold(20,20)=${Tables.fmtSeconds(e0.stats.runtimeMillis)}s")
      val e = repro.core.HTPGM.mine(ds.db, c)
      println(s"CAL ${ds.name}: seqs=${ds.db.size} events=${ds.db.numEvents} " +
        s"avgInst=${ds.db.avgInstancesPerSequence.round} " +
        s"E-HTPGM(20,20)=${Tables.fmtSeconds(e.stats.runtimeMillis)}s " +
        s"patterns=${e.patterns.size} maxLevel=${e.stats.maxLevelReached}")
      val t = repro.baselines.TPMiner.mine(ds.db, c)
      println(s"CAL ${ds.name}: TPMiner(20,20)=${Tables.fmtSeconds(t.stats.runtimeMillis)}s patterns=${t.patterns.size}")
      val h = repro.baselines.HDFS.mine(ds.db, c)
      println(s"CAL ${ds.name}: H-DFS(20,20)=${Tables.fmtSeconds(h.stats.runtimeMillis)}s patterns=${h.patterns.size}")
      val i = repro.baselines.IEMiner.mine(ds.db, c)
      println(s"CAL ${ds.name}: IEMiner(20,20)=${Tables.fmtSeconds(i.stats.runtimeMillis)}s patterns=${i.patterns.size}")
      val cells = TableV.counts(ds)
      println(s"CAL ${ds.name}: counts (20,20)=${cells((20,20))} (40,40)=${cells((40,40))} (60,60)=${cells((60,60))} (80,80)=${cells((80,80))}")
      val e88 = repro.core.HTPGM.mine(ds.db, Tables.cfg(80, 80))
      println(s"CAL ${ds.name}: E-HTPGM(80,80)=${Tables.fmtSeconds(e88.stats.runtimeMillis)}s")
    }
    spark.stop()
  }
}
