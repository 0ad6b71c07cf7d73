package repro.experiments

import org.apache.spark.sql.SparkSession
import repro.core._
import repro.baselines.{HDFS, IEMiner, TPMiner}
import repro.mi.CorrelationGraph
import repro.experiments.Workloads.Dataset

/** Shared experiment plumbing for the table reproductions. */
object Tables {

  /** Percent grid used across the evaluation (Tables V, VII, VIII, IX). */
  val WideGrid: Seq[Int] = Seq(20, 40, 60, 80)
  val NarrowGrid: Seq[Int] = Seq(20, 50, 80)

  /** t_max of 20 slots (under half a sequence): the maximal-duration
    * constraint of Section III.C keeps relation chains temporally local,
    * exactly as the paper's invalid-pattern example argues.
    */
  val TMaxSlots = 20L

  def cfg(sigmaPct: Int, deltaPct: Int): MiningConfig =
    MiningConfig(sigma = sigmaPct / 100.0, delta = deltaPct / 100.0, tMax = TMaxSlots)

  /** Named miners in the paper's Table VII ordering. */
  def baselineMiners: Seq[(String, (SequenceDB, MiningConfig) => MiningResult)] = Seq(
    "H-DFS" -> (HDFS.mine(_, _)),
    "IEMiner" -> (IEMiner.mine(_, _)),
    "TPMiner" -> (TPMiner.mine(_, _)))

  def eHtpgm(db: SequenceDB, c: MiningConfig): MiningResult = HTPGM.mine(db, c)

  /** A-HTPGM at a correlation-graph edge density (Section VI.C.1 runs μ
    * values that keep 80/60/40/20% of the edges).
    */
  def aHtpgm(ds: Dataset, c: MiningConfig, densityPct: Int): MiningResult = {
    val graph = graphAtDensity(ds, densityPct)
    AHTPGM.mine(ds.db, c, remap(graph, ds))
  }

  private val graphCache = scala.collection.mutable.HashMap.empty[(String, Int), CorrelationGraph]

  def graphAtDensity(ds: Dataset, densityPct: Int): CorrelationGraph =
    graphCache.getOrElseUpdate((ds.name, densityPct),
      CorrelationGraph.buildForDensity(ds.symDb, densityPct / 100.0))

  /** The symbolic DB is sorted by series name, as is SequenceDB — vertex
    * ids align; keep a defensive remap in case orderings diverge.
    */
  private def remap(g: CorrelationGraph, ds: Dataset): CorrelationGraph = {
    val symNames = ds.symDb.series.map(_.name)
    if (symNames == ds.db.seriesNames) g
    else {
      val idx = symNames.zipWithIndex.toMap
      val n = ds.db.seriesNames.size
      val adj = Array.tabulate(n, n)((i, j) =>
        g.adj(idx(ds.db.seriesNames(i)))(idx(ds.db.seriesNames(j))))
      CorrelationGraph(n, adj)
    }
  }

  private val warmed = scala.collection.mutable.HashSet.empty[String]

  /** Run every miner once on a 25-sequence slice before measuring, so JIT
    * compilation of the shared hot paths (relation classification, pattern
    * hashing) does not penalize whichever miner is measured first.
    */
  def warmup(ds: Dataset): Unit = if (!warmed.contains(ds.name)) {
    warmed += ds.name
    val sub = ds.db.copy(sequences =
      ds.db.sequences.take(40).zipWithIndex.map { case (sq, i) => sq.copy(id = i) })
    // hit both the tight and the loose-threshold profiles so the first
    // measured cell does not pay JIT (re)compilation
    for (c <- Seq(cfg(50, 50), cfg(25, 25))) {
      HTPGM.mine(sub, c)
      HTPGM.mine(sub, c.copy(pruneApriori = false, pruneTrans = false))
      baselineMiners.foreach { case (_, m) => m(sub, c) }
    }
  }

  def fmtSeconds(ms: Long): String = f"${ms / 1000.0}%.2f"
  def fmtMB(bytes: Long): String = f"${bytes / (1024.0 * 1024.0)}%.2f"

  /** Render an aligned text table. */
  def render(title: String, header: Seq[String], rows: Seq[Seq[String]]): String = {
    val all = header +: rows
    val widths = header.indices.map(i => all.map(_(i).length).max)
    def line(r: Seq[String]) = r.zip(widths).map { case (c, w) => c.padTo(w, ' ') }.mkString("  ")
    (s"== $title ==" +: line(header) +: rows.map(line)).mkString("\n")
  }
}

/** Table IV: dataset characteristics at reproduction scale. */
object TableIV {
  def rows(spark: SparkSession): Seq[Seq[String]] =
    Workloads.all(spark).map { ds =>
      Seq(ds.name, ds.numSequences.toString, ds.numVariables.toString,
        ds.numDistinctEvents.toString, f"${ds.db.avgInstancesPerSequence}%.0f",
        s"(paper: ${ds.paperSequences}/${ds.paperVariables}/${ds.paperDistinctEvents}/${ds.paperAvgInst})")
    }

  def run(spark: SparkSession): String =
    Tables.render("Table IV: Characteristics of the Datasets",
      Seq("dataset", "#sequences", "#variables", "#distinct events", "avg #inst/seq", "paper (seq/var/ev/inst)"),
      rows(spark))
}

/** Table V: number of extracted patterns over the σ×δ grid. Mines once per
  * dataset at the loosest thresholds and post-filters each cell (higher
  * thresholds are subsets — Lemmas 2, 3).
  */
object TableV {
  def counts(ds: Dataset): Map[(Int, Int), Int] = {
    val base = HTPGM.mine(ds.db, Tables.cfg(Tables.WideGrid.min, Tables.WideGrid.min))
    val cells = for (s <- Tables.WideGrid; d <- Tables.WideGrid) yield {
      val minSupp = Tables.cfg(s, d).minSupp(ds.db.size)
      val c = base.patterns.count { case (p, supp) =>
        supp >= minSupp && base.confidence(p, supp) >= d / 100.0
      }
      (s, d) -> c
    }
    cells.toMap
  }

  def run(spark: SparkSession): String = {
    val tables = Workloads.all(spark).map { ds =>
      val cs = counts(ds)
      Tables.render(s"Table V: Extracted patterns — ${ds.name}",
        Seq("supp\\conf") ++ Tables.WideGrid.map(d => s"$d%"),
        Tables.WideGrid.map(s => s"$s%" +: Tables.WideGrid.map(d => cs((s, d)).toString)))
    }
    tables.mkString("\n\n")
  }
}

/** Table VI: example interesting patterns with support and confidence. */
object TableVI {
  def interesting(ds: Dataset, topN: Int): Seq[String] = {
    val res = HTPGM.mine(ds.db, Tables.cfg(20, 20))
    res.ranked
      .filter(_._1.size >= 2)
      .sortBy { case (p, s, c) => (-p.size, -c, -s) } // prefer long, confident patterns
      .take(topN)
      .map { case (p, s, c) =>
        f"${p.render(ds.db.eventNames)}  supp=${s * 100}%.0f%%  conf=${c * 100}%.0f%%"
      }
  }

  def run(spark: SparkSession): String = {
    val blocks = Seq(Workloads.nist(spark), Workloads.city(spark)).map { ds =>
      (s"-- ${ds.name} --" +: interesting(ds, 6)).mkString("\n")
    }
    ("== Table VI: Summary of Interesting Patterns ==" +: blocks).mkString("\n")
  }
}
