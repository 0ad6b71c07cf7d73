package repro.data

import org.apache.spark.sql.{DataFrame, Row}
import org.apache.spark.sql.expressions.Window
import org.apache.spark.sql.functions._
import repro.core.{Instance, SequenceDB, TemporalSequence}
import repro.mi.{SymbolicDB, SymbolicSeries}

/** Temporal sequence database conversion (Section IV.B.2).
  *
  * A symbolic DataFrame `(series, t, symbol)` (with `t` a slot start in
  * units of `slotWidth`) is split into fixed-length sequences of
  * `seqLen` time units, two consecutive sequences overlapping by `tOv`
  * (0 ≤ tOv < seqLen; tOv = t_max preserves every pattern, Fig. 3).
  * Within each (sequence, series), runs of identical consecutive symbols
  * are merged into event instances `[start, end)` (end-exclusive — the
  * cosmetic difference to the paper's Table III closed intervals is
  * documented in DESIGN.md §3).
  */
object SequenceBuilder {

  /** Columns of the instance DataFrame produced by [[instances]]. */
  val InstanceColumns: Seq[String] = Seq("seq", "series", "symbol", "start", "end")

  /** Assign each slot to every sequence window covering it and merge runs
    * into instances. Pure DataFrame/Catalyst: an `explode(sequence(...))`
    * for the overlap fan-out and a lag/running-sum change-point window for
    * the merge.
    */
  def instances(sym: DataFrame, seqLen: Long, tOv: Long, slotWidth: Long = 1L,
                origin: Long = 0L): DataFrame = {
    require(tOv >= 0 && tOv < seqLen, s"need 0 <= tOv < seqLen (got tOv=$tOv seqLen=$seqLen)")
    require(seqLen % slotWidth == 0 && tOv % slotWidth == 0, "seqLen/tOv must be slot multiples")
    val step = seqLen - tOv

    // Sequence i covers [origin + i*step, origin + i*step + seqLen); slot t
    // belongs to all i in [max(0, floor((u - seqLen)/step) + 1), floor(u/step)]
    // where u = t - origin.
    val u = col("t") - origin
    val lo = greatest(lit(0L), floor((u - seqLen).cast("double") / step).cast("long") + 1L)
    val hi = floor(u.cast("double") / step).cast("long")
    val assigned = sym
      .withColumn("seq", explode(sequence(lo, hi)))

    val w = Window.partitionBy("seq", "series").orderBy("t")
    val changed = (col("symbol") =!= lag("symbol", 1).over(w)) ||
      lag("symbol", 1).over(w).isNull ||
      (col("t") =!= lag("t", 1).over(w) + slotWidth) // a sampling gap also splits
    assigned
      .withColumn("chg", when(changed, 1L).otherwise(0L))
      .withColumn("grp", sum("chg").over(w.rowsBetween(Window.unboundedPreceding, 0)))
      .groupBy("seq", "series", "symbol", "grp")
      .agg(min("t").as("start"), (max("t") + slotWidth).as("end"))
      .select(col("seq").cast("int"), col("series"), col("symbol"), col("start"), col("end"))
  }

  /** Collect an instance DataFrame into the local [[SequenceDB]] used by
    * the driver-side miners and baselines. Event ids are dictionary-encoded
    * as `"series=symbol"` in sorted order; sequence ids are densified.
    */
  def toLocal(instDf: DataFrame): SequenceDB = {
    val rows = instDf.select("seq", "series", "symbol", "start", "end").collect()
    fromRows(rows.map(r => (r.getInt(0), r.getString(1), r.getString(2), r.getLong(3), r.getLong(4))))
  }

  /** Local constructor shared with the streaming path and tests. */
  def fromRows(rows: Seq[(Int, String, String, Long, Long)]): SequenceDB = {
    val seriesNames = rows.map(_._2).distinct.sorted.toIndexedSeq
    val seriesIdx = seriesNames.zipWithIndex.toMap
    val eventNames = rows.map(r => s"${r._2}=${r._3}").distinct.sorted.toIndexedSeq
    val eventIdx = eventNames.zipWithIndex.toMap
    val eventSeries = eventNames.map(n => seriesIdx(n.split('=').head))
    val seqIds = rows.map(_._1).distinct.sorted
    val seqDense = seqIds.zipWithIndex.toMap
    val bySeq = rows.groupBy(r => seqDense(r._1))
    val sequences = seqIds.indices.map { i =>
      val insts = bySeq.getOrElse(i, Seq.empty)
        .map(r => Instance(eventIdx(s"${r._2}=${r._3}"), r._4, r._5))
        .distinct
        .sorted(Instance.chrono)
        .toArray
      TemporalSequence(i, insts)
    }
    SequenceDB(sequences.toIndexedSeq, eventNames, eventSeries, seriesNames)
  }

  /** Collect a symbolic DataFrame into the local aligned [[SymbolicDB]]
    * needed by the MI computation (series must share the slot grid).
    */
  def toSymbolicDB(sym: DataFrame): SymbolicDB = {
    val rows = sym.select("series", "t", "symbol").collect()
      .map(r => (r.getString(0), r.getLong(1), r.getString(2)))
    val byS = rows.groupBy(_._1)
    val names = byS.keys.toIndexedSeq.sorted
    val series = names.map { name =>
      val slots = byS(name).sortBy(_._2)
      val alphabet = slots.map(_._3).distinct.sorted.toIndexedSeq
      val dict = alphabet.zipWithIndex.toMap
      SymbolicSeries(name, slots.map(s => dict(s._3)).toArray, alphabet)
    }
    SymbolicDB(series)
  }
}
