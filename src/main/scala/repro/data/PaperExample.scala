package repro.data

import org.apache.spark.sql.{DataFrame, SparkSession}
import repro.core.SequenceDB
import repro.mi.{SymbolicDB, SymbolicSeries}

/** The paper's worked example: the symbolic database of Table I — six
  * appliances (K, T, M, C, I, B) over 36 five-minute slots from 10:00
  * (minute 600) to 12:55 — and its conversion parameters (4 sequences of
  * 9 slots, no overlap), which yield the D_SEQ of Table III and the HPG of
  * Fig. 4. Golden numbers asserted in tests: p(KOn)=17/36, I(K;T)=0.29,
  * Ĩ(K;T)≈Ĩ(T;K)≈0.42, b_KOn=[1,1,1,1], IOn infrequent at σ=0.7.
  */
object PaperExample {
  val SlotWidth = 5L
  val Origin = 600L // 10:00 in minutes
  val Slots = 36
  val SeqLenSlots = 9
  /** 4 sequences × 9 slots × 5 minutes. */
  val SeqLen: Long = SeqLenSlots * SlotWidth

  // 1 = On, 0 = Off; transcribed from Table I, 36 slots per series.
  private val grid: Seq[(String, String)] = Seq(
    "K" -> "111100011000000111000011100110011100",
    "T" -> "011100011001100111000011100110001110",
    "M" -> "000011100111011000110110011001110011",
    "C" -> "000011100110111000110110011001110011",
    "I" -> "000000000110000011000000000110001100",
    "B" -> "000000011000000000110000000110000011")

  def seriesNames: Seq[String] = grid.map(_._1)

  /** Raw-value DataFrame `(series, t, value)` with On = 1.0 W ≥ the 0.05
    * threshold, matching the repo-wide layout.
    */
  def raw(spark: SparkSession): DataFrame = {
    import spark.implicits._
    grid.flatMap { case (name, bits) =>
      bits.zipWithIndex.map { case (b, i) =>
        (name, Origin + i * SlotWidth, if (b == '1') 1.0 else 0.0)
      }
    }.toDF("series", "t", "value")
  }

  /** Symbolic DataFrame `(series, t, symbol)`. */
  def symbolic(spark: SparkSession): DataFrame = Symbolizer.byThreshold(raw(spark))

  /** Local symbolic DB (for the MI worked example of Section V.A). */
  def symbolicDB: SymbolicDB = SymbolicDB(
    grid.map { case (name, bits) =>
      // Alphabet sorted ("Off" < "On") to match SequenceBuilder's encoding.
      SymbolicSeries(name, bits.map(b => if (b == '1') 1 else 0).toArray, IndexedSeq("Off", "On"))
    }.toIndexedSeq)

  /** The D_SEQ of Table III (modulo interval-presentation, DESIGN.md §3). */
  def sequenceDB(spark: SparkSession): SequenceDB =
    SequenceBuilder.toLocal(
      SequenceBuilder.instances(symbolic(spark), SeqLen, 0L, SlotWidth, origin = Origin))
}
