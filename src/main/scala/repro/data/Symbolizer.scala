package repro.data

import org.apache.spark.sql.DataFrame
import org.apache.spark.sql.expressions.Window
import org.apache.spark.sql.functions._

/** Symbolic time series representation (Section IV.B.1).
  *
  * Input is the raw-value layout used throughout the repo:
  * `(series: string, t: long, value: double)` where `t` is a slot index
  * (or slot start in fixed time units). Output replaces `value` with
  * `symbol: string`.
  */
object Symbolizer {

  /** Binary threshold mapping used for the energy datasets (Section VI.A.2:
    * On iff value ≥ 0.05).
    */
  def byThreshold(raw: DataFrame, threshold: Double = 0.05,
                  on: String = "On", off: String = "Off"): DataFrame =
    raw.select(col("series"), col("t"),
      when(col("value") >= threshold, on).otherwise(off).as("symbol"))

  /** Percentile mapping used for the multi-state smart-city variables
    * (Section VI.A.2): per-series `percent_rank` binned into
    * `labels.size` equal-probability states, labelled `labels(0)` (lowest)
    * to `labels.last` (highest).
    */
  def byPercentiles(raw: DataFrame, labels: Seq[String]): DataFrame = {
    require(labels.nonEmpty, "need at least one state label")
    val n = labels.size
    val pr = percent_rank().over(Window.partitionBy("series").orderBy("value"))
    val state = least(floor(pr * n).cast("int"), lit(n - 1))
    val labelExpr = element_at(
      array(labels.map(lit): _*), state + 1)
    raw.select(col("series"), col("t"), labelExpr.as("symbol"))
  }

  /** Integer-state passthrough: for generators that already emit discrete
    * states 0..n-1 as `value`, label them directly (deterministic, unlike
    * percentile binning on ties).
    */
  def byStates(raw: DataFrame, labels: Seq[String]): DataFrame = {
    val labelExpr = element_at(array(labels.map(lit): _*),
      least(greatest(col("value").cast("int"), lit(0)), lit(labels.size - 1)) + 1)
    raw.select(col("series"), col("t"), labelExpr.as("symbol"))
  }
}
