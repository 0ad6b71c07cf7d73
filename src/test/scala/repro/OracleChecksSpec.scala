package repro

import org.apache.spark.sql.functions._
import repro.core.{HTPGM, MiningConfig, Pattern, Relation}
import repro.data.{PaperExample, PatternedData, SequenceBuilder, Symbolizer}

/** DuckDB oracle checks: the DataFrame pipeline's support computations are
  * re-expressed as plain SQL over the instance table and diffed row-wise.
  */
class OracleChecksSpec extends SparkSpec {

  private lazy val instDf = SequenceBuilder
    .instances(PaperExample.symbolic(spark), PaperExample.SeqLen, 0L, PaperExample.SlotWidth,
               origin = PaperExample.Origin)
    .cache()

  test("L1 supports: countDistinct(seq) per event matches DuckDB") {
    val sparkSide = instDf
      .select(concat(col("series"), lit("="), col("symbol")).as("event"), col("seq"))
      .groupBy("event").agg(countDistinct("seq").as("supp"))
    Oracle.assertEquivalent(sparkSide,
      """SELECT series || '=' || symbol AS event, COUNT(DISTINCT seq) AS supp
        |FROM inst GROUP BY 1""".stripMargin,
      "inst" -> instDf)
  }

  test("pair supports: joint bitmap semantics match a DuckDB self-join") {
    val ev = instDf.select(concat(col("series"), lit("="), col("symbol")).as("event"), col("seq")).distinct()
    val sparkSide = ev.as("a").join(ev.as("b"), Seq("seq"))
      .where(col("a.event") < col("b.event"))
      .groupBy(col("a.event").as("e1"), col("b.event").as("e2"))
      .agg(countDistinct("seq").as("supp"))
    Oracle.assertEquivalent(sparkSide,
      """WITH ev AS (SELECT DISTINCT series || '=' || symbol AS event, seq FROM inst)
        |SELECT a.event AS e1, b.event AS e2, COUNT(DISTINCT a.seq) AS supp
        |FROM ev a JOIN ev b ON a.seq = b.seq AND a.event < b.event
        |GROUP BY 1, 2""".stripMargin,
      "inst" -> instDf)
  }

  /** The miner's support for a 2-event pattern, re-derived as SQL. */
  private def minedPairSupport(e1: String, r: Byte, e2: String): Long = {
    val db = SequenceBuilder.toLocal(instDf)
    val res = HTPGM.mine(db, MiningConfig(sigma = 0.25, delta = 0.25, maxLevel = 2))
    val p = Pattern.pair(db.eventNames.indexOf(e1), r, db.eventNames.indexOf(e2))
    res.patterns.getOrElse(p, 0).toLong
  }

  private val chronoSql =
    """(CAST(a.start AS BIGINT) < CAST(b.start AS BIGINT)
      | OR (CAST(a.start AS BIGINT) = CAST(b.start AS BIGINT)
      |     AND (CAST(a."end" AS BIGINT) < CAST(b."end" AS BIGINT)
      |          OR (CAST(a."end" AS BIGINT) = CAST(b."end" AS BIGINT)
      |              AND a.series || '=' || a.symbol < b.series || '=' || b.symbol))))""".stripMargin

  private def patternSupportSql(e1: String, e2: String, relCond: String): String = {
    val Array(s1, y1) = e1.split('='); val Array(s2, y2) = e2.split('=')
    s"""SELECT COUNT(DISTINCT a.seq) AS supp
       |FROM inst a JOIN inst b ON a.seq = b.seq
       |WHERE a.series = '$s1' AND a.symbol = '$y1'
       |  AND b.series = '$s2' AND b.symbol = '$y2'
       |  AND $chronoSql AND ($relCond)""".stripMargin
  }

  private def checkPattern(e1: String, r: Byte, e2: String, relCond: String): Unit = {
    import spark.implicits._
    val sparkSide = Seq(minedPairSupport(e1, r, e2)).toDF("supp")
    Oracle.assertEquivalent(sparkSide, patternSupportSql(e1, e2, relCond), "inst" -> instDf)
  }

  test("2-event Follow pattern support (KOn -> MOn) matches DuckDB EXISTS join") {
    checkPattern("K=On", Relation.Follow, "M=On",
      """CAST(a."end" AS BIGINT) <= CAST(b.start AS BIGINT)""")
  }

  test("2-event Contain pattern support (KOn >= TOn) matches DuckDB") {
    checkPattern("K=On", Relation.Contain, "T=On",
      """CAST(b."end" AS BIGINT) <= CAST(a."end" AS BIGINT)""")
  }

  test("2-event Overlap pattern support (MOn >< COn) matches DuckDB") {
    checkPattern("M=On", Relation.Overlap, "C=On",
      """CAST(b."end" AS BIGINT) > CAST(a."end" AS BIGINT)
        | AND CAST(a."end" AS BIGINT) - CAST(b.start AS BIGINT) >= 1""".stripMargin)
  }

  test("sequence splitting: slot-to-sequence assignment matches DuckDB arithmetic") {
    val sym = PaperExample.symbolic(spark)
    val sparkSide = instDf.groupBy("seq").agg(countDistinct("series").as("nseries"))
    Oracle.assertEquivalent(sparkSide,
      s"""SELECT CAST(CAST(t AS BIGINT) // ${PaperExample.SeqLen} AS INT) AS seq,
         |       COUNT(DISTINCT series) AS nseries
         |FROM sym GROUP BY 1""".stripMargin,
      "sym" -> sym.withColumn("t", col("t") - PaperExample.Origin))
  }

  test("synthetic energy data: L1 supports match DuckDB at SF-test scale") {
    val df = PatternedData.energy(spark, nSeqs = 10, nVars = 8, slotsPerSeq = 24, seed = 7L)
    val inst = SequenceBuilder.instances(Symbolizer.byThreshold(df), 24L, 0L)
    val sparkSide = inst
      .select(concat(col("series"), lit("="), col("symbol")).as("event"), col("seq"))
      .groupBy("event").agg(countDistinct("seq").as("supp"))
    Oracle.assertEquivalent(sparkSide,
      """SELECT series || '=' || symbol AS event, COUNT(DISTINCT seq) AS supp
        |FROM inst GROUP BY 1""".stripMargin,
      "inst" -> inst)
  }
}
