package repro.core

import org.apache.spark.sql.Column
import org.apache.spark.sql.functions._

/** The three simplified Allen relations of Section III.B, with the ε buffer
  * and minimal overlap duration d_o.
  *
  * For two event instances `a` and `b` with `a` chronologically before `b`
  * (order on (start, end, event)), exactly one of the following holds under
  * the default configuration (ε = 0, d_o = 1, integer timestamps):
  *
  *  - Contain: `b.end <= a.end + ε`                        (Def 3.7)
  *  - Overlap: not Contain and `a.end - b.start >= d_o`    (Def 3.8)
  *  - Follow:  not Contain/Overlap and `a.end - b.start <= ε` (Def 3.6)
  *
  * For non-default ε/d_o a gap may exist (overlap amount strictly between
  * ε and d_o); such instance pairs form no relation and cannot appear in a
  * pattern (see DESIGN.md §3).
  */
object Relation {
  val Follow: Byte  = 0
  val Contain: Byte = 1
  val Overlap: Byte = 2
  /** Sentinel: the pair forms no relation (only possible when d_o > ε + 1). */
  val None: Byte = -1

  def name(r: Byte): String = r match {
    case Follow  => "Follow"
    case Contain => "Contain"
    case Overlap => "Overlap"
    case _       => "None"
  }

  /** Compact infix glyphs used when pretty-printing patterns (→, ≽, ≬). */
  def glyph(r: Byte): String = r match {
    case Follow  => "->"
    case Contain => ">="
    case Overlap => "><"
    case _       => "!?"
  }

  /** Classify the relation between instance intervals (s1,e1) and (s2,e2),
    * where (s1,e1) is chronologically first. Returns [[None]] when no
    * relation holds (gap case).
    */
  def classify(s1: Long, e1: Long, s2: Long, e2: Long, eps: Long, dO: Long): Byte = {
    require(s1 <= s2, s"classify requires chronological order: $s1 > $s2")
    if (e2 <= e1 + eps) Contain
    else if (e1 - s2 >= dO) Overlap
    else if (e1 - s2 <= eps) Follow
    else None
  }

  /** Catalyst-side equivalent of [[classify]] over interval columns, so the
    * distributed L2 miner can classify relations without a UDF.
    */
  def classifyCol(s1: Column, e1: Column, s2: Column, e2: Column,
                  eps: Long, dO: Long): Column =
    when(e2 <= e1 + lit(eps), lit(Contain.toInt))
      .when(e1 - s2 >= lit(dO), lit(Overlap.toInt))
      .when(e1 - s2 <= lit(eps), lit(Follow.toInt))
      .otherwise(lit(None.toInt))
}
