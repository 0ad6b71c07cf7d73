package repro.core

import org.apache.spark.sql.functions._
import repro.SparkSpec
import scala.util.Random

/** The Catalyst-side relation classifier must agree with the Scala one on
  * every input — the distributed L2 miner depends on it.
  */
class ClassifyColSpec extends SparkSpec {

  private def compareOn(pairs: Seq[(Long, Long, Long, Long)], eps: Long, dO: Long): Unit = {
    import spark.implicits._
    val df = pairs.toDF("s1", "e1", "s2", "e2")
      .withColumn("rel", Relation.classifyCol(col("s1"), col("e1"), col("s2"), col("e2"), eps, dO))
    val got = df.collect().map(r => (r.getLong(0), r.getLong(1), r.getLong(2), r.getLong(3)) -> r.getInt(4)).toMap
    for ((s1, e1, s2, e2) <- pairs) {
      val want = Relation.classify(s1, e1, s2, e2, eps, dO).toInt
      assert(got((s1, e1, s2, e2)) == want, s"($s1,$e1,$s2,$e2) eps=$eps dO=$dO")
    }
  }

  private def randomPairs(seed: Int, n: Int): Seq[(Long, Long, Long, Long)] = {
    val rng = new Random(seed)
    (1 to n).map { _ =>
      val s1 = rng.nextInt(50).toLong; val e1 = s1 + 1 + rng.nextInt(30)
      val s2 = s1 + rng.nextInt(40); val e2 = s2 + 1 + rng.nextInt(30)
      (s1, e1, s2, e2)
    }.distinct
  }

  test("classifyCol == classify under default eps/d_o on 300 random interval pairs") {
    compareOn(randomPairs(1, 300), eps = 0, dO = 1)
  }

  test("classifyCol == classify with buffered eps and larger d_o (including the None gap)") {
    val pairs = randomPairs(2, 300)
    compareOn(pairs, eps = 1, dO = 5)
    assert(pairs.exists { case (s1, e1, s2, e2) =>
      Relation.classify(s1, e1, s2, e2, 1, 5) == Relation.None
    }, "sample should exercise the gap case")
  }

  test("classifyCol on the Table II boundary examples") {
    compareOn(Seq((0L, 5L, 5L, 8L), (0L, 10L, 2L, 8L), (0L, 5L, 3L, 9L),
      (0L, 10L, 0L, 10L), (0L, 5L, 4L, 10L)), eps = 0, dO = 1)
  }
}
