package repro.core

import org.scalatest.funsuite.AnyFunSuite
import repro.TestDbs

class ModelSpec extends AnyFunSuite {

  test("Instance validates its interval") {
    assertThrows[IllegalArgumentException](Instance(0, 5L, 4L))
    Instance(0, 5L, 5L) // zero-length allowed (degenerate slot)
  }

  test("Instance chronological order breaks ties on end then event") {
    val a = Instance(1, 0, 10); val b = Instance(0, 0, 12); val c = Instance(2, 0, 10)
    assert(Seq(b, c, a).sorted(Instance.chrono) == Seq(a, c, b))
  }

  test("TemporalSequence.byEvent groups preserving chronological order") {
    val s = TemporalSequence(0, Array(
      Instance(1, 0, 2), Instance(0, 1, 3), Instance(1, 5, 6)))
    assert(s.byEvent(1).toSeq == Seq(Instance(1, 0, 2), Instance(1, 5, 6)))
    assert(s.byEvent(0).toSeq == Seq(Instance(0, 1, 3)))
  }

  test("SequenceDB.eventBitmaps marks presence per sequence") {
    val db = TestDbs.handChecked
    val bm = db.eventBitmaps
    assert(bm(0).setBits.toSeq == Seq(0, 1, 2)) // A everywhere
    assert(bm(2).setBits.toSeq == Seq(0, 1))    // C misses seq 2
  }

  test("SequenceDB.avgInstancesPerSequence") {
    val db = TestDbs.handChecked
    assert(math.abs(db.avgInstancesPerSequence - 8.0 / 3.0) < 1e-9)
    assert(SequenceDB(Vector.empty, Vector.empty, Vector.empty, Vector.empty)
      .avgInstancesPerSequence == 0.0)
  }

  test("MiningConfig validates thresholds and eps < d_o") {
    assertThrows[IllegalArgumentException](MiningConfig(sigma = 0.0, delta = 0.5))
    assertThrows[IllegalArgumentException](MiningConfig(sigma = 0.5, delta = 1.5))
    assertThrows[IllegalArgumentException](MiningConfig(sigma = 0.5, delta = 0.5, eps = 2, dO = 2))
    MiningConfig(sigma = 1.0, delta = 1.0, eps = 1, dO = 3)
  }

  test("MiningResult.confidence uses the max event support (Def 3.16)") {
    val p = Pattern.pair(0, Relation.Follow, 1)
    val r = MiningResult(Map(p -> 3), Map(0 -> 5, 1 -> 10), dbSize = 10,
      MiningStats(0, 0, 0, 0, 0, 2))
    assert(r.confidence(p, 3) == 0.3)
  }

  test("MiningStats.structureMB converts bytes") {
    assert(MiningStats(0, 2L * 1024 * 1024, 0, 0, 0, 1).structureMB == 2.0)
  }

  test("Pattern.rel requires i < j") {
    val p = Pattern(Vector(1, 2, 3), Vector(Relation.Follow, Relation.Follow, Relation.Follow))
    assertThrows[IllegalArgumentException](p.rel(1, 1))
  }
}
