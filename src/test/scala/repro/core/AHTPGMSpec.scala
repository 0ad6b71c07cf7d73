package repro.core

import org.scalatest.funsuite.AnyFunSuite
import repro.TestDbs
import repro.mi.CorrelationGraph

/** A-HTPGM (Algorithm 2) behaviour against the exact miner. */
class AHTPGMSpec extends AnyFunSuite {

  private def completeGraph(n: Int): CorrelationGraph = {
    val adj = Array.tabulate(n, n)((i, j) => i != j)
    CorrelationGraph(n, adj)
  }

  private def emptyGraph(n: Int): CorrelationGraph =
    CorrelationGraph(n, Array.fill(n, n)(false))

  test("complete correlation graph reproduces the exact result (accuracy 100%)") {
    for (seed <- 1L to 6L) {
      val db = TestDbs.random(seed)
      val cfg = MiningConfig(sigma = 0.4, delta = 0.4)
      val exact = HTPGM.mine(db, cfg)
      val approx = AHTPGM.mine(db, cfg, completeGraph(db.seriesNames.size))
      assert(approx.patterns == exact.patterns, s"seed=$seed")
      assert(AHTPGM.accuracy(exact, approx) == 1.0)
    }
  }

  test("empty correlation graph prunes every cross-series pattern") {
    val db = TestDbs.random(2L)
    val cfg = MiningConfig(sigma = 0.4, delta = 0.4)
    val approx = AHTPGM.mine(db, cfg, emptyGraph(db.seriesNames.size))
    // each event is its own series in TestDbs and no series is in X_C
    assert(approx.patterns.isEmpty)
  }

  test("approximate result is always a subset of the exact result") {
    for (seed <- 1L to 6L) {
      val db = TestDbs.random(seed, nSeqs = 8, nEvents = 6)
      val cfg = MiningConfig(sigma = 0.3, delta = 0.3)
      val exact = HTPGM.mine(db, cfg)
      // arbitrary partial graph: connect only even-odd neighbours
      val n = db.seriesNames.size
      val adj = Array.tabulate(n, n)((i, j) => i != j && math.abs(i - j) == 1)
      val approx = AHTPGM.mine(db, cfg, CorrelationGraph(n, adj))
      assert(approx.patterns.keySet.subsetOf(exact.patterns.keySet), s"seed=$seed")
      // supports of surviving patterns are unchanged (only the search space shrank)
      for ((p, s) <- approx.patterns) assert(exact.patterns(p) == s, s"seed=$seed $p")
      val acc = AHTPGM.accuracy(exact, approx)
      assert(acc >= 0.0 && acc <= 1.0)
    }
  }

  test("same-series pairs survive once the series is in X_C (NMI(X;X)=1)") {
    // series X holds events 0 and 1 (0 always followed by 1); series Y holds event 2
    val rows = (0 until 4).flatMap(s => Seq((s, 0, 0L, 5L), (s, 1, 10L, 15L), (s, 2, 20L, 25L)))
    val db = TestDbs.db(3, rows)
      .copy(eventSeries = IndexedSeq(0, 0, 1), seriesNames = IndexedSeq("X", "Y"))
    val cfg = MiningConfig(sigma = 1.0, delta = 1.0)
    // no edges: X not in X_C, the intra-series pattern (0 -> 1) is pruned too
    assert(AHTPGM.mine(db, cfg, emptyGraph(2)).patterns.isEmpty)
    // X-Y edge: X joins X_C, so (0 -> 1) is mined although it is intra-series
    val withEdge = AHTPGM.mine(db, cfg, completeGraph(2))
    assert(withEdge.patterns.contains(Pattern.pair(0, Relation.Follow, 1)))
    assert(withEdge.patterns == HTPGM.mine(db, cfg).patterns)
  }

  test("graph vertex count must match the series count") {
    val db = TestDbs.random(1L)
    assertThrows[IllegalArgumentException](
      AHTPGM.mine(db, MiningConfig(0.5, 0.5), completeGraph(db.seriesNames.size + 1)))
  }

  test("accuracy metric: empty exact result counts as 1.0") {
    val db = TestDbs.random(1L)
    val cfg = MiningConfig(sigma = 1.0, delta = 1.0)
    val r = HTPGM.mine(db, cfg)
    if (r.patterns.isEmpty) assert(AHTPGM.accuracy(r, r) == 1.0)
    assert(AHTPGM.accuracy(r, r) == 1.0)
  }
}
