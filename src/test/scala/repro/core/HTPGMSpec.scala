package repro.core

import org.scalatest.funsuite.AnyFunSuite
import repro.TestDbs

/** E-HTPGM unit tests over hand-built local databases (no Spark). */
class HTPGMSpec extends AnyFunSuite {

  private val defaults = MiningConfig(sigma = 0.6, delta = 0.5)

  private def noPrune(c: MiningConfig) = c.copy(pruneApriori = false, pruneTrans = false)

  test("hand-checked example: exact pattern set and supports") {
    val db = TestDbs.handChecked
    val res = HTPGM.mine(db, defaults)
    // events: E0=A, E1=B, E2=C; A contains B in seqs 0,1; A,B follow C in 0,1
    val expected = Map(
      Pattern.pair(0, Relation.Contain, 1) -> 2,
      Pattern.pair(0, Relation.Follow, 2) -> 2,
      Pattern.pair(1, Relation.Follow, 2) -> 2,
      Pattern(Vector(0, 1, 2),
        Vector(Relation.Contain, Relation.Follow, Relation.Follow)) -> 2)
    assert(res.patterns == expected)
    assert(res.eventSupport == Map(0 -> 3, 1 -> 3, 2 -> 2))
    assert(res.stats.maxLevelReached == 3)
  }

  test("hand-checked example: confidences per Def 3.16") {
    val db = TestDbs.handChecked
    val res = HTPGM.mine(db, defaults)
    val p = Pattern.pair(0, Relation.Contain, 1)
    assert(math.abs(res.confidence(p, res.patterns(p)) - 2.0 / 3.0) < 1e-9)
  }

  test("self-relations: an event can relate to itself (Section III.B)") {
    val db = TestDbs.db(1, Seq(
      (0, 0, 0L, 5L), (0, 0, 10L, 15L),
      (1, 0, 0L, 5L), (1, 0, 10L, 15L)))
    val res = HTPGM.mine(db, MiningConfig(sigma = 1.0, delta = 1.0))
    assert(res.patterns.contains(Pattern.pair(0, Relation.Follow, 0)))
    assert(res.patterns(Pattern.pair(0, Relation.Follow, 0)) == 2)
  }

  test("t_max constraint invalidates distant relations (Section III.C)") {
    val db = TestDbs.db(2, Seq(
      (0, 0, 0L, 5L), (0, 1, 100L, 105L),
      (1, 0, 0L, 5L), (1, 1, 100L, 105L)))
    val wide = HTPGM.mine(db, MiningConfig(sigma = 1.0, delta = 1.0))
    assert(wide.patterns.contains(Pattern.pair(0, Relation.Follow, 1)))
    val tight = HTPGM.mine(db, MiningConfig(sigma = 1.0, delta = 1.0, tMax = 50L))
    assert(tight.patterns.isEmpty)
  }

  test("support threshold is a ceiling over relative sigma") {
    assert(MiningConfig(sigma = 0.7, delta = 0.5).minSupp(4) == 3)
    assert(MiningConfig(sigma = 0.5, delta = 0.5).minSupp(4) == 2)
    assert(MiningConfig(sigma = 0.01, delta = 0.5).minSupp(4) == 1)
    assert(MiningConfig(sigma = 1.0, delta = 0.5).minSupp(4) == 4)
  }

  test("all four pruning configurations return identical results (exactness of Lemmas 2-7)") {
    for (seed <- 1L to 10L) {
      val db = TestDbs.random(seed)
      val cfg = MiningConfig(sigma = 0.4, delta = 0.4)
      val all = HTPGM.mine(db, cfg)
      val none = HTPGM.mine(db, noPrune(cfg))
      val apriori = HTPGM.mine(db, cfg.copy(pruneTrans = false))
      val trans = HTPGM.mine(db, cfg.copy(pruneApriori = false))
      assert(all.patterns == none.patterns, s"seed=$seed all vs noPrune")
      assert(all.patterns == apriori.patterns, s"seed=$seed all vs apriori")
      assert(all.patterns == trans.patterns, s"seed=$seed all vs trans")
    }
  }

  test("matches the brute-force miner on random databases") {
    for (seed <- 1L to 8L) {
      val db = TestDbs.random(seed, nSeqs = 5, nEvents = 4, pPresent = 0.6, horizon = 20)
      val cfg = MiningConfig(sigma = 0.4, delta = 0.4, maxLevel = 4)
      val got = HTPGM.mine(db, cfg).patterns
      val want = TestDbs.naiveMine(db, cfg, maxSize = 4)
      assert(got == want, s"seed=$seed")
    }
  }

  test("matches the brute-force miner with non-default eps/d_o") {
    for (seed <- 1L to 5L) {
      val db = TestDbs.random(seed, nSeqs = 5, nEvents = 4, pPresent = 0.6, horizon = 25)
      val cfg = MiningConfig(sigma = 0.4, delta = 0.4, eps = 1L, dO = 3L, maxLevel = 3)
      assert(HTPGM.mine(db, cfg).patterns == TestDbs.naiveMine(db, cfg, 3), s"seed=$seed")
    }
  }

  test("monotonicity: higher sigma and delta yield subsets") {
    val db = TestDbs.random(3L, nSeqs = 8, nEvents = 6)
    val low = HTPGM.mine(db, MiningConfig(sigma = 0.3, delta = 0.3))
    val hiS = HTPGM.mine(db, MiningConfig(sigma = 0.6, delta = 0.3))
    val hiD = HTPGM.mine(db, MiningConfig(sigma = 0.3, delta = 0.7))
    assert(hiS.patterns.keySet.subsetOf(low.patterns.keySet))
    assert(hiD.patterns.keySet.subsetOf(low.patterns.keySet))
  }

  test("every reported pattern satisfies both thresholds") {
    val db = TestDbs.random(9L, nSeqs = 8, nEvents = 6)
    val cfg = MiningConfig(sigma = 0.4, delta = 0.5)
    val res = HTPGM.mine(db, cfg)
    val minSupp = cfg.minSupp(db.size)
    for ((p, s) <- res.patterns) {
      assert(s >= minSupp)
      assert(res.confidence(p, s) >= cfg.delta)
    }
  }

  test("maxLevel caps the pattern length") {
    val db = TestDbs.random(4L, nSeqs = 6, nEvents = 6)
    val capped = HTPGM.mine(db, MiningConfig(sigma = 0.3, delta = 0.3, maxLevel = 2))
    assert(capped.patterns.keys.forall(_.size <= 2))
  }

  test("pruning reduces work: candidate patterns with All <= NoPrune") {
    val db = TestDbs.random(5L, nSeqs = 10, nEvents = 8)
    val cfg = MiningConfig(sigma = 0.4, delta = 0.6)
    val all = HTPGM.mine(db, cfg)
    val none = HTPGM.mine(db, noPrune(cfg))
    assert(all.stats.candidatePatterns <= none.stats.candidatePatterns)
    assert(all.stats.structureBytes <= none.stats.structureBytes)
  }

  test("empty result when sigma cannot be met") {
    val db = TestDbs.db(2, Seq((0, 0, 0L, 5L), (1, 1, 0L, 5L)))
    val res = HTPGM.mine(db, MiningConfig(sigma = 1.0, delta = 1.0))
    assert(res.patterns.isEmpty)
    assert(res.eventSupport.isEmpty)
  }

  test("ranked output sorts by support then confidence") {
    val db = TestDbs.random(6L, nSeqs = 8, nEvents = 6)
    val res = HTPGM.mine(db, MiningConfig(sigma = 0.3, delta = 0.3))
    val ranked = res.ranked
    assert(ranked.map(-_._2) == ranked.map(-_._2).sorted)
  }
}
