package repro.baselines

import org.scalatest.funsuite.AnyFunSuite
import repro.TestDbs
import repro.core.{HTPGM, MiningConfig}

/** Every baseline must report exactly the pattern sets and supports of the
  * exact E-HTPGM — they are alternative algorithms for the same problem
  * (Section VI.A.3 uses them only for quantitative comparison).
  */
class BaselinesSpec extends AnyFunSuite {

  private val miners: Seq[(String, (repro.core.SequenceDB, MiningConfig) => repro.core.MiningResult)] =
    Seq("H-DFS" -> (HDFS.mine(_, _)),
        "IEMiner" -> (IEMiner.mine(_, _)),
        "TPMiner" -> (TPMiner.mine(_, _)))

  test("baselines equal E-HTPGM on the hand-checked example") {
    val db = TestDbs.handChecked
    val cfg = MiningConfig(sigma = 0.6, delta = 0.5)
    val exact = HTPGM.mine(db, cfg)
    for ((name, m) <- miners) {
      val r = m(db, cfg)
      assert(r.patterns == exact.patterns, name)
      assert(r.eventSupport == exact.eventSupport, name)
    }
  }

  test("baselines equal E-HTPGM across random databases and thresholds") {
    for (seed <- 1L to 8L; (sigma, delta) <- Seq((0.3, 0.3), (0.5, 0.5), (0.7, 0.8))) {
      val db = TestDbs.random(seed, nSeqs = 6, nEvents = 5)
      val cfg = MiningConfig(sigma = sigma, delta = delta)
      val exact = HTPGM.mine(db, cfg)
      for ((name, m) <- miners)
        assert(m(db, cfg).patterns == exact.patterns, s"$name seed=$seed s=$sigma d=$delta")
    }
  }

  test("baselines equal E-HTPGM with non-default eps/d_o/t_max") {
    for (seed <- 1L to 4L) {
      val db = TestDbs.random(seed, nSeqs = 5, nEvents = 4, horizon = 25)
      val cfg = MiningConfig(sigma = 0.4, delta = 0.4, eps = 1L, dO = 3L, tMax = 20L)
      val exact = HTPGM.mine(db, cfg)
      for ((name, m) <- miners)
        assert(m(db, cfg).patterns == exact.patterns, s"$name seed=$seed")
    }
  }

  test("baselines match the brute-force miner directly") {
    for (seed <- 1L to 4L) {
      val db = TestDbs.random(seed, nSeqs = 5, nEvents = 4, pPresent = 0.6, horizon = 20)
      val cfg = MiningConfig(sigma = 0.4, delta = 0.4, maxLevel = 4)
      val want = TestDbs.naiveMine(db, cfg, maxSize = 4)
      for ((name, m) <- miners)
        assert(m(db, cfg).patterns == want, s"$name seed=$seed")
    }
  }

  test("self-relations handled by all baselines") {
    val db = TestDbs.db(1, Seq(
      (0, 0, 0L, 5L), (0, 0, 10L, 15L),
      (1, 0, 0L, 5L), (1, 0, 10L, 15L)))
    val cfg = MiningConfig(sigma = 1.0, delta = 1.0)
    val exact = HTPGM.mine(db, cfg)
    assert(exact.patterns.nonEmpty)
    for ((name, m) <- miners) assert(m(db, cfg).patterns == exact.patterns, name)
  }

  test("baselines mine by support and post-filter by confidence: stats reflect extra work") {
    val db = TestDbs.random(7L, nSeqs = 10, nEvents = 8)
    // high confidence threshold: HTPGM prunes by delta during mining, the
    // baselines cannot — they must generate at least as many candidates
    val cfg = MiningConfig(sigma = 0.3, delta = 0.9)
    val exact = HTPGM.mine(db, cfg)
    for ((name, m) <- miners) {
      val r = m(db, cfg)
      assert(r.patterns == exact.patterns, name)
      assert(r.stats.candidatePatterns >= exact.stats.candidatePatterns, name)
    }
  }
}
