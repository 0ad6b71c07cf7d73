package repro.mi

import repro.SparkSpec
import repro.data.PaperExample

/** DataFrame-native NMI equals the local computation. */
class NmiMatrixSpec extends SparkSpec {

  test("nmiMatrix on the paper example matches the local NMI for every pair") {
    val m = MutualInfo.nmiMatrix(PaperExample.symbolic(spark))
    val db = PaperExample.symbolicDB
    val names = PaperExample.seriesNames
    for (a <- names; b <- names if a != b) {
      val local = MutualInfo.nmi(db.series(db.indexOf(a)), db.series(db.indexOf(b)))
      assert(math.abs(m((a, b)) - local) < 1e-9, s"($a,$b)")
    }
  }

  test("nmiMatrix reproduces the worked example numbers for (K,T)") {
    val m = MutualInfo.nmiMatrix(PaperExample.symbolic(spark))
    assert(math.abs(m(("K", "T")) - 0.422) < 0.005)
    assert(math.abs(m(("T", "K")) - 0.421) < 0.005)
  }

  test("nmiMatrix returns both directions for every unordered pair") {
    val m = MutualInfo.nmiMatrix(PaperExample.symbolic(spark))
    assert(m.size == 6 * 5) // ordered pairs of 6 series
    for (((a, b), _) <- m) assert(m.contains((b, a)))
  }
}
