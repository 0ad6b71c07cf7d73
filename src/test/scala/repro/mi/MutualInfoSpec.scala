package repro.mi

import org.scalatest.funsuite.AnyFunSuite
import repro.data.PaperExample

/** Section V.A worked example over the Table I database. */
class MutualInfoSpec extends AnyFunSuite {

  private val db = PaperExample.symbolicDB
  private def s(name: String): SymbolicSeries = db.series(db.indexOf(name))

  test("marginals of the worked example: p(KOn)=17/36, p(TOn)=18/36") {
    assert(s("K").symbols.count(_ == 1) == 17)
    assert(s("T").symbols.count(_ == 1) == 18)
  }

  test("I(K;T) = 0.29 (paper's worked example, natural log)") {
    assert(math.abs(MutualInfo.mi(s("K"), s("T")) - 0.29) < 0.005)
  }

  test("NMI values match the worked example (paper rounds to 0.43/0.42)") {
    // exact values: 0.4220 and 0.4211 — the paper prints 0.43 and 0.42
    val kGivenT = MutualInfo.nmi(s("K"), s("T"))
    val tGivenK = MutualInfo.nmi(s("T"), s("K"))
    assert(math.abs(kGivenT - 0.422) < 0.005)
    assert(math.abs(tGivenK - 0.421) < 0.005)
    assert(kGivenT > tGivenK) // asymmetry direction: H(K) < H(T)
  }

  test("entropy of a fair binary series is ln 2") {
    assert(math.abs(MutualInfo.entropy(s("T")) - math.log(2)) < 1e-9)
  }

  test("MI with itself equals entropy; NMI with itself equals 1") {
    for (x <- Seq("K", "T", "M")) {
      assert(math.abs(MutualInfo.mi(s(x), s(x)) - MutualInfo.entropy(s(x))) < 1e-9)
      assert(math.abs(MutualInfo.nmi(s(x), s(x)) - 1.0) < 1e-9)
    }
  }

  test("MI is symmetric, NMI need not be") {
    assert(math.abs(MutualInfo.mi(s("K"), s("T")) - MutualInfo.mi(s("T"), s("K"))) < 1e-12)
    assert(MutualInfo.nmi(s("K"), s("T")) != MutualInfo.nmi(s("T"), s("K")))
  }

  test("MI of independent-ish constant series is 0; NMI handles zero entropy") {
    val c1 = SymbolicSeries("c1", Array.fill(10)(0), IndexedSeq("Off"))
    val c2 = SymbolicSeries("c2", Array.fill(10)(0), IndexedSeq("Off"))
    assert(MutualInfo.mi(c1, c2) == 0.0)
    assert(MutualInfo.nmi(c1, c2) == 0.0)
  }

  test("MI is non-negative and bounded by min entropy (Cover & Thomas)") {
    for (a <- Seq("K", "T", "M", "C", "I", "B"); b <- Seq("K", "T", "M", "C", "I", "B")) {
      val i = MutualInfo.mi(s(a), s(b))
      assert(i >= -1e-12)
      assert(i <= math.min(MutualInfo.entropy(s(a)), MutualInfo.entropy(s(b))) + 1e-12)
    }
  }

  test("pairScore is the min of both NMI directions") {
    val score = MutualInfo.pairScore(s("K"), s("T"))
    assert(score == math.min(MutualInfo.nmi(s("K"), s("T")), MutualInfo.nmi(s("T"), s("K"))))
  }

  test("mi rejects misaligned series") {
    val short = SymbolicSeries("x", Array(0, 1), IndexedSeq("Off", "On"))
    assertThrows[IllegalArgumentException](MutualInfo.mi(s("K"), short))
  }
}
