package repro.mi

import org.scalatest.funsuite.AnyFunSuite
import repro.data.PaperExample

class CorrelationGraphSpec extends AnyFunSuite {

  private val db = PaperExample.symbolicDB

  test("edges require both NMI directions >= mu (Def 5.5)") {
    val scores = CorrelationGraph.pairScores(db)
    val g = CorrelationGraph.build(db, 0.40)
    for (i <- 0 until g.n; j <- i + 1 until g.n) {
      assert(g.connected(i, j) == (scores((i, j)) >= 0.40), s"edge ($i,$j)")
      assert(g.connected(i, j) == g.connected(j, i))
    }
  }

  test("paper example: 6 series yield a 15-pair complete graph") {
    assert(CorrelationGraph.pairScores(db).size == 15)
  }

  test("K and T are correlated at mu=0.40 (Fig. 5 shows the K-T edge)") {
    val g = CorrelationGraph.build(db, 0.40)
    assert(g.connected(db.indexOf("K"), db.indexOf("T")))
  }

  test("M and C are strongly correlated (near-identical series in Table I)") {
    val scores = CorrelationGraph.pairScores(db)
    val m = db.indexOf("M"); val c = db.indexOf("C")
    val key = (math.min(m, c), math.max(m, c))
    assert(scores(key) > 0.5)
  }

  test("density counts edges over the complete graph (Def 5.6)") {
    val g = CorrelationGraph.build(db, 0.40)
    assert(math.abs(g.density - g.edgeCount / 15.0) < 1e-12)
  }

  test("muForDensity keeps the requested fraction of edges") {
    val scores = CorrelationGraph.pairScores(db)
    for (d <- Seq(0.2, 0.4, 0.6, 0.8, 1.0)) {
      val mu = CorrelationGraph.muForDensity(scores, d)
      val g = CorrelationGraph.fromScores(db.series.size, scores, mu)
      val want = math.max(1, math.ceil(d * 15 - 1e-9).toInt)
      // ties may keep a few extra edges, never fewer
      assert(g.edgeCount >= want, s"density=$d")
      assert(g.edgeCount <= want + scores.values.toSeq.count(_ == mu), s"density=$d")
    }
  }

  test("mu=epsilon keeps every pair with positive score; extreme mu prunes all") {
    val scores = CorrelationGraph.pairScores(db)
    val all = CorrelationGraph.fromScores(6, scores, mu = -1.0)
    assert(all.edgeCount == 15)
    val none = CorrelationGraph.fromScores(6, scores, mu = 1.1)
    assert(none.edgeCount == 0)
    assert(none.correlatedVertices.isEmpty)
  }

  test("correlatedVertices lists only vertices with an incident edge") {
    val adj = Array.fill(3, 3)(false)
    adj(0)(1) = true; adj(1)(0) = true
    val g = CorrelationGraph(3, adj)
    assert(g.correlatedVertices == Set(0, 1))
  }

  test("muForDensity validates the density range") {
    assertThrows[IllegalArgumentException](CorrelationGraph.muForDensity(Map.empty, 0.0))
    assertThrows[IllegalArgumentException](CorrelationGraph.muForDensity(Map.empty, 1.5))
  }
}
