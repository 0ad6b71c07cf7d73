package repro.bench

import repro.SparkSpec
import repro.experiments._

/** Table IV: dataset characteristics. Prints the table and asserts the
  * structural facts the paper's Table IV conveys.
  */
class TableIVBench extends SparkSpec {
  test("Table IV: characteristics of the datasets") {
    println(TableIV.run(spark))
    val ds = Workloads.all(spark)
    val byName = ds.map(d => d.name -> d).toMap
    // multi-state city variables yield the most distinct events per variable
    val city = byName("SmartCity-like")
    assert(city.numDistinctEvents.toDouble / city.numVariables >
      byName("NIST-like").numDistinctEvents.toDouble / byName("NIST-like").numVariables)
    // every dataset is non-trivial
    for (d <- ds) {
      assert(d.numSequences >= 50, d.name)
      assert(d.db.avgInstancesPerSequence > 10, d.name)
    }
  }
}

/** Table V: number of extracted patterns over σ×δ ∈ {20,40,60,80}². */
class TableVBench extends SparkSpec {
  test("Table V: summary of extracted patterns") {
    println(TableV.run(spark))
    for (ds <- Workloads.all(spark)) {
      val cs = TableV.counts(ds)
      // counts decrease (weakly) in both support and confidence — the
      // monotone structure of the paper's Table V
      for (s <- Tables.WideGrid; d <- Tables.WideGrid) {
        for (s2 <- Tables.WideGrid if s2 > s) assert(cs((s2, d)) <= cs((s, d)), s"${ds.name} σ")
        for (d2 <- Tables.WideGrid if d2 > d) assert(cs((s, d2)) <= cs((s, d)), s"${ds.name} δ")
      }
      assert(cs((20, 20)) > 0, s"${ds.name}: loosest cell must find patterns")
    }
  }
}

/** Table VI: interesting patterns rendered with support and confidence. */
class TableVIBench extends SparkSpec {
  test("Table VI: summary of interesting patterns") {
    val out = TableVI.run(spark)
    println(out)
    // multi-event patterns with explicit relations appear, as in P1-P17
    assert(out.contains("supp="))
    assert(Seq("->", ">=", "><").exists(out.contains), "expects relation glyphs")
    for (ds <- Seq(Workloads.nist(spark), Workloads.city(spark))) {
      val top = TableVI.interesting(ds, 6)
      assert(top.nonEmpty, ds.name)
    }
  }
}
