package repro.mi

import org.apache.spark.sql.DataFrame
import org.apache.spark.sql.functions._

/** A symbolic time series (Def 3.2): dictionary-encoded symbols, one per
  * time slot, plus the printable alphabet.
  */
final case class SymbolicSeries(name: String, symbols: Array[Int], alphabet: IndexedSeq[String]) {
  require(symbols.forall(s => s >= 0 && s < alphabet.size), s"symbol out of alphabet in $name")
}

/** The symbolic database D_SYB (Def 3.3): aligned symbolic series. */
final case class SymbolicDB(series: IndexedSeq[SymbolicSeries]) {
  require(series.map(_.symbols.length).distinct.size <= 1, "series must be aligned (equal length)")
  def length: Int = series.headOption.map(_.symbols.length).getOrElse(0)
  def indexOf(name: String): Int = series.indexWhere(_.name == name)
}

/** Entropy, mutual information and normalized mutual information over
  * symbolic series (Section V.A), plus a DataFrame-native joint/marginal
  * counting path for the distributed pipeline.
  */
object MutualInfo {

  private def ln(x: Double): Double = math.log(x) // natural log: matches the paper's worked example I(K;T)=0.29 nats; NMI is base-invariant

  /** Shannon entropy H(X) of a symbolic series (Eq. 7), in nats. */
  def entropy(x: SymbolicSeries): Double = {
    val n = x.symbols.length.toDouble
    x.symbols.groupBy(identity).values.map { g =>
      val p = g.length / n
      -p * ln(p)
    }.sum
  }

  /** Mutual information I(X;Y) (Eq. 9), in nats. Series must be aligned. */
  def mi(x: SymbolicSeries, y: SymbolicSeries): Double = {
    require(x.symbols.length == y.symbols.length, "series must be aligned")
    val n = x.symbols.length.toDouble
    val joint = x.symbols.zip(y.symbols).groupBy(identity).view.mapValues(_.length / n).toMap
    val px = x.symbols.groupBy(identity).view.mapValues(_.length / n).toMap
    val py = y.symbols.groupBy(identity).view.mapValues(_.length / n).toMap
    joint.iterator.map { case ((a, b), pxy) =>
      pxy * ln(pxy / (px(a) * py(b)))
    }.sum
  }

  /** Normalized MI Ĩ(X;Y) = I(X;Y)/H(X) (Eq. 10). Not symmetric. A series
    * with zero entropy (constant) shares no information: returns 0.
    */
  def nmi(x: SymbolicSeries, y: SymbolicSeries): Double = {
    val h = entropy(x)
    if (h == 0.0) 0.0 else mi(x, y) / h
  }

  /** Symmetric pair score min(Ĩ(X;Y), Ĩ(Y;X)) — an edge of the correlation
    * graph (Def 5.5) exists iff this score ≥ μ.
    */
  def pairScore(x: SymbolicSeries, y: SymbolicSeries): Double =
    math.min(nmi(x, y), nmi(y, x))

  /** DataFrame-native NMI over a symbolized DataFrame with columns
    * (series: string, t: long, symbol: string). Joint distributions are
    * computed by a self-join on the time slot (one shuffle), marginals by a
    * grouped count; the per-pair NMI arithmetic (tiny: |series|² × |Σ|²
    * cells) runs on the driver. Returns Ĩ(a;b) for every ordered pair of
    * distinct series names.
    */
  def nmiMatrix(sym: DataFrame): Map[(String, String), Double] = {
    val marg = sym.groupBy("series", "symbol").count()
      .collect().map(r => (r.getString(0), r.getString(1)) -> r.getLong(2)).toMap
    val joint = sym.as("a").join(sym.as("b"),
        col("a.t") === col("b.t") && col("a.series") < col("b.series"))
      .groupBy(col("a.series").as("sa"), col("b.series").as("sb"),
               col("a.symbol").as("xa"), col("b.symbol").as("xb"))
      .count()
      .collect()
      .map(r => (r.getString(0), r.getString(1), r.getString(2), r.getString(3)) -> r.getLong(4))
      .toMap

    val names = marg.keysIterator.map(_._1).toSeq.distinct.sorted
    val total = marg.groupBy(_._1._1).map { case (s, m) => s -> m.values.sum }
    def h(s: String): Double = marg.collect { case ((`s`, _), c) =>
      val p = c.toDouble / total(s); -p * ln(p)
    }.sum

    val out = Map.newBuilder[(String, String), Double]
    for (a <- names; b <- names if a < b) {
      val cells = joint.collect { case ((`a`, `b`, xa, xb), c) => (xa, xb, c) }
      val n = cells.map(_._3).sum.toDouble
      val i = cells.iterator.map { case (xa, xb, c) =>
        val pxy = c / n
        val px = marg((a, xa)).toDouble / total(a)
        val py = marg((b, xb)).toDouble / total(b)
        pxy * ln(pxy / (px * py))
      }.sum
      val ha = h(a); val hb = h(b)
      out += (a, b) -> (if (ha == 0) 0.0 else i / ha)
      out += (b, a) -> (if (hb == 0) 0.0 else i / hb)
    }
    out.result()
  }
}
