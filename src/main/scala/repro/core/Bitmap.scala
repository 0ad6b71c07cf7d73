package repro.core

/** Fixed-width bitmap over sequence ids, as used by HTPGM for support
  * counting (Section IV.C "Efficient bitmap indexing").
  *
  * A bitmap has one bit per sequence in D_SEQ; `b(i) = 1` iff the indexed
  * event/pattern occurs in sequence `i`. AND + popcount gives joint support
  * in O(|D_SEQ| / 64) words.
  */
final class Bitmap private (val words: Array[Long], val size: Int) {

  def get(i: Int): Boolean = {
    require(i >= 0 && i < size, s"bit $i out of range [0,$size)")
    (words(i >> 6) & (1L << (i & 63))) != 0L
  }

  /** Number of set bits = support. */
  def cardinality: Int = {
    var c = 0; var w = 0
    while (w < words.length) { c += java.lang.Long.bitCount(words(w)); w += 1 }
    c
  }

  /** Joint bitmap: sequences where both this and `other` are present. */
  def and(other: Bitmap): Bitmap = {
    require(other.size == size, "bitmap size mismatch")
    val out = new Array[Long](words.length)
    var w = 0
    while (w < words.length) { out(w) = words(w) & other.words(w); w += 1 }
    new Bitmap(out, size)
  }

  /** Indices of set bits, ascending — the sequences to scan at L2/Lk. */
  def setBits: Array[Int] = {
    val out = new Array[Int](cardinality)
    var n = 0; var i = 0
    while (i < size) { if (get(i)) { out(n) = i; n += 1 }; i += 1 }
    out
  }

  /** Heap bytes retained by this bitmap (for Table VIII accounting). */
  def approxBytes: Long = 16L + 8L * words.length

  override def equals(o: Any): Boolean = o match {
    case b: Bitmap => b.size == size && java.util.Arrays.equals(b.words, words)
    case _         => false
  }
  override def hashCode: Int = java.util.Arrays.hashCode(words) * 31 + size
  override def toString: String = (0 until size).map(i => if (get(i)) '1' else '0').mkString("[", "", "]")
}

object Bitmap {
  /** Build a bitmap of `size` bits with the given indices set. */
  def of(size: Int, setIdx: Iterable[Int]): Bitmap = {
    val words = new Array[Long]((size + 63) >> 6)
    setIdx.foreach { i =>
      require(i >= 0 && i < size, s"bit $i out of range [0,$size)")
      words(i >> 6) |= (1L << (i & 63))
    }
    new Bitmap(words, size)
  }

  def empty(size: Int): Bitmap = new Bitmap(new Array[Long]((size + 63) >> 6), size)
}
