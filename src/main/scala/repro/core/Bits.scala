package repro.core

/** Long-array bitmask utilities.
  *
  * Qd-tree construction repeatedly splits row sets by candidate cut
  * predicates. We pre-evaluate each candidate cut once over the whole
  * construction sample into a bitmask; a node's row set is another bitmask,
  * so legality checks and splits are word-wise AND / popcount — the Scala
  * analogue of the paper's "vectorized instructions" (§3.1).
  */
object Bits {
  /** Number of 64-bit words needed for `n` bits. */
  def words(n: Int): Int = (n + 63) >>> 6

  def alloc(n: Int): Array[Long] = new Array[Long](words(n))

  /** Mask with bits [0, n) all set. */
  def full(n: Int): Array[Long] = {
    val b = alloc(n)
    var i = 0
    while (i < b.length) { b(i) = -1L; i += 1 }
    val rem = n & 63
    if (rem != 0 && b.length > 0) b(b.length - 1) = (1L << rem) - 1
    b
  }

  @inline def set(b: Array[Long], i: Int): Unit = b(i >>> 6) |= (1L << (i & 63))

  @inline def get(b: Array[Long], i: Int): Boolean = (b(i >>> 6) & (1L << (i & 63))) != 0

  def and(a: Array[Long], b: Array[Long]): Array[Long] = {
    val r = new Array[Long](a.length)
    var i = 0
    while (i < a.length) { r(i) = a(i) & b(i); i += 1 }
    r
  }

  def andNot(a: Array[Long], b: Array[Long]): Array[Long] = {
    val r = new Array[Long](a.length)
    var i = 0
    while (i < a.length) { r(i) = a(i) & ~b(i); i += 1 }
    r
  }

  def count(b: Array[Long]): Int = {
    var c = 0
    var i = 0
    while (i < b.length) { c += java.lang.Long.bitCount(b(i)); i += 1 }
    c
  }

  def countAnd(a: Array[Long], b: Array[Long]): Int = {
    var c = 0
    var i = 0
    while (i < a.length) { c += java.lang.Long.bitCount(a(i) & b(i)); i += 1 }
    c
  }

  /** Iterate indices of set bits in ascending order. */
  def foreach(b: Array[Long])(f: Int => Unit): Unit = {
    var w = 0
    while (w < b.length) {
      var bits = b(w)
      while (bits != 0) {
        val t = bits & -bits
        f((w << 6) + java.lang.Long.numberOfTrailingZeros(bits))
        bits ^= t
      }
      w += 1
    }
  }

  /** Indices of set bits as an array. */
  def toIndices(b: Array[Long]): Array[Int] = {
    val out = new Array[Int](count(b))
    var k = 0
    foreach(b) { i => out(k) = i; k += 1 }
    out
  }
}
