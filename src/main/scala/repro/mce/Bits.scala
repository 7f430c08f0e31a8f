package repro.mce

/** Minimal fixed-width bitset helpers over raw `Array[Long]`.
  *
  * The branch-and-bound kernels spend almost all their time in set
  * intersections over per-branch vertex sets, so these are implemented
  * as tight loops on long words (the same trick the paper's C++ code
  * uses). All arrays passed to one call must have the same word length.
  */
object Bits {

  def words(nBits: Int): Int = (nBits + 63) >>> 6

  def make(nBits: Int): Array[Long] = new Array[Long](words(nBits))

  def set(a: Array[Long], i: Int): Unit = a(i >>> 6) |= (1L << (i & 63))

  def clear(a: Array[Long], i: Int): Unit = a(i >>> 6) &= ~(1L << (i & 63))

  def get(a: Array[Long], i: Int): Boolean = (a(i >>> 6) & (1L << (i & 63))) != 0L

  def copy(a: Array[Long]): Array[Long] = java.util.Arrays.copyOf(a, a.length)

  def copyInto(dest: Array[Long], src: Array[Long]): Unit =
    System.arraycopy(src, 0, dest, 0, dest.length)

  def isEmpty(a: Array[Long]): Boolean = {
    var i = 0
    while (i < a.length) { if (a(i) != 0L) return false; i += 1 }
    true
  }

  def count(a: Array[Long]): Int = {
    var c = 0; var i = 0
    while (i < a.length) { c += java.lang.Long.bitCount(a(i)); i += 1 }
    c
  }

  def countAnd(a: Array[Long], b: Array[Long]): Int = {
    var c = 0; var i = 0
    while (i < a.length) { c += java.lang.Long.bitCount(a(i) & b(i)); i += 1 }
    c
  }

  /** dest = a & b (dest may alias a or b). */
  def andInto(dest: Array[Long], a: Array[Long], b: Array[Long]): Unit = {
    var i = 0
    while (i < dest.length) { dest(i) = a(i) & b(i); i += 1 }
  }

  def and(a: Array[Long], b: Array[Long]): Array[Long] = {
    val d = new Array[Long](a.length); andInto(d, a, b); d
  }

  /** dest = a & ~b. */
  def andNotInto(dest: Array[Long], a: Array[Long], b: Array[Long]): Unit = {
    var i = 0
    while (i < dest.length) { dest(i) = a(i) & ~b(i); i += 1 }
  }

  def andNot(a: Array[Long], b: Array[Long]): Array[Long] = {
    val d = new Array[Long](a.length); andNotInto(d, a, b); d
  }

  def orInto(dest: Array[Long], a: Array[Long], b: Array[Long]): Unit = {
    var i = 0
    while (i < dest.length) { dest(i) = a(i) | b(i); i += 1 }
  }

  /** dest = (x & fullRow) | (c & fullRow & ~survRow) — the exclusion-set
    * update of the dual-adjacency kernels in a single pass.
    */
  def mixXInto(dest: Array[Long], x: Array[Long], c: Array[Long],
               fullRow: Array[Long], survRow: Array[Long]): Unit = {
    var i = 0
    while (i < dest.length) {
      dest(i) = (x(i) & fullRow(i)) | (c(i) & fullRow(i) & ~survRow(i))
      i += 1
    }
  }

  /** First set bit, or -1. */
  def first(a: Array[Long]): Int = {
    var i = 0
    while (i < a.length) {
      if (a(i) != 0L) return (i << 6) + java.lang.Long.numberOfTrailingZeros(a(i))
      i += 1
    }
    -1
  }

  /** Iterate set bits in ascending order. */
  def foreachBit(a: Array[Long])(f: Int => Unit): Unit = {
    var i = 0
    while (i < a.length) {
      var w = a(i)
      while (w != 0L) {
        val b = java.lang.Long.numberOfTrailingZeros(w)
        f((i << 6) + b)
        w &= w - 1
      }
      i += 1
    }
  }

  /** Collect set bits into an array. */
  def toArray(a: Array[Long]): Array[Int] = {
    val out = new Array[Int](count(a))
    var k = 0
    foreachBit(a) { b => out(k) = b; k += 1 }
    out
  }

  /** True iff a ⊆ b. */
  def subsetOf(a: Array[Long], b: Array[Long]): Boolean = {
    var i = 0
    while (i < a.length) { if ((a(i) & ~b(i)) != 0L) return false; i += 1 }
    true
  }

  // ---- row variants: the second operand lives at `off` inside a flat
  // row-major matrix (BranchGraph stores adjacency this way so a branch
  // costs two allocations instead of one per vertex).

  def setRow(flat: Array[Long], off: Int, i: Int): Unit =
    flat(off + (i >>> 6)) |= (1L << (i & 63))

  def clear2d(flat: Array[Long], off: Int, i: Int): Unit =
    flat(off + (i >>> 6)) &= ~(1L << (i & 63))

  def getRow(flat: Array[Long], off: Int, i: Int): Boolean =
    (flat(off + (i >>> 6)) & (1L << (i & 63))) != 0L

  def countAndRow(set: Array[Long], flat: Array[Long], off: Int): Int = {
    var c = 0; var i = 0
    while (i < set.length) { c += java.lang.Long.bitCount(set(i) & flat(off + i)); i += 1 }
    c
  }

  /** dest = set & row. */
  def andIntoRow(dest: Array[Long], set: Array[Long], flat: Array[Long], off: Int): Unit = {
    var i = 0
    while (i < dest.length) { dest(i) = set(i) & flat(off + i); i += 1 }
  }

  def andRow(set: Array[Long], flat: Array[Long], off: Int): Array[Long] = {
    val d = new Array[Long](set.length); andIntoRow(d, set, flat, off); d
  }

  /** dest = set & ~row (into-variant for pooled buffers). */
  def andNotIntoRow(dest: Array[Long], set: Array[Long], flat: Array[Long], off: Int): Unit = {
    var i = 0
    while (i < dest.length) { dest(i) = set(i) & ~flat(off + i); i += 1 }
  }

  /** dest = set & ~row. */
  def andNotRow(set: Array[Long], flat: Array[Long], off: Int): Array[Long] = {
    val d = new Array[Long](set.length)
    var i = 0
    while (i < d.length) { d(i) = set(i) & ~flat(off + i); i += 1 }
    d
  }

  /** dest = (x & fullRow) | (c & fullRow & ~survRow); `c` may be shorter
    * than dest (missing words are zero) — branch layouts put candidates
    * first, so candidate sets span fewer words.
    */
  def mixXIntoRow(dest: Array[Long], x: Array[Long], c: Array[Long],
                  fullFlat: Array[Long], survFlat: Array[Long], off: Int): Unit = {
    var i = 0
    while (i < dest.length) {
      val f = fullFlat(off + i)
      val cw = if (i < c.length) c(i) else 0L
      dest(i) = (x(i) & f) | (cw & f & ~survFlat(off + i))
      i += 1
    }
  }

  /** dest = a | b with b possibly shorter than dest/a. */
  def orIntoMixed(dest: Array[Long], a: Array[Long], b: Array[Long]): Unit = {
    var i = 0
    while (i < dest.length) {
      dest(i) = a(i) | (if (i < b.length) b(i) else 0L)
      i += 1
    }
  }

  /** dest = a & ~b with b possibly shorter than a. */
  def andNotMixed(a: Array[Long], b: Array[Long]): Array[Long] = {
    val d = new Array[Long](a.length)
    var i = 0
    while (i < a.length) {
      d(i) = a(i) & ~(if (i < b.length) b(i) else 0L)
      i += 1
    }
    d
  }
}
