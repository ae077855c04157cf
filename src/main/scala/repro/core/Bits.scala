package repro.core

/** Word-array bitset helpers for the facen kernel's partial adjacency
  * matrix. Masks for many vertices are packed into one flat `Array[Long]`;
  * every operation takes an explicit word offset (`base`) and word count.
  */
object Bits {

  def words(nBits: Int): Int = (nBits + 63) >>> 6

  def setBit(arr: Array[Long], base: Int, i: Int): Unit =
    arr(base + (i >>> 6)) |= 1L << (i & 63)

  def clearBit(arr: Array[Long], base: Int, i: Int): Unit =
    arr(base + (i >>> 6)) &= ~(1L << (i & 63))

  def testBit(arr: Array[Long], base: Int, i: Int): Boolean =
    (arr(base + (i >>> 6)) & (1L << (i & 63))) != 0L

  def isEmpty(arr: Array[Long], base: Int, w: Int): Boolean = {
    var i = 0
    while (i < w) { if (arr(base + i) != 0L) return false; i += 1 }
    true
  }

  def popcount(arr: Array[Long], base: Int, w: Int): Int = {
    var c = 0
    var i = 0
    while (i < w) { c += java.lang.Long.bitCount(arr(base + i)); i += 1 }
    c
  }

  /** Popcount of `a[aBase..] & b[bBase..]` over `w` words. */
  def andPopcount(a: Array[Long], aBase: Int, b: Array[Long], bBase: Int, w: Int): Int = {
    var c = 0
    var i = 0
    while (i < w) { c += java.lang.Long.bitCount(a(aBase + i) & b(bBase + i)); i += 1 }
    c
  }

  /** Fresh `w`-word array holding `a[aBase..] & b[bBase..]`. */
  def and(a: Array[Long], aBase: Int, b: Array[Long], bBase: Int, w: Int): Array[Long] = {
    val out = new Array[Long](w)
    var i = 0
    while (i < w) { out(i) = a(aBase + i) & b(bBase + i); i += 1 }
    out
  }

  /** `dst |= src[base..]` over `w` words. */
  def orInto(dst: Array[Long], src: Array[Long], base: Int, w: Int): Unit = {
    var i = 0
    while (i < w) { dst(i) |= src(base + i); i += 1 }
  }

  /** Apply `f` to each set-bit index of `arr[base..]`, ascending. */
  def forEachBit(arr: Array[Long], base: Int, w: Int)(f: Int => Unit): Unit = {
    var i = 0
    while (i < w) {
      var word = arr(base + i)
      while (word != 0L) {
        val b = java.lang.Long.numberOfTrailingZeros(word)
        f((i << 6) + b)
        word &= word - 1
      }
      i += 1
    }
  }

  /** Index of the single set bit of `a[aBase..] & b[bBase..]` (callers must
    * know the popcount is exactly 1).
    */
  def singleBitOfAnd(a: Array[Long], aBase: Int, b: Array[Long], bBase: Int, w: Int): Int = {
    var i = 0
    while (i < w) {
      val word = a(aBase + i) & b(bBase + i)
      if (word != 0L) return (i << 6) + java.lang.Long.numberOfTrailingZeros(word)
      i += 1
    }
    throw new IllegalStateException("no set bit")
  }
}
