package repro.util

/** Fixed-size bit vectors backed by `Array[Byte]`.
  *
  * Super keys travel through Spark as `BinaryType` columns, so the
  * canonical representation is a byte array of length `bits / 8`.
  * Bit `i` lives in byte `i / 8`, bit `i % 8` (LSB first within the
  * byte). Byte 0 holds the logically *leftmost* bits — XASH places the
  * length segment there so that [[subsetOf]] short-circuits on a length
  * mismatch before ever touching the character segments (paper §7.4).
  */
object Bits {

  /** Allocate an all-zero vector of `bits` bits (must be a multiple of 8). */
  def zero(bits: Int): Array[Byte] = {
    require(bits > 0 && bits % 8 == 0, s"bit width must be a positive multiple of 8, got $bits")
    new Array[Byte](bits / 8)
  }

  /** Number of bits in `v`. */
  def width(v: Array[Byte]): Int = v.length * 8

  /** Set bit `i` (mutates `v`, returns it for chaining). */
  def set(v: Array[Byte], i: Int): Array[Byte] = {
    require(i >= 0 && i < width(v), s"bit $i out of range [0, ${width(v)})")
    v(i / 8) = (v(i / 8) | (1 << (i % 8))).toByte
    v
  }

  /** Test bit `i`. */
  def get(v: Array[Byte], i: Int): Boolean =
    ((v(i / 8) >> (i % 8)) & 1) == 1

  /** Bit-wise OR into a fresh array (inputs unchanged). */
  def or(a: Array[Byte], b: Array[Byte]): Array[Byte] = {
    require(a.length == b.length, s"width mismatch: ${width(a)} vs ${width(b)}")
    val out = new Array[Byte](a.length)
    var i = 0
    while (i < a.length) { out(i) = (a(i) | b(i)).toByte; i += 1 }
    out
  }

  /** Bit-wise OR of `b` into `a` in place (the super-key aggregation op). */
  def orInPlace(a: Array[Byte], b: Array[Byte]): Array[Byte] = {
    require(a.length == b.length, s"width mismatch: ${width(a)} vs ${width(b)}")
    var i = 0
    while (i < a.length) { a(i) = (a(i) | b(i)).toByte; i += 1 }
    a
  }

  /** `a ⊆ b`, i.e. `(a | b) == b` — the row-filter mask check of §6.3.
    *
    * Scans from byte 0 so an XASH length-segment mismatch fails in the
    * very first bytes (the paper's short-circuit optimisation, §5.3.4).
    */
  def subsetOf(a: Array[Byte], b: Array[Byte]): Boolean = {
    require(a.length == b.length, s"width mismatch: ${width(a)} vs ${width(b)}")
    var i = 0
    while (i < a.length) {
      if ((a(i) & ~b(i)) != 0) return false
      i += 1
    }
    true
  }

  /** Number of set bits. */
  def popCount(v: Array[Byte]): Int = {
    var c = 0
    var i = 0
    while (i < v.length) { c += java.lang.Integer.bitCount(v(i) & 0xff); i += 1 }
    c
  }

  /** Indices of set bits, ascending. */
  def setBits(v: Array[Byte]): Seq[Int] =
    (0 until width(v)).filter(get(v, _))

  /** Build a vector of `bits` bits with the given bit indices set. */
  def fromBits(bits: Int, idx: Iterable[Int]): Array[Byte] = {
    val v = zero(bits)
    idx.foreach(set(v, _))
    v
  }

  /** Exact equality of two vectors. */
  def equal(a: Array[Byte], b: Array[Byte]): Boolean =
    java.util.Arrays.equals(a, b)

  def toBinaryString(v: Array[Byte]): String =
    (0 until width(v)).map(i => if (get(v, i)) '1' else '0').mkString
}
