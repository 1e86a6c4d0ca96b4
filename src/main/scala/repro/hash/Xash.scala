package repro.hash

import repro.util.Bits

/** XASH (§5) — the paper's hash function for super-key generation.
  *
  * Layout of the `bits`-wide array (byte 0 = leftmost):
  *
  *  - bits `[0, lenBits)`     — length segment, one bit: `l_v mod lenBits`.
  *    Placed leftmost so the subset check short-circuits on a length
  *    mismatch (§5.3.4, §7.4).
  *  - bits `[lenBits, bits)`  — 37 character segments of `beta` bits
  *    each (a–z, 0–9, space). For each of the `alpha − 1` least
  *    frequent characters of the value, one bit is set: segment =
  *    character, bit within segment = relative position band
  *    `x = ceil(λ·β / l_v)` with λ the average 1-based location
  *    (§5.3.3). The whole character region is then rotated left by
  *    `l_v` (§5.3.5).
  *
  * For |a| = 128/256/512 this yields β = 3/6/13 and a length segment of
  * 17/34/31 bits — exactly the paper's numbers (§5.3.2).
  *
  * @param bits    hash width (multiple of 8, ≥ 64)
  * @param alpha   total 1-bits per value: 1 length bit + (alpha−1)
  *                character bits. The paper derives it from the corpus
  *                unique-value count via Eq. 5 ([[Xash.optimalAlpha]]).
  */
final case class Xash(bits: Int = 128, alpha: Int = 4) extends SuperKeyHash {
  require(bits >= 64 && bits % 8 == 0, s"unsupported hash size $bits")
  require(alpha >= 2, s"alpha must leave at least one character bit, got $alpha")

  val name = "XASH"

  /** β from Eq. 6: the largest segment width with 37·β < |a|. */
  val beta: Int = Xash.beta(bits)

  /** Character region size in bits (37 segments × β). */
  val regionBits: Int = 37 * beta

  /** Length segment size |a_l| = |a| − 37·β. */
  val lenBits: Int = bits - regionBits
  require(lenBits > 0, s"no room for length segment at $bits bits")

  override def hash(value: String): Array[Byte] = {
    val v  = SuperKeyHash.normalize(value)
    val lv = v.length
    val out = Bits.zero(bits)
    // Length bit first — leftmost segment.
    Bits.set(out, lv % lenBits)
    if (lv == 0) return out

    // Occurrence count and position sum per bucketed character — flat
    // arrays over the 37-symbol alphabet (hot path: one call per cell).
    val counts = new Array[Int](Xash.AlphabetSize)
    val posSum = new Array[Int](Xash.AlphabetSize)
    val repr   = new Array[Char](Xash.AlphabetSize) // raw char for tie-break
    var i = 0
    while (i < lv) {
      val c   = Xash.bucket(v.charAt(i))
      val seg = Xash.segmentIndex(c)
      counts(seg) += 1
      posSum(seg) += i + 1 // 1-based location
      repr(seg) = c
      i += 1
    }

    // Select the alpha − 1 least frequent characters, ties broken
    // lexicographically on the character (§5.3.2), by repeated scans of
    // the 37 buckets (alpha is tiny).
    val taken = new Array[Boolean](Xash.AlphabetSize)
    var k = 0
    while (k < alpha - 1) {
      var bestSeg = -1
      var s = 0
      while (s < Xash.AlphabetSize) {
        if (counts(s) > 0 && !taken(s) &&
            (bestSeg < 0 || counts(s) < counts(bestSeg) ||
             (counts(s) == counts(bestSeg) && repr(s) < repr(bestSeg)))) {
          bestSeg = s
        }
        s += 1
      }
      if (bestSeg < 0) { k = alpha } // fewer distinct chars than alpha − 1
      else {
        taken(bestSeg) = true
        val lambda = posSum(bestSeg).toDouble / counts(bestSeg) // average location
        var x = math.ceil(lambda * beta / lv).toInt             // 1..beta
        if (x < 1) x = 1
        if (x > beta) x = beta
        val segBit = bestSeg * beta + (x - 1)
        // Rotation (§5.3.5): shift the character region left by l_v.
        Bits.set(out, lenBits + (segBit + lv) % regionBits)
        k += 1
      }
    }
    out
  }
}

object Xash {

  /** The 37-symbol alphabet: a–z, 0–9, space. Anything else buckets to space. */
  val AlphabetSize = 37

  def bucket(c: Char): Char =
    if ((c >= 'a' && c <= 'z') || (c >= '0' && c <= '9')) c else ' '

  def segmentIndex(c: Char): Int =
    if (c >= 'a' && c <= 'z') c - 'a'
    else if (c >= '0' && c <= '9') 26 + (c - '0')
    else 36

  /** Eq. 6: β = argmax(37·β < |a|). */
  def beta(bits: Int): Int = {
    val b = (bits - 1) / AlphabetSize
    require(b >= 1, s"hash too small for 37 segments: $bits")
    b
  }

  /** Eq. 5: smallest α with C(|a|, α) > C_unique.
    *
    * One of the α bits is the length bit; the rest encode characters.
    * Floored at 2 so at least one character is always encoded.
    */
  def optimalAlpha(bits: Int, cUnique: Long): Int = {
    var a = 2
    while (choose(bits, a) <= BigInt(cUnique)) a += 1
    a
  }

  private def choose(n: Int, k: Int): BigInt =
    (0 until k).map(i => BigInt(n - i)).product / (1 to k).map(BigInt(_)).product
}
