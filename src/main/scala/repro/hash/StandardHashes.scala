package repro.hash

import java.nio.charset.StandardCharsets
import java.security.MessageDigest

import repro.util.Bits

/** Raw-digest baseline hashes of §7.1.2 (MD5, Murmur, CityHash, SimHash).
  *
  * These set ≈50% of their bits (uniform distribution), which is exactly
  * why the paper finds them ineffective as super-key components: the OR
  * of a handful of row values saturates the super key (§7.3).
  */
object StandardHashes {

  /** Extend a 128-bit digest function to `bits` by salted re-digesting. */
  private def widen(bits: Int, block: Long => Array[Byte]): Array[Byte] = {
    val out = new Array[Byte](bits / 8)
    var off = 0
    var salt = 0L
    while (off < out.length) {
      val d = block(salt)
      val n = math.min(d.length, out.length - off)
      System.arraycopy(d, 0, out, off, n)
      off += n; salt += 1
    }
    out
  }

  /** MD5 (RFC 1321 via JDK). 128-bit digest, salted-widened beyond that. */
  final case class Md5(bits: Int = 128) extends SuperKeyHash {
    require(bits % 8 == 0 && bits >= 64)
    val name = "MD5"
    override def hash(value: String): Array[Byte] = {
      val v = SuperKeyHash.normalize(value)
      widen(bits, salt => {
        val md = MessageDigest.getInstance("MD5")
        if (salt != 0) md.update(salt.toByte)
        md.digest(v.getBytes(StandardCharsets.UTF_8))
      })
    }
  }

  /** MurmurHash3 x64 128 (Austin Appleby's reference algorithm). */
  final case class Murmur(bits: Int = 128) extends SuperKeyHash {
    require(bits % 8 == 0 && bits >= 64)
    val name = "Murmur"
    override def hash(value: String): Array[Byte] = {
      val v = SuperKeyHash.normalize(value).getBytes(StandardCharsets.UTF_8)
      widen(bits, salt => {
        val (h1, h2) = Murmur3.hash128(v, seed = salt.toInt)
        val b = java.nio.ByteBuffer.allocate(16)
        b.putLong(h1); b.putLong(h2)
        b.array()
      })
    }
  }

  /** CityHash-like 64-bit avalanche hash, widened to `bits`.
    *
    * Substitution (documented in DESIGN.md): the paper only relies on
    * CityHash's uniform bit distribution; this reproduces the structure
    * of CityHash64's short-string path (multiplicative mixing +
    * xor-shift finalisation) without the full Google implementation.
    */
  final case class CityLike(bits: Int = 128) extends SuperKeyHash {
    require(bits % 8 == 0 && bits >= 64)
    val name = "City"
    private val k2 = 0x9ae16a3b2f90404fL
    private def shiftMix(x: Long): Long = x ^ (x >>> 47)
    private def hash64(v: Array[Byte], seed: Long): Long = {
      var h = seed * k2 + v.length * 0xc3a5c85c97cb3127L
      var i = 0
      while (i < v.length) {
        h = (h + (v(i) & 0xffL) * k2) * 0xb492b66fbe98f273L
        h = shiftMix(h)
        i += 1
      }
      shiftMix(h * k2) * k2
    }
    override def hash(value: String): Array[Byte] = {
      val v = SuperKeyHash.normalize(value).getBytes(StandardCharsets.UTF_8)
      val out = new Array[Byte](bits / 8)
      var w = 0
      while (w < out.length / 8) {
        val h = hash64(v, SuperKeyHash.mix64(w.toLong))
        var b = 0
        while (b < 8) { out(w * 8 + b) = (h >>> (8 * b)).toByte; b += 1 }
        w += 1
      }
      out
    }
  }

  /** SimHash [Charikar 2002] over character 2-grams.
    *
    * Each 2-gram votes ±1 per bit position; a bit is set when the sum is
    * positive — giving the usual ≈50% bit density on random strings.
    */
  final case class SimHash(bits: Int = 128) extends SuperKeyHash {
    require(bits % 8 == 0 && bits >= 64)
    val name = "SimHash"
    override def hash(value: String): Array[Byte] = {
      val v = "\u0002" + SuperKeyHash.normalize(value) + "\u0003" // sentinel padding: even empty values get 2-grams
      val acc = new Array[Int](bits)
      var g = 0
      while (g < v.length - 1) {
        val gram  = v.substring(g, g + 2).getBytes(StandardCharsets.UTF_8)
        var w = 0
        while (w * 64 < bits) {
          val (h1, _) = Murmur3.hash128(gram, seed = w)
          var b = 0
          while (b < 64 && w * 64 + b < bits) {
            if (((h1 >>> b) & 1L) == 1L) acc(w * 64 + b) += 1 else acc(w * 64 + b) -= 1
            b += 1
          }
          w += 1
        }
        g += 1
      }
      val out = Bits.zero(bits)
      var i = 0
      while (i < bits) { if (acc(i) > 0) Bits.set(out, i); i += 1 }
      out
    }
  }
}

/** MurmurHash3 x64 128-bit — reference algorithm (public domain). */
object Murmur3 {
  private val C1 = 0x87c37b91114253d5L
  private val C2 = 0x4cf5ad432745937fL

  private def rotl(x: Long, r: Int): Long = (x << r) | (x >>> (64 - r))

  private def fmix(k0: Long): Long = {
    var k = k0
    k ^= k >>> 33
    k *= 0xff51afd7ed558ccdL
    k ^= k >>> 33
    k *= 0xc4ceb9fe1a85ec53L
    k ^= k >>> 33
    k
  }

  private def getLong(data: Array[Byte], i: Int): Long = {
    var v = 0L
    var j = 7
    while (j >= 0) { v = (v << 8) | (data(i + j) & 0xffL); j -= 1 }
    v
  }

  /** 128-bit hash of `data` with `seed`; returns (h1, h2). */
  def hash128(data: Array[Byte], seed: Int): (Long, Long) = {
    val len = data.length
    var h1 = seed.toLong & 0xffffffffL
    var h2 = seed.toLong & 0xffffffffL
    val nblocks = len / 16

    var i = 0
    while (i < nblocks) {
      var k1 = getLong(data, i * 16)
      var k2 = getLong(data, i * 16 + 8)
      k1 *= C1; k1 = rotl(k1, 31); k1 *= C2; h1 ^= k1
      h1 = rotl(h1, 27); h1 += h2; h1 = h1 * 5 + 0x52dce729L
      k2 *= C2; k2 = rotl(k2, 33); k2 *= C1; h2 ^= k2
      h2 = rotl(h2, 31); h2 += h1; h2 = h2 * 5 + 0x38495ab5L
      i += 1
    }

    var k1 = 0L
    var k2 = 0L
    val tail = nblocks * 16
    val rem  = len & 15
    var j = rem
    while (j > 8) { j -= 1; k2 ^= (data(tail + j) & 0xffL) << ((j - 8) * 8) }
    if (rem > 8) { k2 *= C2; k2 = rotl(k2, 33); k2 *= C1; h2 ^= k2 }
    j = math.min(rem, 8)
    while (j > 0) { j -= 1; k1 ^= (data(tail + j) & 0xffL) << (j * 8) }
    if (rem > 0) { k1 *= C1; k1 = rotl(k1, 31); k1 *= C2; h1 ^= k1 }

    h1 ^= len; h2 ^= len
    h1 += h2; h2 += h1
    h1 = fmix(h1); h2 = fmix(h2)
    h1 += h2; h2 += h1
    (h1, h2)
  }

  /** Convenience 64-bit hash. */
  def hash64(data: Array[Byte], seed: Int): Long = hash128(data, seed)._1
}
