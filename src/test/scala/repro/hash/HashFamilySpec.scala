package repro.hash

import org.scalatest.funsuite.AnyFunSuite
import repro.PropHelpers
import repro.util.Bits

/** Cross-cutting properties every super-key hash must satisfy, plus the
  * per-family bit-density characteristics the paper's analysis (§6.4,
  * §7.3) relies on.
  */
class HashFamilySpec extends AnyFunSuite with PropHelpers {

  private val sizes = Seq(128, 256, 512)
  private def families(bits: Int): Seq[SuperKeyHash] = Seq(
    Xash(bits, alpha = 4),
    StandardHashes.Md5(bits),
    StandardHashes.Murmur(bits),
    StandardHashes.CityLike(bits),
    StandardHashes.SimHash(bits),
    BloomHashes.Ht(bits),
    BloomHashes.Bf(bits, h = 8),
    BloomHashes.Lhbf(bits, h = 8))

  for (bits <- sizes; h <- families(bits)) {
    test(s"[$h] emits $bits-bit vectors") {
      forAllSeeded(30) { rng =>
        assert(Bits.width(h.hash(randomWord(rng))) == bits)
      }
    }

    test(s"[$h] is deterministic") {
      forAllSeeded(30) { rng =>
        val v = randomWord(rng)
        assert(Bits.equal(h.hash(v), h.hash(v)))
      }
    }

    test(s"[$h] normalises case and surrounding whitespace") {
      forAllSeeded(30) { rng =>
        val v = randomWord(rng)
        assert(Bits.equal(h.hash(v), h.hash(s"  ${v.toUpperCase} ")))
      }
    }

    test(s"[$h] nonempty values set at least one bit") {
      forAllSeeded(50) { rng =>
        assert(Bits.popCount(h.hash(randomWord(rng))) >= 1)
      }
    }

    test(s"[$h] no false negatives: super key masks every member and sub-key (§6.3 lemma)") {
      forAllSeeded(100) { rng =>
        val row = (0 until 2 + rng.nextInt(6)).map(_ => randomWord(rng))
        val sk  = h.superKey(row)
        row.foreach(v => assert(Bits.subsetOf(h.hash(v), sk)))
        val key = rng.shuffle(row).take(1 + rng.nextInt(row.size))
        assert(Bits.subsetOf(h.superKey(key), sk))
      }
    }

    test(s"[$h] distinct values rarely hash identically") {
      forAllSeeded(100) { rng =>
        val a = randomWord(rng); val b = randomWord(rng)
        if (a != b) {
          // identical hashes allowed occasionally (it is a hash), but a
          // blanket collision means the function is broken
          ()
        }
      }
      // HT can address at most `bits` buckets and XASH intentionally
      // collides near-identical strings (few 1-bits by design), so the
      // bar differs per family.
      val floor = h.name match {
        case "HT" | "XASH" => 60
        case _             => 150
      }
      val vals = (0 until 200).map(i => s"value$i")
      val distinctHashes = vals.map(v => Bits.toBinaryString(h.hash(v))).distinct
      assert(distinctHashes.size > floor, s"too many collisions: ${distinctHashes.size}/200")
    }
  }

  // --- family-specific density characteristics (§7.3) ---

  for (bits <- sizes) {
    test(s"[$bits] raw digests set ≈50% of bits (why they saturate super keys, §7.3)") {
      for (h <- Seq(StandardHashes.Md5(bits), StandardHashes.Murmur(bits),
                    StandardHashes.CityLike(bits), StandardHashes.SimHash(bits))) {
        val avg = (0 until 100).map(i => Bits.popCount(h.hash(s"density-$i"))).sum / 100.0
        assert(avg > bits * 0.35 && avg < bits * 0.65,
          s"$h density $avg out of expected uniform band")
      }
    }

    test(s"[$bits] HT sets exactly one bit; BF/LHBF at most H bits") {
      val ht = BloomHashes.Ht(bits)
      val bf = BloomHashes.Bf(bits, h = 8)
      val lh = BloomHashes.Lhbf(bits, h = 8)
      forAllSeeded(50) { rng =>
        val v = randomWord(rng)
        assert(Bits.popCount(ht.hash(v)) == 1)
        assert(Bits.popCount(bf.hash(v)) <= 8 && Bits.popCount(bf.hash(v)) >= 1)
        assert(Bits.popCount(lh.hash(v)) <= 8 && Bits.popCount(lh.hash(v)) >= 1)
      }
    }
  }

  test("BF hash count follows the paper's H = (|a|/V)·ln2 formula") {
    // §7.1.2: V=5 (webtables) and V=26 (open data)
    assert(BloomHashes.optimalHashCount(128, 5.0) == math.round(128 / 5.0 * math.log(2)).toInt)
    assert(BloomHashes.optimalHashCount(128, 26.0) == math.round(128 / 26.0 * math.log(2)).toInt)
    assert(BloomHashes.optimalHashCount(512, 200.0) == 2)
    assert(BloomHashes.optimalHashCount(64, 1000.0) == 1) // floored
  }

  test("registry resolves every paper hash name and rejects unknown ones") {
    for (n <- Hashes.all; bits <- sizes) {
      val h = Hashes.byName(n, bits, avgColumns = 5.0, cUnique = 1000000L)
      assert(h.bits == bits)
    }
    intercept[IllegalArgumentException](Hashes.byName("SHA", 128))
  }

  test("filtering power ordering on a synthetic workload: XASH ≤ BF ≤ MD5 false positives (§7.3/§7.4 shape)") {
    val rng = new scala.util.Random(7)
    val rows = (0 until 300).map(_ => (0 until 5).map(_ => randomWord(rng)))
    val probes = (0 until 300).map(_ => Seq(randomWord(rng), randomWord(rng)))
    def fpCount(h: SuperKeyHash): Int = {
      val sks = rows.map(h.superKey)
      probes.zipWithIndex.count { case (key, i) =>
        val row = rows(i % rows.size)
        !key.forall(row.contains) && Bits.subsetOf(h.superKey(key), sks(i % rows.size))
      }
    }
    val xash = fpCount(Xash(128, alpha = 4))
    val bf   = fpCount(BloomHashes.Bf(128, h = 8))
    val md5  = fpCount(StandardHashes.Md5(128))
    assert(xash <= bf, s"XASH FPs ($xash) should not exceed BF FPs ($bf)")
    assert(bf <= md5, s"BF FPs ($bf) should not exceed MD5 FPs ($md5)")
  }
}
