package repro.hash

import org.scalatest.funsuite.AnyFunSuite
import repro.PropHelpers
import repro.util.Bits

class XashSpec extends AnyFunSuite with PropHelpers {

  // §5.3.2: segmentation numbers quoted in the paper.
  private val segmentation = Seq(
    // (bits, beta, lenBits)
    (128, 3, 17),
    (256, 6, 34),
    (512, 13, 31))

  for ((bits, beta, lenBits) <- segmentation) {
    test(s"[$bits] Eq. 6 segmentation: beta=$beta, |a_l|=$lenBits (paper §5.3.2)") {
      val x = Xash(bits)
      assert(x.beta == beta)
      assert(x.lenBits == lenBits)
      assert(x.regionBits == 37 * beta)
      assert(x.regionBits + x.lenBits == bits)
    }
  }

  test("Eq. 5: alpha=6 for 128 bits and 700M unique values (paper §5.3.1)") {
    assert(Xash.optimalAlpha(128, 700000000L) == 6)
  }

  test("Eq. 5: alpha grows with corpus size and shrinks with hash size") {
    assert(Xash.optimalAlpha(128, 1000L) == 2)
    assert(Xash.optimalAlpha(128, 1000000L) == 4) // C(128,3)=341,376 ≤ 1M < C(128,4)
    assert(Xash.optimalAlpha(512, 700000000L) <= Xash.optimalAlpha(128, 700000000L))
    forAllSeeded(20) { rng =>
      val c = 1L << (10 + rng.nextInt(30))
      assert(Xash.optimalAlpha(128, c) <= Xash.optimalAlpha(128, c * 10))
    }
  }

  test("alphabet bucketing: 37 segments, non-alphanumerics collapse to space") {
    assert(Xash.segmentIndex('a') == 0)
    assert(Xash.segmentIndex('z') == 25)
    assert(Xash.segmentIndex('0') == 26)
    assert(Xash.segmentIndex('9') == 35)
    assert(Xash.segmentIndex(' ') == 36)
    assert(Xash.bucket('!') == ' ')
    assert(Xash.bucket('ß') == ' ')
    assert((('a' to 'z') ++ ('0' to '9') ++ Seq(' ')).map(Xash.segmentIndex).distinct.size == 37)
  }

  test("paper running example: XASH('muhammad') bit positions (§5.3.3/§5.3.5)") {
    // alpha=4 as in the illustrating example: 3 characters + length.
    val x = Xash(128, alpha = 4)
    // distinct char counts: m:3, a:2, u/h/d:1 → least frequent (ties
    // lexicographic): d, h, u. lv=8.
    // d: seg 3,  λ=8 → x=ceil(24/8)=3 → segBit 3·3+2 = 11 → rot (11+8)%111=19 → bit 17+19=36
    // h: seg 7,  λ=3 → x=ceil(9/8)=2  → segBit 21+1 = 22 → rot 30 → bit 47
    // u: seg 20, λ=2 → x=ceil(6/8)=1  → segBit 60     → rot 68 → bit 85
    // length: 8 mod 17 = 8 → bit 8
    val h = x.hash("muhammad")
    assert(Bits.setBits(h).toSet == Set(8, 36, 47, 85))
  }

  test("character position bands match §5.3.3's worked thresholds") {
    val x = Xash(128, alpha = 2) // single character selected
    // "us": distinct u(1), s(2); least frequent tie → lexicographic: 's'.
    // λ=2, lv=2 → x=ceil(2·3/2)=3 → segBit seg('s')·3+2 = 18·3+2 = 56 → rot (56+2)%111=58
    val h = x.hash("us")
    assert(Bits.setBits(h).toSet == Set(2, 17 + 58))
  }

  for (bits <- Seq(128, 256, 512)) {
    val x = Xash(bits, alpha = 4)

    test(s"[$bits] popcount = 1 + min(alpha-1, distinct chars); never more than alpha") {
      assert(Bits.popCount(x.hash("")) == 1)            // length bit only
      assert(Bits.popCount(x.hash("aaaa")) == 2)        // 1 char + length
      assert(Bits.popCount(x.hash("ab")) == 3)
      assert(Bits.popCount(x.hash("abcdefgh")) == 4)    // capped at alpha
      forAllSeeded(100) { rng =>
        val v = randomWord(rng)
        val pc = Bits.popCount(x.hash(v))
        assert(pc <= 4 && pc >= 1)
      }
    }

    test(s"[$bits] deterministic and normalising") {
      forAllSeeded(50) { rng =>
        val v = randomWord(rng)
        assert(Bits.equal(x.hash(v), x.hash(v)))
        assert(Bits.equal(x.hash(v), x.hash("  " + v.toUpperCase + " ")))
      }
    }

    test(s"[$bits] length bit is l_v mod lenBits in the leftmost segment") {
      forAllSeeded(50) { rng =>
        val v = randomWord(rng)
        val expected = v.length % x.lenBits
        assert(Bits.get(x.hash(v), expected))
        // and no other length-segment bit is set
        assert((0 until x.lenBits).count(Bits.get(x.hash(v), _)) == 1)
      }
    }

    test(s"[$bits] same chars, different length → disjoint length bits (paper's Boxer/Birder point)") {
      val a = x.hash("boxer")
      val b = x.hash("birder")
      assert((0 until x.lenBits).filter(Bits.get(a, _)) !=
             (0 until x.lenBits).filter(Bits.get(b, _)))
    }

    test(s"[$bits] rotation displaces character bits by length (§5.3.5)") {
      // Same single rare character at the same relative position in two
      // values of different lengths must land on different bits.
      val h1 = x.hash("zaaa")     // z selected, lv=4
      val h2 = x.hash("zaaaa")    // z selected, lv=5
      val region1 = (x.lenBits until bits).filter(Bits.get(h1, _))
      val region2 = (x.lenBits until bits).filter(Bits.get(h2, _))
      assert(region1.nonEmpty && region2.nonEmpty)
      assert(region1.intersect(region2).size < math.min(region1.size, region2.size))
    }
  }

  test("no-false-negative lemma (§6.3): super key masks every member value's hash") {
    for (bits <- Seq(128, 256, 512); alpha <- Seq(3, 4, 6)) {
      val x = Xash(bits, alpha)
      forAllSeeded(100, seed = bits * 31 + alpha) { rng =>
        val row = (0 until 2 + rng.nextInt(6)).map(_ => randomWord(rng))
        val sk  = x.superKey(row)
        row.foreach(v => assert(Bits.subsetOf(x.hash(v), sk)))
        // any sub-row key combination is masked as well
        val key = rng.shuffle(row).take(1 + rng.nextInt(row.size))
        assert(Bits.subsetOf(x.superKey(key), sk))
      }
    }
  }

  test("alpha < 2 and tiny widths are rejected") {
    intercept[IllegalArgumentException](Xash(128, alpha = 1))
    intercept[IllegalArgumentException](Xash(24))
  }
}
