package repro.util

import org.scalatest.funsuite.AnyFunSuite
import repro.PropHelpers

class BitsSpec extends AnyFunSuite with PropHelpers {

  private val widths = Seq(64, 128, 256, 512)

  test("zero rejects non-multiple-of-8 widths") {
    intercept[IllegalArgumentException](Bits.zero(7))
    intercept[IllegalArgumentException](Bits.zero(0))
    intercept[IllegalArgumentException](Bits.zero(-8))
  }

  for (w <- widths) {
    test(s"[$w] zero has width $w and popcount 0") {
      val v = Bits.zero(w)
      assert(Bits.width(v) == w)
      assert(Bits.popCount(v) == 0)
    }

    test(s"[$w] set/get roundtrip on every bit") {
      for (i <- 0 until w) {
        val v = Bits.zero(w)
        Bits.set(v, i)
        assert(Bits.get(v, i))
        assert(Bits.popCount(v) == 1)
        assert(Bits.setBits(v) == Seq(i))
        for (j <- 0 until w if j != i) assert(!Bits.get(v, j))
      }
    }

    test(s"[$w] set rejects out-of-range bits") {
      intercept[IllegalArgumentException](Bits.set(Bits.zero(w), w))
      intercept[IllegalArgumentException](Bits.set(Bits.zero(w), -1))
    }

    test(s"[$w] or is commutative, idempotent and monotone") {
      forAllSeeded(50) { rng =>
        val a = Bits.fromBits(w, (0 until rng.nextInt(20)).map(_ => rng.nextInt(w)))
        val b = Bits.fromBits(w, (0 until rng.nextInt(20)).map(_ => rng.nextInt(w)))
        assert(Bits.equal(Bits.or(a, b), Bits.or(b, a)))
        assert(Bits.equal(Bits.or(a, a), a))
        assert(Bits.subsetOf(a, Bits.or(a, b)))
        assert(Bits.subsetOf(b, Bits.or(a, b)))
      }
    }

    test(s"[$w] subsetOf: zero ⊆ x ⊆ x, and strict supersets are not subsets") {
      forAllSeeded(50) { rng =>
        val bits = (0 until 1 + rng.nextInt(20)).map(_ => rng.nextInt(w)).distinct
        val x = Bits.fromBits(w, bits)
        assert(Bits.subsetOf(Bits.zero(w), x))
        assert(Bits.subsetOf(x, x))
        val extra = (0 until w).find(i => !Bits.get(x, i))
        extra.foreach { e =>
          val sup = Bits.or(x, Bits.fromBits(w, Seq(e)))
          assert(Bits.subsetOf(x, sup))
          assert(!Bits.subsetOf(sup, x))
        }
      }
    }

    test(s"[$w] popCount equals number of distinct set bits") {
      forAllSeeded(50) { rng =>
        val bits = (0 until rng.nextInt(40)).map(_ => rng.nextInt(w)).distinct
        assert(Bits.popCount(Bits.fromBits(w, bits)) == bits.size)
      }
    }

    test(s"[$w] orInPlace accumulates like or") {
      forAllSeeded(20) { rng =>
        val parts = (0 until 5).map(_ =>
          Bits.fromBits(w, (0 until rng.nextInt(10)).map(_ => rng.nextInt(w))))
        val acc = Bits.zero(w)
        parts.foreach(Bits.orInPlace(acc, _))
        val expected = parts.foldLeft(Bits.zero(w))(Bits.or)
        assert(Bits.equal(acc, expected))
      }
    }

    test(s"[$w] toBinaryString has width chars and matches get") {
      val v = Bits.fromBits(w, Seq(0, 1, w - 1))
      val s = Bits.toBinaryString(v)
      assert(s.length == w)
      assert(s.charAt(0) == '1' && s.charAt(1) == '1' && s.charAt(w - 1) == '1')
      assert(s.count(_ == '1') == 3)
    }
  }

  test("or rejects width mismatch") {
    intercept[IllegalArgumentException](Bits.or(Bits.zero(64), Bits.zero(128)))
    intercept[IllegalArgumentException](Bits.subsetOf(Bits.zero(64), Bits.zero(128)))
  }
}
