package repro.hash

import java.nio.charset.StandardCharsets
import org.scalatest.funsuite.AnyFunSuite
import repro.PropHelpers

class Murmur3Spec extends AnyFunSuite with PropHelpers {

  private def h128(s: String, seed: Int = 0) =
    Murmur3.hash128(s.getBytes(StandardCharsets.UTF_8), seed)

  test("empty input with seed 0 hashes to (0, 0) — reference vector") {
    assert(h128("") == (0L, 0L))
  }

  test("deterministic across calls") {
    forAllSeeded(50) { rng =>
      val v = randomWord(rng, 40)
      assert(h128(v) == h128(v))
    }
  }

  test("seed changes the hash") {
    forAllSeeded(50) { rng =>
      val v = randomWord(rng, 40)
      assert(h128(v, 1) != h128(v, 2))
    }
  }

  test("tail handling: every length 0..48 produces distinct hashes") {
    val hashes = (0 to 48).map(n => h128("x" * n))
    assert(hashes.distinct.size == hashes.size)
  }

  test("single-bit input changes avalanche the output") {
    val base = h128("abcdefgh")
    for (i <- 0 until 8) {
      val mutated = "abcdefgh".updated(i, 'z')
      assert(h128(mutated) != base)
    }
  }

  test("block path (≥16 bytes) and tail path differ from each other") {
    assert(h128("0123456789abcdef") != h128("0123456789abcde"))
    assert(h128("0123456789abcdef" * 3) != h128("0123456789abcdef" * 2))
  }

  test("hash64 equals first component of hash128") {
    forAllSeeded(20) { rng =>
      val v = randomWord(rng, 30).getBytes(StandardCharsets.UTF_8)
      assert(Murmur3.hash64(v, 5) == Murmur3.hash128(v, 5)._1)
    }
  }
}
