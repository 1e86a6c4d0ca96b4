package repro.corpus

import org.scalatest.funsuite.AnyFunSuite
import repro.PropHelpers
import scala.util.Random

class VocabSpec extends AnyFunSuite with PropHelpers {

  test("pool produces the requested number of distinct values") {
    for (size <- Seq(10, 100, 1000)) {
      val p = Vocab.pool(size, seed = 1)
      assert(p.length == size)
      assert(p.distinct.length == size)
    }
  }

  test("pool is deterministic in the seed") {
    assert(Vocab.pool(500, 42).toSeq == Vocab.pool(500, 42).toSeq)
    assert(Vocab.pool(500, 42).toSeq != Vocab.pool(500, 43).toSeq)
  }

  test("letters follow an English-like frequency (e far more common than z)") {
    val rng = new Random(7)
    val sample = (0 until 20000).map(_ => Vocab.letter(rng))
    val counts = sample.groupBy(identity).view.mapValues(_.size).toMap
    assert(counts.getOrElse('e', 0) > counts.getOrElse('z', 0) * 5)
    assert(counts.getOrElse('t', 0) > counts.getOrElse('q', 0) * 5)
  }

  test("words are lowercase alphabetic, length 2..12") {
    val rng = new Random(3)
    (0 until 500).foreach { _ =>
      val w = Vocab.word(rng)
      assert(w.length >= 2 && w.length <= 12)
      assert(w.forall(c => c >= 'a' && c <= 'z'))
    }
  }

  test("pool mixes numeric and two-word values") {
    val p = Vocab.pool(2000, 5)
    assert(p.exists(_.forall(_.isDigit)), "expected numeric values")
    assert(p.exists(_.contains(' ')), "expected two-word values")
    assert(p.count(_.contains(' ')) < p.length / 2)
  }

  test("zipf draw is skewed: head value much more frequent than tail") {
    val p = Vocab.pool(1000, 9)
    val rng = new Random(11)
    val draws = (0 until 20000).map(_ => Vocab.draw(p, rng))
    val counts = draws.groupBy(identity).view.mapValues(_.size).toMap
    val headCount = counts.getOrElse(p(0), 0)
    assert(headCount > 20000 / 100, s"head not skewed enough: $headCount")
    assert(counts.values.max == headCount || headCount > 100)
  }

  test("draw always returns a pool member") {
    val p = Vocab.pool(50, 13)
    val rng = new Random(17)
    (0 until 1000).foreach(_ => assert(p.contains(Vocab.draw(p, rng))))
  }
}
