package repro.corpus

import scala.util.Random

/** Deterministic synthetic vocabulary with an English-like letter
  * frequency, so XASH's least-frequent-character selection (§5.3.2)
  * behaves as it does on the paper's web-table corpora.
  *
  * Words are 2–14 characters; ~15% of pool entries are two-word values
  * (containing a space) and ~10% are numeric strings, mirroring the mix
  * of textual and auto-generated columns the paper describes.
  */
object Vocab {

  /** Relative English letter frequencies (per mille), a–z. */
  val LetterFreq: Array[Double] = Array(
    8.2, 1.5, 2.8, 4.3, 12.7, 2.2, 2.0, 6.1, 7.0, 0.15, 0.77, 4.0, 2.4,
    6.7, 7.5, 1.9, 0.095, 6.0, 6.3, 9.1, 2.8, 0.98, 2.4, 0.15, 2.0, 0.074)

  private val cumulative: Array[Double] = {
    val total = LetterFreq.sum
    LetterFreq.scanLeft(0.0)(_ + _).tail.map(_ / total)
  }

  /** Draw one letter with English-like frequency. */
  def letter(rng: Random): Char = {
    val x = rng.nextDouble()
    var i = 0
    while (i < 25 && cumulative(i) < x) i += 1
    ('a' + i).toChar
  }

  /** One synthetic word of length 2..12. */
  def word(rng: Random): String = {
    val len = 2 + rng.nextInt(11)
    val sb = new StringBuilder(len)
    var i = 0
    while (i < len) { sb.append(letter(rng)); i += 1 }
    sb.toString
  }

  /** A deterministic pool of `size` distinct values. */
  def pool(size: Int, seed: Long): Array[String] = {
    val rng  = new Random(seed)
    val seen = scala.collection.mutable.LinkedHashSet.empty[String]
    while (seen.size < size) {
      val x = rng.nextDouble()
      val v =
        if (x < 0.10) (rng.nextInt(1000000)).toString            // numeric ids
        else if (x < 0.25) s"${word(rng)} ${word(rng)}"          // two-word values
        else word(rng)
      seen += v
    }
    seen.toArray
  }

  /** Zipf-ish draw from a pool: low ranks are much more likely, which
    * gives realistic posting-list skew (§7.5.4 observes a power law).
    */
  def draw(pool: Array[String], rng: Random, alpha: Double = 1.05): String = {
    val u    = math.max(rng.nextDouble(), 1e-12)
    val rank = math.min(pool.length - 1, math.pow(u, -1.0 / alpha).toInt - 1)
    pool(math.max(0, rank) % pool.length)
  }
}
