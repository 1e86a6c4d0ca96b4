package repro.bench

import repro.SparkSpec
import repro.harness.Experiments

/** Reproduces paper Table 3: row-filter precision TP/(TP+FP) per query
  * set at 128 and 512 bits for MD5, CityHash, SimHash, HT, BF, LHBF and
  * XASH. Paper averages: MD5 .22, City .22, SimHash .23/.27, HT .33/.41,
  * BF .47/.65, LHBF .38/.61, XASH .57/.90.
  */
class Table3Bench extends SparkSpec {

  private val configs: Seq[(String, Int)] =
    Seq(("MD5", 128), ("City", 128)) ++
      Seq("SimHash", "HT", "BF", "LHBF", "XASH").flatMap(n => Seq((n, 128), (n, 512)))

  test("Table 3: precision per query set × hash (128 / 512 bits)") {
    val header = Seq("Dataset") ++ configs.map { case (n, b) => s"$n $b" }
    val rows = BenchGrid.setOrder.map { set =>
      Seq(set) ++ configs.map { case (n, b) =>
        BenchGrid.byConfig(set, n, b).map(r => f"${r.precision}%.2f").getOrElse("-")
      }
    }
    val avg = Seq("Average") ++ configs.map { case (n, b) =>
      val ps = BenchGrid.setOrder.flatMap(s => BenchGrid.byConfig(s, n, b)).map(_.precision)
      f"${ps.sum / ps.size}%.2f"
    }

    println("\n=== Table 3 (reproduced): precision of the row filter ===")
    println(Experiments.formatTable(header, rows :+ avg))

    def avgP(c: String, b: Int): Double = {
      val ps = BenchGrid.setOrder.flatMap(s => BenchGrid.byConfig(s, c, b)).map(_.precision)
      ps.sum / ps.size
    }

    // --- shape assertions (paper §7.4) ---
    // XASH achieves the highest average precision at both hash sizes.
    for (b <- Seq(128, 512); other <- Seq("SimHash", "HT", "BF", "LHBF")) {
      assert(avgP("XASH", b) + 1e-9 >= avgP(other, b) - 0.05,
        s"XASH should lead $other at $b bits (${avgP("XASH", b)} vs ${avgP(other, b)})")
    }
    assert(avgP("XASH", 128) > avgP("MD5", 128), "XASH beats raw digests")
    // larger hash sizes raise precision for the sparse-bit families
    for (c <- Seq("BF", "XASH")) {
      assert(avgP(c, 512) + 0.05 >= avgP(c, 128), s"$c: 512 bits should not lose precision")
    }
    // raw digests sit at the bottom, as in the paper
    assert(avgP("MD5", 128) <= avgP("BF", 128))
  }
}
