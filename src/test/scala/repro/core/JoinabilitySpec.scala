package repro.core

import org.scalatest.funsuite.AnyFunSuite
import repro.{Oracle, PropHelpers, SparkSpec}

class JoinabilitySpec extends SparkSpec with PropHelpers {

  test("rowMappings finds the single exact mapping") {
    val m = Joinability.rowMappings(Seq("a", "b"), Map(0 -> "a", 1 -> "b", 2 -> "c"))
    assert(m == Seq("0:0|1:1"))
  }

  test("rowMappings requires every key value to appear") {
    assert(Joinability.rowMappings(Seq("a", "zz"), Map(0 -> "a", 1 -> "b")).isEmpty)
  }

  test("rowMappings is injective: a repeated key value needs two columns") {
    assert(Joinability.rowMappings(Seq("a", "a"), Map(0 -> "a", 1 -> "x")).isEmpty)
    val two = Joinability.rowMappings(Seq("a", "a"), Map(0 -> "a", 1 -> "a"))
    assert(two.toSet == Set("0:0|1:1", "0:1|1:0"))
  }

  test("rowMappings enumerates all permutations of duplicated values") {
    val m = Joinability.rowMappings(Seq("a", "b"), Map(0 -> "a", 1 -> "b", 2 -> "a"))
    assert(m.toSet == Set("0:0|1:1", "0:2|1:1"))
  }

  test("rowMappings respects the enumeration cap") {
    val row = (0 until 10).map(i => i -> "a").toMap
    val capped = Joinability.rowMappings(Seq("a", "a"), row, cap = 7)
    assert(capped.size == 7)
  }

  test("rowJoinable is rowMappings non-emptiness") {
    forAllSeeded(100) { rng =>
      val row = (0 until 4).map(i => i -> randomWord(rng, 4)).toMap
      val tuple = Seq(randomWord(rng, 4), randomWord(rng, 4))
      assert(Joinability.rowJoinable(tuple, row) == Joinability.rowMappings(tuple, row).nonEmpty)
    }
  }

  test("groundTruth uses a single consistent mapping per table (Eq. 2)") {
    // Two rows match under *different* mappings; only one can count.
    val tuples = Seq(Seq("a", "b"), Seq("c", "d"))
    val rows = Seq(
      Map(0 -> "a", 1 -> "b", 2 -> "x"),  // matches tuple 0 under 0:0|1:1
      Map(0 -> "d", 1 -> "x", 2 -> "c"))  // matches tuple 1 under 0:2|1:0
    assert(Joinability.groundTruth(tuples, rows) == 1L)
    // With an aligned second row both count.
    val aligned = Seq(
      Map(0 -> "a", 1 -> "b", 2 -> "x"),
      Map(0 -> "c", 1 -> "d", 2 -> "y"))
    assert(Joinability.groundTruth(tuples, aligned) == 2L)
  }

  test("groundTruth counts distinct tuples, not rows") {
    val tuples = Seq(Seq("a", "b"))
    val rows = (0 until 5).map(_ => Map(0 -> "a", 1 -> "b"))
    assert(Joinability.groundTruth(tuples, rows) == 1L)
  }

  test("groundTruth normalises values case-insensitively") {
    assert(Joinability.groundTruth(Seq(Seq("A ", "B")), Seq(Map(0 -> "a", 1 -> "b"))) == 1L)
  }

  test("groundTruth matches DuckDB argmax-over-mappings INTERSECT semantics (running example)") {
    import spark.implicits._
    // Figure 1: query d (F.Name, L.Name, Country ignored → use 2 columns
    // for tractable SQL) against candidate T1 with swapped columns.
    val qt = Seq(
      ("muhammad", "lee"), ("ansel", "adams"), ("ansel", "adams"),
      ("muhammad", "lee"), ("helmut", "newton")).toDF("q0", "q1")
    val cand = Seq(
      ("newton", "helmut", "photographer"),
      ("lee", "muhammad", "dancer"),
      ("adams", "ansel", "dancer"),
      ("ali", "muhammad", "boxer"),
      ("sandler", "adam", "actor")).toDF("c0", "c1", "c2")

    val tuples = qt.collect().map(r => Seq(r.getString(0), r.getString(1))).toSeq
    val rows = cand.collect().zipWithIndex.map { case (r, i) =>
      (0 until 3).map(c => c -> r.getString(c)).toMap
    }
    val j = Joinability.groundTruth(tuples, rows)

    // SQL: max over all ordered column pairs of |π(qt) ∩ π_perm(cand)|.
    val perms = for {
      a <- 0 until 3; b <- 0 until 3 if a != b
    } yield s"(SELECT count(*) FROM (SELECT DISTINCT q0, q1 FROM qt INTERSECT SELECT DISTINCT c$a AS q0, c$b AS q1 FROM cand))"
    val sql = s"SELECT greatest(${perms.mkString(", ")}) AS j"
    Oracle.assertEquivalent(Seq(j).toDF("j"), sql, "qt" -> qt, "cand" -> cand)
    assert(j == 3L) // muhammad/lee, ansel/adams, helmut/newton under 0:c1|1:c0
  }

  test("groundTruth equals DuckDB on random small tables") {
    import spark.implicits._
    forAllSeeded(5, seed = 31) { rng =>
      val vocab = Vector("aa", "bb", "cc", "dd", "ee")
      def v() = vocab(rng.nextInt(vocab.size))
      val qtRows = (0 until 8).map(_ => (v(), v()))
      val candRows = (0 until 10).map(_ => (v(), v(), v()))
      val qt = qtRows.toDF("q0", "q1")
      val cand = candRows.toDF("c0", "c1", "c2")
      val j = Joinability.groundTruth(
        qtRows.map(t => Seq(t._1, t._2)),
        candRows.map(r => Map(0 -> r._1, 1 -> r._2, 2 -> r._3)))
      val perms = for { a <- 0 until 3; b <- 0 until 3 if a != b }
        yield s"(SELECT count(*) FROM (SELECT DISTINCT q0, q1 FROM qt INTERSECT SELECT DISTINCT c$a AS q0, c$b AS q1 FROM cand))"
      Oracle.assertEquivalent(
        Seq(j).toDF("j"),
        s"SELECT greatest(${perms.mkString(", ")}) AS j",
        "qt" -> qt, "cand" -> cand)
    }
  }
}
