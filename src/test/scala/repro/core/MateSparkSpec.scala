package repro.core

import org.apache.spark.sql.functions._
import repro.{Fixtures, Oracle, SparkSpec}
import repro.hash.{BloomHashes, Hashes, StandardHashes, SuperKeyHash, Xash}

class MateSparkSpec extends SparkSpec {

  private val k = 5
  private def hashes: Seq[SuperKeyHash] = Seq(
    Xash(128, 4), BloomHashes.Bf(128, 8), BloomHashes.Ht(128),
    StandardHashes.Md5(128), StandardHashes.SimHash(128))

  private def runWith(q: repro.corpus.CorpusGen.QueryTable, h: Option[SuperKeyHash]) =
    MateSpark.run(Fixtures.spark, Fixtures.pls, Fixtures.rowVals,
      h.map(Fixtures.rowSk), h, q, k)

  test("SCR (no filter) recovers the ground-truth top-k exactly") {
    for (q <- Fixtures.allQueries) {
      val r = runWith(q, None)
      assert(r.topK == Fixtures.gtTopK(q, k), s"query ${q.set}/${q.id}")
    }
  }

  for (h <- hashes) {
    test(s"[$h] filtered discovery returns the same top-k as ground truth (no false negatives end-to-end)") {
      for (q <- Fixtures.allQueries) {
        val r = runWith(q, Some(h))
        assert(r.topK == Fixtures.gtTopK(q, k), s"query ${q.set}/${q.id}")
      }
    }
  }

  test("metrics: rowsChecked = TP + FP and cost counters are coherent") {
    for (q <- Fixtures.allQueries; h <- Seq(Some(Xash(128, 4)), None)) {
      val r = runWith(q, h)
      val m = r.metrics
      assert(m.rowsChecked == m.tpRows + m.fpRows)
      assert(m.precision >= 0.0 && m.precision <= 1.0)
      assert(m.cellsCompared >= m.rowsChecked) // ≥1 cell per verified row
      assert(m.verifiedPairs <= m.candidatePairs)
      assert(m.rowsChecked <= m.verifiedPairs)
      if (h.isDefined) assert(m.maskChecks == m.candidatePairs) else assert(m.maskChecks == 0)
    }
  }

  test("row filtering never increases verification work: XASH ≤ SCR on every query") {
    for (q <- Fixtures.allQueries) {
      val scr  = runWith(q, None).metrics
      val xash = runWith(q, Some(Xash(128, 4))).metrics
      assert(xash.rowsChecked <= scr.rowsChecked)
      assert(xash.cellsCompared <= scr.cellsCompared)
    }
  }

  test("XASH prunes at least as well as a raw digest on aggregate (paper §7.3 shape)") {
    val totals = Seq(Xash(128, 4), StandardHashes.Md5(128)).map { h =>
      Fixtures.allQueries.map(q => runWith(q, Some(h)).metrics.fpRows).sum
    }
    assert(totals(0) <= totals(1), s"XASH FPs ${totals(0)} vs MD5 FPs ${totals(1)}")
  }

  test("top-1 joinability score is oracle-verified via SQL INTERSECT") {
    import spark.implicits._
    val q = Fixtures.queries2.head
    val r = runWith(q, Some(Xash(128, 4)))
    val (topTable, j) = r.topK.head
    // materialise the winning candidate table as columns c0..cn
    val rows = Fixtures.localTables(topTable)
    val nCols = rows.values.head.size
    val cand = rows.values.toSeq.map(m => (0 until nCols).map(m(_)))
      .map { case s => (s.lift(0).getOrElse(""), s.lift(1).getOrElse(""), s.lift(2).getOrElse(""),
                        s.lift(3).getOrElse(""), s.lift(4).getOrElse(""), s.lift(5).getOrElse("")) }
      .toDF("c0", "c1", "c2", "c3", "c4", "c5")
    val qt = q.tuples.map(t => (t(0).toLowerCase.trim, t(1).toLowerCase.trim)).toDF("q0", "q1")
    val perms = for { a <- 0 until nCols; b <- 0 until nCols if a != b }
      yield s"(SELECT count(*) FROM (SELECT DISTINCT q0, q1 FROM qt INTERSECT SELECT DISTINCT c$a AS q0, c$b AS q1 FROM cand))"
    Oracle.assertEquivalent(
      Seq(j).toDF("j"),
      s"SELECT greatest(${perms.mkString(", ")}) AS j",
      "qt" -> qt, "cand" -> cand)
  }

  test("init column selection feeds the dataflow: candidates only match the lowest-cardinality column's values") {
    val q = Fixtures.queries2.head
    val initCol = InitColumn.byCardinality(q.rows)
    val queryDf = MateSpark.prepareQuery(spark, q)
    val initVals = queryDf.select("initValue").collect().map(_.getString(0)).toSet
    val expected = q.tuples.map(t => t(initCol).toLowerCase.trim).toSet
    assert(initVals == expected)
  }

  test("candidates are distinct (row retrieved once per query tuple even with repeated hits)") {
    val q = Fixtures.queries2.head
    val cand = MateSpark.candidates(Fixtures.pls, MateSpark.prepareQuery(spark, q))
    assert(cand.count() ==
      cand.select("tableId", "rowId", "qTupleId").distinct().count())
  }

  test("k caps the result list") {
    for (kk <- Seq(1, 3, 10)) {
      val q = Fixtures.queries2.head
      val r = MateSpark.run(Fixtures.spark, Fixtures.pls, Fixtures.rowVals,
        Some(Fixtures.rowSk(Xash(128, 4))), Some(Xash(128, 4)), q, kk)
      assert(r.topK.size <= kk)
      assert(r.topK == Fixtures.gtTopK(q, kk))
    }
  }

  test("registry-built hashes all agree on top-k (every hash is FN-free end-to-end)") {
    val q = Fixtures.queries3.head
    val expected = Fixtures.gtTopK(q, k)
    for (name <- Hashes.all) {
      val h = Hashes.byName(name, 128, Fixtures.corpus.avgColumns, Fixtures.corpus.uniqueValues)
      val r = runWith(q, Some(h))
      assert(r.topK == expected, s"hash $name diverged")
    }
  }
}
