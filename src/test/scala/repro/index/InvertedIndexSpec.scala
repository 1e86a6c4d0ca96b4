package repro.index

import org.apache.spark.sql.functions._
import repro.{Fixtures, Oracle, SparkSpec, SynthData}
import repro.core.Joinability
import repro.hash.{BloomHashes, SuperKeyHash, Xash}
import repro.util.Bits

class InvertedIndexSpec extends SparkSpec {

  test("posting lists: one PL item per cell, normalised value") {
    assert(Fixtures.pls.count() == Fixtures.corpus.cells.count())
    val raw = Fixtures.pls.select("value").limit(200).collect().map(_.getString(0))
    raw.foreach(v => assert(v == SuperKeyHash.normalize(v)))
  }

  test("posting-list counts per value match DuckDB GROUP BY (oracle)") {
    val sparkCounts = Fixtures.pls.groupBy("value").agg(count(lit(1)) as "cnt")
    Oracle.assertEquivalent(
      sparkCounts,
      "SELECT lower(trim(value)) AS value, count(*) AS cnt FROM cells GROUP BY 1",
      "cells" -> Fixtures.corpus.cells)
  }

  test("TPC-H-lite orders flow through the cells path with oracle-checked PL counts") {
    val orders = SynthData.orders(spark, sf = 0.001)
    val cells  = SynthData.toCells(orders, tableId = 7L)
    val pls    = InvertedIndex.postingLists(cells)
    Oracle.assertEquivalent(
      pls.groupBy("value").agg(count(lit(1)) as "cnt"),
      "SELECT lower(trim(value)) AS value, count(*) AS cnt FROM cells GROUP BY 1",
      "cells" -> cells)
  }

  test("toCells emits one cell per (row, column) of the source frame") {
    val customer = SynthData.customer(spark, sf = 0.001)
    val cells = SynthData.toCells(customer, tableId = 1L)
    assert(cells.count() == customer.count() * customer.columns.length)
    assert(cells.select("colId").distinct().count() == customer.columns.length)
  }

  test("row value maps contain every column of every row") {
    val sizes = Fixtures.rowVals
      .select(size(map_keys(col("vals"))) as "n", col("tableId"))
      .join(
        Fixtures.corpus.cells.groupBy("tableId").agg((max("colId") + 1) as "nc"),
        Seq("tableId"))
      .filter(col("n") =!= col("nc")).count()
    assert(sizes == 0)
  }

  for (hash <- Seq[SuperKeyHash](Xash(128, 4), BloomHashes.Bf(128, 8))) {
    test(s"[$hash] per-row super keys equal the local OR-aggregation of cell hashes") {
      val sk = Fixtures.rowSk(hash).collect()
        .map(r => (r.getLong(0), r.getLong(1)) -> r.getAs[Array[Byte]]("sk")).toMap
      for ((t, rows) <- Fixtures.localTables.take(10); (r, vals) <- rows.take(5)) {
        val expected = hash.superKey(vals.values)
        assert(Bits.equal(sk((t, r)), expected), s"super key mismatch at table $t row $r")
      }
    }

    test(s"[$hash] index no-false-negatives: every truly joinable row passes the mask (§6.3)") {
      val sk = Fixtures.rowSk(hash).collect()
        .map(r => (r.getLong(0), r.getLong(1)) -> r.getAs[Array[Byte]]("sk")).toMap
      var checked = 0
      for {
        q <- Fixtures.allQueries
        tuple <- q.tuples.map(_.map(SuperKeyHash.normalize))
        (t, rows) <- Fixtures.localTables
        (r, vals) <- rows
        if Joinability.rowJoinable(tuple, vals)
      } {
        checked += 1
        assert(Bits.subsetOf(hash.superKey(tuple), sk((t, r))),
          s"false negative for tuple $tuple at table $t row $r")
      }
      assert(checked > 0, "fixture corpus has no joinable rows to check")
    }
  }

  test("full index join carries (value, tableId, colId, rowId, sk) — §5.1 structure") {
    val idx = InvertedIndex.build(Fixtures.corpus.cells, Xash(128, 4))
    assert(idx.columns.toSet == Set("value", "tableId", "colId", "rowId", "sk"))
    assert(idx.count() == Fixtures.corpus.cells.count())
  }

  test("storage accounting: per-row super keys are ~V× smaller than per-cell (§7.1)") {
    val (nCells, nRows, perCell, perRow) = InvertedIndex.storageStats(Fixtures.corpus.cells, 128)
    assert(nCells > nRows)
    assert(perCell == nCells * 16 && perRow == nRows * 16)
    assert(perCell.toDouble / perRow > 2.0) // avg columns ≥ 3 in the fixture corpus
  }

  test("OrAgg is associative/commutative over partitions (stable under repartition)") {
    val h = Xash(128, 4)
    val a = InvertedIndex.rowSuperKeys(Fixtures.corpus.cells.repartition(1), h)
      .collect().map(r => (r.getLong(0), r.getLong(1)) -> r.getAs[Array[Byte]]("sk")).toMap
    val b = InvertedIndex.rowSuperKeys(Fixtures.corpus.cells.repartition(13), h)
      .collect().map(r => (r.getLong(0), r.getLong(1)) -> r.getAs[Array[Byte]]("sk")).toMap
    assert(a.keySet == b.keySet)
    a.foreach { case (k, v) => assert(Bits.equal(v, b(k))) }
  }
}
