package repro.core

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.functions._

import repro.corpus.CorpusGen.QueryTable
import repro.hash.SuperKeyHash
import repro.index.InvertedIndex

/** MATE's online discovery phase (§6) as a Spark dataflow.
  *
  * The four phases map onto the dataflow as:
  *
  *  1. '''initialization''' — [[prepareQuery]] picks the init column by
  *     minimum cardinality (§6.1) and builds a small query DataFrame of
  *     distinct key tuples; [[candidates]] joins it with the posting
  *     lists — this is the fetch step whose cost the paper excludes
  *     from runtimes (§7.2), so benches cache its result.
  *  2. '''table filtering''' — the sequential early-termination rules
  *     (Algorithm 1 lines 9/14) are inherently order-dependent, so the
  *     distributed variant evaluates all candidate tables; the faithful
  *     sequential rules live in [[MateLocal]].
  *  3. '''row filtering''' — join candidate rows with per-row super
  *     keys and keep only rows whose super key masks the query key's
  *     OR-aggregated hash (§6.3): `qsk ⊆ sk` via a UDF on binary
  *     columns.
  *  4. '''calculateJ''' — join surviving rows with the row-value maps,
  *     enumerate matching column mappings per row (§2), and take, per
  *     table, the best single mapping's distinct-tuple count.
  */
object MateSpark {

  /** Work + quality counters for one discovery run.
    *
    * `cellsCompared` is the deterministic cost proxy: the number of
    * cell values fetched into exact verification (what SCR pays for
    * every candidate row and MATE only for filter survivors).
    * TP/FP are at row granularity, matching the paper's FP-row
    * definition (§3); `precision = TP / (TP + FP)` is Table 3's metric.
    */
  final case class Metrics(
      candidatePairs: Long,   // fetched (row × tuple) pairs before any filter
      maskChecks: Long,       // super-key subset tests performed (0 for SCR)
      verifiedPairs: Long,    // pairs surviving the filter → exact verification
      rowsChecked: Long,      // distinct rows surviving the filter
      tpRows: Long,
      fpRows: Long,
      cellsCompared: Long,
      millis: Long) {
    def precision: Double =
      if (tpRows + fpRows == 0) 1.0 else tpRows.toDouble / (tpRows + fpRows)
  }

  final case class Result(topK: Seq[(Long, Long)], metrics: Metrics)

  /** Distinct key tuples of the query with init-column binding values:
    * `(qTupleId, initValue, tuple)`.
    */
  def prepareQuery(spark: SparkSession, q: QueryTable): DataFrame = {
    import spark.implicits._
    val initCol = InitColumn.byCardinality(q.rows)
    val tuples  = q.tuples.map(_.map(SuperKeyHash.normalize))
    tuples.zipWithIndex
      .map { case (t, i) => (i, t(initCol), t) }
      .toDF("qTupleId", "initValue", "tuple")
  }

  /** Candidate (row × query-tuple) pairs from the init-column posting
    * lists — the fetch phase. One pair per corpus row containing the
    * tuple's init value in any column (the mapping is unknown, §2).
    */
  def candidates(postingLists: DataFrame, queryDf: DataFrame): DataFrame =
    postingLists.join(queryDf, postingLists("value") === queryDf("initValue"))
      .select("tableId", "rowId", "qTupleId", "tuple")
      .distinct()

  /** Per-tuple query super keys `(qTupleId, qsk)` — the OR aggregation
    * of the hash of each key value (§6.1 line 6).
    */
  def querySuperKeys(spark: SparkSession, q: QueryTable, hash: SuperKeyHash): DataFrame = {
    import spark.implicits._
    q.tuples.map(_.map(SuperKeyHash.normalize)).zipWithIndex
      .map { case (t, i) => (i, hash.superKey(t)) }
      .toDF("qTupleId", "qsk")
  }

  /** Run row filtering + verification + top-k on prepared inputs.
    *
    * @param cand     cached candidate pairs from [[candidates]]
    * @param rowVals  per-row value maps ([[InvertedIndex.rowValues]])
    * @param filter   `Some((rowSk, querySk))` for MATE with a hash;
    *                 `None` for the SCR baseline (exact checks only)
    * @param k        number of joinable tables to return
    */
  def discover(
      cand: DataFrame,
      rowVals: DataFrame,
      filter: Option[(DataFrame, DataFrame)],
      k: Int): Result = {
    val spark = cand.sparkSession
    import spark.implicits._

    val t0 = System.nanoTime()
    val maskUdf = udf((qsk: Array[Byte], sk: Array[Byte]) => repro.util.Bits.subsetOf(qsk, sk))
    val mappingsUdf = udf((tuple: Seq[String], vals: Map[Int, String]) =>
      Joinability.rowMappings(tuple, vals))

    val candPairs = cand.count() // cached upstream; the fetched PL volume
    val (filtered, maskChecks) = filter match {
      case Some((rowSk, querySk)) =>
        val joined = cand.join(rowSk, Seq("tableId", "rowId")).join(querySk, Seq("qTupleId"))
        // one subset test per candidate pair (§6.3's "single operation")
        (joined.filter(maskUdf($"qsk", $"sk")).select("tableId", "rowId", "qTupleId", "tuple"), candPairs)
      case None => (cand, 0L)
    }

    val verified = filtered
      .join(rowVals, Seq("tableId", "rowId"))
      .select($"tableId", $"rowId", $"qTupleId",
        mappingsUdf($"tuple", $"vals") as "mappings",
        size(map_keys($"vals")) as "ncells")
      .cache()

    val pairAgg = verified
      .agg(count(lit(1)) as "pairs", coalesce(sum($"ncells"), lit(0L)) as "cells").head()
    val rowAgg = verified
      .groupBy("tableId", "rowId").agg(max(size($"mappings")) as "m")
      .agg(count(lit(1)) as "rows",
           coalesce(sum(when($"m" > 0, 1L).otherwise(0L)), lit(0L)) as "tp").head()

    val topK = verified
      .filter(size($"mappings") > 0)
      .select($"tableId", $"qTupleId", explode($"mappings") as "mapping")
      .distinct()
      .groupBy("tableId", "mapping").agg(countDistinct($"qTupleId") as "j")
      .groupBy("tableId").agg(max($"j") as "j")
      .orderBy(desc("j"), asc("tableId"))
      .limit(k)
      .collect()
      .map(r => (r.getLong(0), r.getLong(1)))
      .toSeq

    verified.unpersist()
    val millis = (System.nanoTime() - t0) / 1000000

    val rows = rowAgg.getLong(0)
    val tp   = rowAgg.getLong(1)
    Result(topK, Metrics(
      candidatePairs = candPairs,
      maskChecks = maskChecks,
      verifiedPairs = pairAgg.getLong(0),
      rowsChecked = rows,
      tpRows = tp,
      fpRows = rows - tp,
      cellsCompared = pairAgg.getLong(1),
      millis = millis))
  }

  /** End-to-end convenience: fetch + discover for one query table. */
  def run(
      spark: SparkSession,
      postingLists: DataFrame,
      rowVals: DataFrame,
      rowSk: Option[DataFrame],
      hash: Option[SuperKeyHash],
      q: QueryTable,
      k: Int): Result = {
    val queryDf = prepareQuery(spark, q)
    val cand    = candidates(postingLists, queryDf).cache()
    cand.count()
    val filter = (rowSk, hash) match {
      case (Some(sk), Some(h)) => Some((sk, querySuperKeys(spark, q, h)))
      case _                   => None
    }
    try discover(cand, rowVals, filter, k)
    finally cand.unpersist()
  }
}
