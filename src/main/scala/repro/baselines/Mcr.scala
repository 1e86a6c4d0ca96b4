package repro.baselines

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.functions._

import repro.core.{InitColumn, MateSpark}
import repro.corpus.CorpusGen.QueryTable
import repro.hash.SuperKeyHash

/** Multi-Column Retrieval baseline (§7.1.1): fetch the posting lists of
  * '''every''' query column, intersect the (table, row) sets, and verify
  * the intersection exactly. No super key is involved; the cost driver
  * is the per-column PL fetch volume the paper calls out in §7.2.
  */
object Mcr {

  final case class Result(topK: Seq[(Long, Long)], plItemsFetched: Long, metrics: MateSpark.Metrics)

  def run(
      spark: SparkSession,
      postingLists: DataFrame,
      rowVals: DataFrame,
      q: QueryTable,
      k: Int): Result = {
    import spark.implicits._

    val qSize  = q.qSize
    val tuples = q.tuples.map(_.map(SuperKeyHash.normalize))

    // One fetch per query column (the |Q| independent index queries the
    // running example in §3 wants to avoid).
    var plItems = 0L
    val perColumn = (0 until qSize).map { i =>
      val values = tuples.map(_(i)).distinct.toDF("value")
      val hits   = postingLists.join(values, "value").select($"tableId", $"rowId").distinct()
        .withColumn("qcol", lit(i))
      plItems += postingLists.join(values, "value").count()
      hits
    }

    // Rows containing a value of every query column (FP-laden superset
    // of the joinable rows — combinations may come from different rows
    // of the query table).
    val intersected = perColumn.reduce(_ unionByName _)
      .groupBy("tableId", "rowId")
      .agg(countDistinct($"qcol") as "nc")
      .filter($"nc" === qSize)
      .select("tableId", "rowId")

    // Bind to query tuples via the init column (as MATE does) and verify.
    val queryDf = MateSpark.prepareQuery(spark, q)
    val cand = MateSpark.candidates(postingLists, queryDf)
      .join(intersected, Seq("tableId", "rowId"))
      .cache()
    cand.count()
    try {
      val r = MateSpark.discover(cand, rowVals, None, k)
      Result(r.topK, plItems, r.metrics)
    } finally { cand.unpersist(); () }
  }
}
