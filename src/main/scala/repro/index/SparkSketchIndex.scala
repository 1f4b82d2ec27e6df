package repro.index

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.functions._
import repro.core.CorrelationSketch

/** Spark-side sketch index: the postings list materialized as a DataFrame
  * of (hash, pair) rows. A join-correlation query broadcast-joins the
  * (small, fixed-size) query sketch against the index and counts overlaps
  * per candidate — the distributed analogue of [[SketchIndex.search]].
  */
object SparkSketchIndex {

  /** Explode a sketch map into the postings DataFrame (hash, pair). */
  def build(spark: SparkSession, sketches: Map[String, CorrelationSketch]): DataFrame = {
    import spark.implicits._
    val rows = sketches.toSeq.flatMap { case (id, sk) => sk.keyHashes.map(h => (h, id)) }
    spark.createDataset(rows).toDF("hash", "pair")
  }

  /** Top-N candidates by key-hash overlap via a broadcast join of the
    * query sketch hashes against the postings index. Returns a DataFrame
    * (pair, overlap) ordered by (overlap desc, pair) limited to `topN`.
    */
  def query(spark: SparkSession, index: DataFrame, querySketch: CorrelationSketch,
            topN: Int, exclude: Set[String] = Set.empty): DataFrame = {
    import spark.implicits._
    val q = spark.createDataset(querySketch.keyHashes.toSeq).toDF("qhash")
    index
      .join(broadcast(q), col("hash") === col("qhash"))
      .filter(!col("pair").isInCollection(if (exclude.isEmpty) Seq("") else exclude.toSeq))
      .groupBy("pair")
      .agg(count(lit(1)).as("overlap"))
      .orderBy(col("overlap").desc, col("pair"))
      .limit(topN)
  }
}
