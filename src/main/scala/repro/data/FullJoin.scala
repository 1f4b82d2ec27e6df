package repro.data

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.functions._
import repro.core.{AggFn, KeyState}

import scala.collection.mutable

/** Exact (non-sketched) join-correlation ground truth: join two column
  * pairs on their keys, aggregate repeated keys, and return the paired
  * numeric columns of T_{X⋈Y}. This is the expensive baseline the paper
  * compares sketches against (§5.2 actual correlations, §5.5 Table 2
  * full-data timings) and the relevance oracle for Table 1.
  */
object FullJoin {

  /** Aggregate a table's values per distinct key with `agg`. */
  def aggregateByKey(t: KVTable, agg: AggFn): mutable.HashMap[String, Double] = {
    val states = new mutable.HashMap[String, KeyState]
    var i = 0
    while (i < t.rows) {
      val k = t.keys(i); val v = t.values(i)
      states.get(k) match {
        case Some(st) => st.add(v)
        case None     => states.put(k, KeyState(v, 1L, v, v))
      }
      i += 1
    }
    states.map { case (k, st) => k -> agg.finalize(st.sum, st.count, st.min, st.max) }
  }

  /** The paired numeric columns ⟨X_{X⋈Y}, Y_{X⋈Y}⟩ of the aggregated join,
    * in deterministic (sorted-key) order.
    */
  def joinedColumns(a: KVTable, b: KVTable,
                    agg: AggFn = AggFn.Mean): (Array[Double], Array[Double]) = {
    val ma = aggregateByKey(a, agg)
    val mb = aggregateByKey(b, agg)
    val (small, large, swapped) = if (ma.size <= mb.size) (ma, mb, false) else (mb, ma, true)
    val ks = small.keysIterator.filter(large.contains).toArray.sorted
    val xs = new Array[Double](ks.length)
    val ys = new Array[Double](ks.length)
    var i = 0
    while (i < ks.length) {
      val k = ks(i)
      if (swapped) { xs(i) = large(k); ys(i) = small(k) }
      else { xs(i) = small(k); ys(i) = large(k) }
      i += 1
    }
    (xs, ys)
  }

  /** Ground-truth correlation of the aggregated join under `estimator`. */
  def correlation(a: KVTable, b: KVTable, agg: AggFn = AggFn.Mean)(
      estimator: (Array[Double], Array[Double]) => Double): Double = {
    val (xs, ys) = joinedColumns(a, b, agg)
    estimator(xs, ys)
  }

  /** Exact Jaccard containment of A's distinct keys in B's: |K_A∩K_B|/|K_A|
    * — the `jc` ranking baseline of §5.4.
    */
  def jaccardContainment(a: KVTable, b: KVTable): Double = {
    val ka = a.distinctKeys
    if (ka.isEmpty) return 0.0
    val kb = b.distinctKeys
    ka.count(kb.contains).toDouble / ka.size
  }

  /** Exact key-overlap size |K_A ∩ K_B|. */
  def keyOverlap(a: KVTable, b: KVTable): Int = {
    val ka = a.distinctKeys
    val kb = b.distinctKeys
    val (s, l) = if (ka.size <= kb.size) (ka, kb) else (kb, ka)
    s.count(l.contains)
  }

  /** DataFrame version of the aggregated join, for oracle-checked tests:
    * mean-aggregate each side per key, inner-join on the key, and return
    * columns (k, x, y). Semantics must match [[joinedColumns]].
    */
  def joinedDF(spark: SparkSession, a: KVTable, b: KVTable): DataFrame = {
    val dfA = TableGen.toDF(spark, Seq(a)).groupBy(col("key").as("k"))
      .agg(avg("value").as("x"))
    val dfB = TableGen.toDF(spark, Seq(b)).groupBy(col("key").as("kb"))
      .agg(avg("value").as("y"))
    dfA.join(dfB, col("k") === col("kb")).select(col("k"), col("x"), col("y"))
  }
}
