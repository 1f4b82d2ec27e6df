package repro.data

import org.apache.spark.sql.functions.corr
import repro.{Oracle, SparkSpec}
import repro.core.AggFn
import repro.stats.Correlations

class FullJoinSpec extends SparkSpec {

  private val tx = KVTable("tx",
    Array("2021-01", "2021-02", "2021-03", "2021-04", "2021-05", "2021-06", "2021-07"),
    Array(6.0, 4.0, 2.0, 3.0, 0.5, 4.0, 2.0))
  private val ty = KVTable("ty",
    Array("2021-01", "2021-01", "2021-02", "2021-02", "2021-03", "2021-03", "2021-04"),
    Array(5.5, 4.5, 3.9, 2.0, 4.0, 1.0, 4.0))

  test("reproduces the paper's Figure 1 worked example (mean aggregation)") {
    val (xs, ys) = FullJoin.joinedColumns(tx, ty)
    // keys sorted: 2021-01..2021-04
    assert(xs.toSeq == Seq(6.0, 4.0, 2.0, 3.0))
    assert(ys.toSeq == Seq(5.0, 2.95, 2.5, 4.0))
  }

  test("aggregateByKey honors each aggregate function") {
    val m = FullJoin.aggregateByKey(ty, AggFn.Mean)
    assert(m("2021-01") == 5.0)
    assert(FullJoin.aggregateByKey(ty, AggFn.Sum)("2021-01") == 10.0)
    assert(FullJoin.aggregateByKey(ty, AggFn.Count)("2021-01") == 2.0)
    assert(FullJoin.aggregateByKey(ty, AggFn.Min)("2021-01") == 4.5)
    assert(FullJoin.aggregateByKey(ty, AggFn.Max)("2021-01") == 5.5)
  }

  test("join is symmetric up to column order") {
    val (xs1, ys1) = FullJoin.joinedColumns(tx, ty)
    val (ys2, xs2) = FullJoin.joinedColumns(ty, tx)
    assert(xs1.toSeq == xs2.toSeq && ys1.toSeq == ys2.toSeq)
  }

  test("disjoint tables join to empty columns") {
    val other = KVTable("o", Array("zzz"), Array(1.0))
    val (xs, ys) = FullJoin.joinedColumns(tx, other)
    assert(xs.isEmpty && ys.isEmpty)
  }

  test("jaccard containment of the worked example") {
    // tx has 7 distinct keys, 4 of them appear in ty
    assert(math.abs(FullJoin.jaccardContainment(tx, ty) - 4.0 / 7.0) < 1e-12)
    assert(FullJoin.jaccardContainment(ty, tx) == 1.0)
  }

  test("key overlap counts distinct shared keys") {
    assert(FullJoin.keyOverlap(tx, ty) == 4)
  }

  test("containment of an empty table is zero") {
    val empty = KVTable("e", Array.empty, Array.empty)
    assert(FullJoin.jaccardContainment(empty, tx) == 0.0)
  }

  test("Spark joinedDF matches the local join (oracle-checked vs DuckDB)") {
    val sparkDf = FullJoin.joinedDF(spark, tx, ty)
    Oracle.assertEquivalent(sparkDf,
      """WITH ax AS (SELECT key AS k, AVG(CAST(value AS DOUBLE)) AS x FROM tx GROUP BY key),
        |     bx AS (SELECT key AS kb, AVG(CAST(value AS DOUBLE)) AS y FROM ty GROUP BY key)
        |SELECT k, x, y FROM ax JOIN bx ON ax.k = bx.kb""".stripMargin,
      "tx" -> TableGen.toDF(spark, Seq(tx)),
      "ty" -> TableGen.toDF(spark, Seq(ty)))
  }

  test("Spark post-join correlation matches DuckDB corr (oracle-checked)") {
    val sparkDf = FullJoin.joinedDF(spark, tx, ty).agg(corr("x", "y").as("c"))
    Oracle.assertEquivalent(sparkDf,
      """WITH ax AS (SELECT key AS k, AVG(CAST(value AS DOUBLE)) AS x FROM tx GROUP BY key),
        |     bx AS (SELECT key AS kb, AVG(CAST(value AS DOUBLE)) AS y FROM ty GROUP BY key)
        |SELECT corr(x, y) AS c FROM ax JOIN bx ON ax.k = bx.kb""".stripMargin,
      "tx" -> TableGen.toDF(spark, Seq(tx)),
      "ty" -> TableGen.toDF(spark, Seq(ty)))
  }

  test("local ground-truth correlation equals the Spark/DuckDB-checked value") {
    val rLocal = FullJoin.correlation(tx, ty)(Correlations.pearson)
    val rSpark = FullJoin.joinedDF(spark, tx, ty).agg(corr("x", "y"))
      .collect()(0).getDouble(0)
    assert(math.abs(rLocal - rSpark) < 1e-9)
  }

  test("local and Spark joins agree on a larger generated pair") {
    val p = TableGen.sbnPair("fj", n = 500, targetR = 0.4, joinProb = 0.7, seed = 12L)
    val (xs, ys) = FullJoin.joinedColumns(p.x, p.y)
    val rows = FullJoin.joinedDF(spark, p.x, p.y).collect()
      .map(r => (r.getString(0), r.getDouble(1), r.getDouble(2)))
      .sortBy(_._1)
    assert(rows.length == xs.length)
    assert(rows.map(_._2).toSeq == xs.toSeq)
    assert(rows.map(_._3).toSeq == ys.toSeq)
  }
}
