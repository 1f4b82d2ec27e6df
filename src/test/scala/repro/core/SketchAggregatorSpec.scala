package repro.core

import repro.SparkSpec
import repro.data.TableGen

/** Distributed sketch construction must agree with the sequential local
  * build — Spark partitioning and merge order may not change the sketch.
  */
class SketchAggregatorSpec extends SparkSpec {

  private lazy val tables = TableGen.nycLike(
    TableGen.CollectionConfig(numGroups = 3, pairsPerGroup = 4, minKeys = 50, maxKeys = 300),
    seed = 77L)

  private lazy val sparkSketches: Map[String, CorrelationSketch] = {
    val df = TableGen.toDF(spark, tables).repartition(13) // force multi-partition merges
    SparkSketches.buildAll(df, "pair", "key", "value", maxSize = 64)
  }

  test("buildAll returns one sketch per column pair") {
    assert(sparkSketches.keySet == tables.map(_.id).toSet)
  }

  test("distributed sketches keep exactly the same keys as local builds") {
    tables.foreach { t =>
      val local = CorrelationSketch.fromColumns(t.keys, t.values, 64)
      assert(sparkSketches(t.id).keyHashes.toSeq == local.keyHashes.toSeq,
        s"key mismatch for ${t.id}")
    }
  }

  test("distributed aggregated values match local builds") {
    tables.foreach { t =>
      val local = CorrelationSketch.fromColumns(t.keys, t.values, 64)
      sparkSketches(t.id).values.zip(local.values).foreach { case (a, b) =>
        assert(math.abs(a - b) < 1e-9, s"value mismatch for ${t.id}: $a vs $b")
      }
    }
  }

  test("distributed sketches carry correct row counts and ranges") {
    tables.foreach { t =>
      val sk = sparkSketches(t.id)
      assert(sk.rows == t.rows.toLong)
      assert(sk.xMin == t.values.min && sk.xMax == t.values.max)
    }
  }

  test("exactness flag survives distribution") {
    tables.foreach { t =>
      val local = CorrelationSketch.fromColumns(t.keys, t.values, 64)
      assert(sparkSketches(t.id).exact == local.exact, s"exact mismatch for ${t.id}")
    }
  }

  test("null keys and values are dropped before sketching") {
    import spark.implicits._
    val df = Seq(
      (Option("p"), Option("a"), Option(1.0)),
      (Option("p"), None, Option(2.0)),
      (Option("p"), Option("b"), None),
      (Option("p"), Option("c"), Option(3.0)),
    ).toDF("pair", "key", "value")
    val sk = SparkSketches.buildAll(df, "pair", "key", "value", 16)("p")
    assert(sk.rows == 2L)
    assert(sk.keyHashes.toSet == Set(Hashing.h("a"), Hashing.h("c")))
  }

  test("buildOne sketches a single table's column pair") {
    import spark.implicits._
    val df = Seq(("a", 1.0), ("b", 2.0), ("a", 3.0)).toDF("k", "v")
    val sk = SparkSketches.buildOne(df, "k", "v", 8)
    assert(sk.rows == 3L)
    assert(sk.keyHashes.zip(sk.values).toMap.apply(Hashing.h("a")) == 2.0)
  }

  test("numeric key columns are stringified consistently with local builds") {
    import spark.implicits._
    val df = Seq((1L, 1.5), (2L, 2.5), (1L, 0.5)).toDF("k", "v").withColumn("pair",
      org.apache.spark.sql.functions.lit("n"))
    val sk = SparkSketches.buildAll(df, "pair", "k", "v", 8)("n")
    val local = CorrelationSketch.fromColumns(Array("1", "2", "1"), Array(1.5, 2.5, 0.5), 8)
    assert(sk.keyHashes.toSeq == local.keyHashes.toSeq)
    assert(sk.values.toSeq == local.values.toSeq)
  }

  test("sum aggregation works through the distributed path") {
    import spark.implicits._
    val df = Seq(("p", "a", 1.0), ("p", "a", 2.0), ("p", "b", 5.0))
      .toDF("pair", "key", "value").repartition(3)
    val sk = SparkSketches.buildAll(df, "pair", "key", "value", 8, AggFn.Sum)("p")
    val byHash = sk.keyHashes.zip(sk.values).toMap
    assert(byHash(Hashing.h("a")) == 3.0)
    assert(byHash(Hashing.h("b")) == 5.0)
  }
}
