package repro.index

import repro.SparkSpec
import repro.core.{CorrelationSketch, SparkSketches}
import repro.data.TableGen

class SparkSketchIndexSpec extends SparkSpec {

  private lazy val tables = TableGen.nycLike(
    TableGen.CollectionConfig(numGroups = 2, pairsPerGroup = 5, minKeys = 40, maxKeys = 150),
    seed = 91L)
  private lazy val sketches: Map[String, CorrelationSketch] =
    SparkSketches.buildAll(TableGen.toDF(spark, tables), "pair", "key", "value", 64)
  private lazy val indexDf = SparkSketchIndex.build(spark, sketches).cache()
  private lazy val local = new SketchIndex(sketches)

  test("postings row count equals the total number of sketch entries") {
    assert(indexDf.count() == sketches.values.map(_.size).sum.toLong)
  }

  test("broadcast-join query agrees with the in-memory index") {
    val qid = tables.head.id
    val sparkHits = SparkSketchIndex.query(spark, indexDf, sketches(qid), topN = 100,
        exclude = Set(qid))
      .collect().map(r => (r.getString(0), r.getLong(1).toInt)).toSeq
    val localHits = local.search(sketches(qid), topN = 100, exclude = Set(qid))
      .map(h => (h.id, h.overlap))
    assert(sparkHits == localHits)
  }

  test("agreement holds for every query in the collection") {
    tables.map(_.id).foreach { qid =>
      val sparkHits = SparkSketchIndex.query(spark, indexDf, sketches(qid), topN = 50,
          exclude = Set(qid))
        .collect().map(r => (r.getString(0), r.getLong(1).toInt)).toSeq
      val localHits = local.search(sketches(qid), topN = 50, exclude = Set(qid))
        .map(h => (h.id, h.overlap))
      assert(sparkHits == localHits, s"mismatch for query $qid")
    }
  }

  test("topN limit is applied") {
    val qid = tables.head.id
    val hits = SparkSketchIndex.query(spark, indexDf, sketches(qid), topN = 2).collect()
    assert(hits.length <= 2)
  }

  test("self-match has full-sketch overlap when not excluded") {
    val qid = tables.head.id
    val hits = SparkSketchIndex.query(spark, indexDf, sketches(qid), topN = 1)
      .collect()
    assert(hits.head.getString(0) == qid)
    assert(hits.head.getLong(1) == sketches(qid).size.toLong)
  }
}
