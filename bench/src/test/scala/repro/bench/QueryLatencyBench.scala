package repro.bench

import repro.SparkSpec
import repro.core.SparkSketches
import repro.data.TableGen
import repro.index.SketchIndex
import repro.jobs.QueryLatencyJob

/** Reproduces the §5.5 query-evaluation experiment (prose, not a table):
  * the corpus/query split with sketch size 1024, inverted-index retrieval
  * of the top-100 candidates by key overlap and re-sorting by estimated
  * correlation. Paper: 94% of queries under 100 ms, ~98.5% under 200 ms.
  */
class QueryLatencyBench extends SparkSpec {

  private lazy val latencies: Seq[Double] = {
    val tables = TableGen.nycLike(TableGen.CollectionConfig(
      numGroups = 16, pairsPerGroup = 24, minKeys = 60, maxKeys = 1500), seed = 5555L)
    val sketches =
      SparkSketches.buildAll(TableGen.toDF(spark, tables), "pair", "key", "value", 1024)
    val (queryIds, corpusIds) = sketches.keys.toSeq.sorted.zipWithIndex.partition(_._2 % 2 == 0)
    val index = new SketchIndex(corpusIds.map(_._1).map(id => id -> sketches(id)).toMap)
    // warm-up pass for JIT, then measured pass
    queryIds.take(20).foreach { case (qid, _) => QueryLatencyJob.timedQuery(index, sketches(qid)) }
    queryIds.map { case (qid, _) => QueryLatencyJob.timedQuery(index, sketches(qid)) }.sorted
  }

  test("§5.5: print reproduction") {
    def pct(p: Double) = latencies((p * (latencies.size - 1)).toInt)
    println(f"queries=${latencies.size} " +
      f"under100ms=${latencies.count(_ < 100).toDouble / latencies.size * 100}%.1f%% " +
      f"under200ms=${latencies.count(_ < 200).toDouble / latencies.size * 100}%.1f%% " +
      f"p50=${pct(0.5)}%.3fms p90=${pct(0.9)}%.3fms p99=${pct(0.99)}%.3fms")
    println("paper: 94% of queries under 100 ms, ~98.5% under 200 ms")
  }

  test("§5.5 shape: at least 94% of queries answer under 100 ms") {
    val frac = latencies.count(_ < 100).toDouble / latencies.size
    assert(frac >= 0.94, f"only ${frac * 100}%.1f%% of queries under 100 ms")
  }

  test("§5.5 shape: at least 98.5% of queries answer under 200 ms") {
    val frac = latencies.count(_ < 200).toDouble / latencies.size
    assert(frac >= 0.985, f"only ${frac * 100}%.1f%% of queries under 200 ms")
  }

  test("§5.5 shape: interactive regime — median latency well under 100 ms") {
    assert(latencies(latencies.size / 2) < 100.0)
  }
}
