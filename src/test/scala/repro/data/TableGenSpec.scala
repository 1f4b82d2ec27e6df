package repro.data

import repro.SparkSpec
import repro.stats.Correlations

class TableGenSpec extends SparkSpec {

  test("sbnPair produces the requested row count and unique keys") {
    val p = TableGen.sbnPair("t", n = 1000, targetR = 0.5, joinProb = 1.0, seed = 1L)
    assert(p.x.rows == 1000)
    assert(p.x.distinctKeys.size == 1000)
  }

  test("sbnPair hits the target correlation for large n") {
    for (target <- Seq(-0.8, 0.0, 0.6)) {
      val p = TableGen.sbnPair("t", n = 30000, targetR = target, joinProb = 1.0, seed = 2L)
      val (xs, ys) = FullJoin.joinedColumns(p.x, p.y)
      val r = Correlations.pearson(xs, ys)
      assert(math.abs(r - target) < 0.03, s"target $target got $r")
    }
  }

  test("join probability controls the subsampled side's size") {
    val p = TableGen.sbnPair("t", n = 10000, targetR = 0.0, joinProb = 0.3, seed = 3L)
    assert(math.abs(p.y.rows - 3000) < 300, s"got ${p.y.rows}")
  }

  test("sbnPair keys are namespaced so separate pairs never join") {
    val p1 = TableGen.sbnPair("p1", 100, 0.5, 1.0, 4L)
    val p2 = TableGen.sbnPair("p2", 100, 0.5, 1.0, 4L)
    assert(FullJoin.keyOverlap(p1.x, p2.x) == 0)
  }

  test("sbn collection has the requested shape and is deterministic") {
    val c1 = TableGen.sbn(10, 50, 200, seed = 5L)
    val c2 = TableGen.sbn(10, 50, 200, seed = 5L)
    assert(c1.size == 10)
    assert(c1.map(_.x.rows) == c2.map(_.x.rows))
    assert(c1.zip(c2).forall { case (a, b) => a.x.values.toSeq == b.x.values.toSeq })
    assert(c1.forall(p => p.targetR >= -1.0 && p.targetR <= 1.0))
  }

  test("nycLike produces the configured number of tables") {
    val cfg = TableGen.CollectionConfig(numGroups = 3, pairsPerGroup = 4,
      minKeys = 30, maxKeys = 100)
    assert(TableGen.nycLike(cfg).size == 12)
  }

  test("nycLike tables in the same group are joinable, across groups are not") {
    val cfg = TableGen.CollectionConfig(numGroups = 2, pairsPerGroup = 3,
      minKeys = 50, maxKeys = 100)
    val ts = TableGen.nycLike(cfg, seed = 6L)
    val g0 = ts.filter(_.id.startsWith("g0:"))
    val g1 = ts.filter(_.id.startsWith("g1:"))
    assert(FullJoin.keyOverlap(g0(0), g0(1)) > 0)
    assert(FullJoin.keyOverlap(g0(0), g1(0)) == 0)
  }

  test("nycLike contains duplicated keys (repeated categorical values)") {
    val ts = TableGen.nycLike(TableGen.CollectionConfig(numGroups = 1, pairsPerGroup = 5,
      minKeys = 200, maxKeys = 400), seed = 7L)
    assert(ts.exists(t => t.rows > t.distinctKeys.size))
  }

  test("nycLike plants both strong and weak correlations within groups") {
    val ts = TableGen.nycLike(TableGen.CollectionConfig(numGroups = 2, pairsPerGroup = 12,
      minKeys = 300, maxKeys = 600), seed = 8L)
    val rs = for {
      g <- Seq("g0", "g1")
      group = ts.filter(_.id.startsWith(g + ":"))
      a <- group; b <- group if a.id < b.id
      r = FullJoin.correlation(a, b)(Correlations.pearson) if !r.isNaN
    } yield math.abs(r)
    assert(rs.exists(_ > 0.5), "no strongly correlated pair planted")
    assert(rs.exists(_ < 0.2), "no weakly correlated pair planted")
  }

  test("wbfLike generates heavy-tailed value columns") {
    val ts = TableGen.wbfLike()
    val kurtoses = ts.map { t =>
      val m = t.values.sum / t.rows
      val v = t.values.map(x => (x - m) * (x - m)).sum / t.rows
      if (v == 0) 0.0 else t.values.map(x => math.pow(x - m, 4)).sum / t.rows / (v * v)
    }
    assert(kurtoses.exists(_ > 9.0), s"max kurtosis ${kurtoses.max} — expected heavy tails")
  }

  test("toDF flattens the collection preserving row counts") {
    val ts = TableGen.nycLike(TableGen.CollectionConfig(numGroups = 1, pairsPerGroup = 3,
      minKeys = 30, maxKeys = 60), seed = 9L)
    val df = TableGen.toDF(spark, ts)
    assert(df.count() == ts.map(_.rows.toLong).sum)
    assert(df.columns.toSeq == Seq("pair", "key", "value"))
  }
}
