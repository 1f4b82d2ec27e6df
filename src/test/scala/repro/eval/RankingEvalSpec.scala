package repro.eval

import repro.SparkSpec
import repro.core.{CorrelationSketch, SparkSketches}
import repro.data.TableGen
import repro.rank.Ranker

class RankingEvalSpec extends SparkSpec {

  private lazy val tables = TableGen.nycLike(
    TableGen.CollectionConfig(numGroups = 3, pairsPerGroup = 8, minKeys = 150, maxKeys = 400),
    seed = 55L)
  private lazy val sketches: Map[String, CorrelationSketch] =
    SparkSketches.buildAll(TableGen.toDF(spark, tables), "pair", "key", "value", 128)
  private lazy val cases = RankingEval.buildCases(tables, sketches)
  private lazy val result = RankingEval.evaluate(cases)

  test("cases exclude the query table itself") {
    cases.foreach(qc => assert(!qc.cands.exists(_.id == qc.queryId)))
  }

  test("every query's candidates come from its own join group") {
    cases.foreach { qc =>
      val g = qc.queryId.split(':')(0)
      qc.cands.foreach(c => assert(c.id.startsWith(g + ":")))
    }
  }

  test("ground-truth relevance values are absolute correlations in [0, 1]") {
    cases.foreach(_.truth.values.foreach(v => assert(v >= 0.0 && v <= 1.0)))
  }

  test("every ranker receives a score for every metric") {
    Ranker.all.foreach { r =>
      val s = result.scores(r)
      Seq(s.map75, s.map50, s.ndcg5, s.ndcg10).foreach(v => assert(!v.isNaN, r.name))
    }
  }

  test("scores are valid metric values in [0, 1]") {
    result.scores.values.foreach { s =>
      Seq(s.map75, s.map50, s.ndcg5, s.ndcg10).foreach(v => assert(v >= 0.0 && v <= 1.0 + 1e-9))
    }
  }

  test("correlation-aware rankers beat the joinability baseline (the paper's headline)") {
    val rp = result.scores(Ranker.Rp)
    val jc = result.scores(Ranker.Jc)
    assert(rp.map50 > jc.map50, s"rp=${rp.map50} jc=${jc.map50}")
    assert(rp.ndcg10 > jc.ndcg10)
  }

  test("improvement over jc is reported as a percentage") {
    val imp = result.improvementOverJc(Ranker.Rp, "map50")
    assert(imp > 0.0)
    assert(result.improvementOverJc(Ranker.Jc, "map50") == 0.0)
  }

  test("render produces all four sub-tables") {
    val out = RankingEval.render(result)
    assert(out.contains("MAP (r > .75)") && out.contains("MAP (r > .50)"))
    assert(out.contains("nDCG@5") && out.contains("nDCG@10"))
    Ranker.all.foreach(r => assert(out.contains(r.name)))
  }
}
