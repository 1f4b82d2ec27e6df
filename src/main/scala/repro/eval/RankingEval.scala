package repro.eval

import repro.core.CorrelationSketch
import repro.data.{FullJoin, KVTable}
import repro.rank.{CandidateEstimates, Metrics, Ranker, Scoring}
import repro.stats.Correlations

/** Harness for Table 1: run every scoring function over every query in a
  * collection and report MAP (r > .75, r > .50) and nDCG@5 / nDCG@10, with
  * relative improvement over the exact-Jaccard-containment baseline `jc`.
  */
object RankingEval {

  /** The four metric values Table 1 reports for one ranker. */
  final case class Scores(map75: Double, map50: Double, ndcg5: Double, ndcg10: Double) {
    def of(metric: String): Double = metric match {
      case "map75"  => map75
      case "map50"  => map50
      case "ndcg5"  => ndcg5
      case "ndcg10" => ndcg10
    }
  }

  final case class Result(scores: Map[Ranker, Scores]) {
    /** Relative improvement over the `jc` baseline, as in Table 1's "%". */
    def improvementOverJc(ranker: Ranker, metric: String): Double = {
      val base = scores(Ranker.Jc).of(metric)
      (scores(ranker).of(metric) - base) / base * 100.0
    }
  }

  /** One evaluated query: ground-truth |r| per candidate id, plus the
    * sketch-side estimates the scorers consume.
    */
  final case class QueryCase(queryId: String, truth: Map[String, Double],
                             cands: Seq[CandidateEstimates])

  /** Build the per-query candidate lists. Candidates are the *truly
    * joinable* tables (exact key overlap ≥ minOverlap, as in §5.4 where all
    * joinable columns are retrieved per query), excluding the query itself.
    * Ground-truth relevance is the absolute Pearson correlation of the
    * full aggregated join.
    */
  def buildCases(tables: Seq[KVTable], sketches: Map[String, CorrelationSketch],
                 minOverlap: Int = 3, seed: Long = 101L): Seq[QueryCase] = {
    val byId = tables.map(t => t.id -> t).toMap
    tables.flatMap { q =>
      val candidates = tables.filter(c => c.id != q.id && FullJoin.keyOverlap(q, c) >= minOverlap)
      if (candidates.isEmpty) None
      else {
        val truth = candidates.map { c =>
          val r = FullJoin.correlation(q, c)(Correlations.pearson)
          c.id -> (if (r.isNaN) 0.0 else math.abs(r))
        }.toMap
        val ests = candidates.map { c =>
          CandidateEstimates(c.id, sketches(q.id), sketches(c.id),
            jcExact = FullJoin.jaccardContainment(q, c),
            seed = seed ^ (q.id + c.id).hashCode.toLong)
        }
        Some(QueryCase(q.id, truth, ests))
      }
    }
  }

  /** Score all cases under all rankers and aggregate the four metrics. */
  def evaluate(cases: Seq[QueryCase], seed: Long = 7L): Result = {
    val scores = Ranker.all.map { ranker =>
      val perQuery = cases.map { qc =>
        val rankedIds = Scoring.rank(qc.cands, ranker, seed ^ qc.queryId.hashCode.toLong)
          .map(_._1)
        val gains = rankedIds.map(qc.truth)
        (
          Metrics.averagePrecision(gains.map(_ > 0.75)),
          Metrics.averagePrecision(gains.map(_ > 0.50)),
          Metrics.ndcg(gains, 5),
          Metrics.ndcg(gains, 10),
        )
      }
      ranker -> Scores(
        map75 = Metrics.meanAveragePrecision(perQuery.map(_._1)),
        map50 = Metrics.meanAveragePrecision(perQuery.map(_._2)),
        ndcg5 = Metrics.meanNdcg(perQuery.map(_._3)),
        ndcg10 = Metrics.meanNdcg(perQuery.map(_._4)),
      )
    }.toMap
    Result(scores)
  }

  /** Render the four Table 1 sub-tables (ranker, score, % over jc). */
  def render(result: Result): String = {
    val metrics = Seq("map75" -> "MAP (r > .75)", "map50" -> "MAP (r > .50)",
      "ndcg5" -> "nDCG@5", "ndcg10" -> "nDCG@10")
    val sb = new StringBuilder
    metrics.foreach { case (key, title) =>
      sb.append(s"== Table 1: $title ==\n")
      sb.append(f"${"ranker"}%-10s ${"score"}%8s ${"%% over jc"}%10s\n")
      result.scores.toSeq.sortBy { case (_, s) => -s.of(key) }.foreach { case (r, s) =>
        sb.append(f"${r.name}%-10s ${s.of(key)}%8.3f ${result.improvementOverJc(r, key)}%9.1f%%\n")
      }
      sb.append("\n")
    }
    sb.toString
  }
}
