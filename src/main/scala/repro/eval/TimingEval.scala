package repro.eval

import repro.core.{AggFn, CorrelationSketch}
import repro.data.{FullJoin, KVTable, TableGen}
import repro.stats.Correlations

import java.util.SplittableRandom

/** Harness for Table 2: per-pair running times (ms) of join, Pearson and
  * Spearman on the full data vs on the sketches, reported as mean, std
  * dev, and p75/p90/p99/p99.9 over all pairs.
  *
  * As in the paper, the full data is assumed already in memory — we time
  * the join (hash aggregation + key intersection) and the correlation
  * computations themselves. Table sizes are drawn log-uniformly so the
  * timing distribution is heavy-tailed like the paper's collection.
  */
object TimingEval {

  final case class Row(label: String, mean: Double, std: Double,
                       p75: Double, p90: Double, p99: Double, p999: Double)

  final case class Table2(rows: Seq[Row])

  private def percentile(sorted: Array[Double], p: Double): Double = {
    val idx = math.min(sorted.length - 1, math.ceil(p * sorted.length).toInt - 1)
    sorted(math.max(0, idx))
  }

  private def stats(label: String, ms: Array[Double]): Row = {
    val mean = ms.sum / ms.length
    val std = math.sqrt(ms.map(t => (t - mean) * (t - mean)).sum / ms.length)
    val s = ms.sorted
    Row(label, mean, std, percentile(s, 0.75), percentile(s, 0.90),
      percentile(s, 0.99), percentile(s, 0.999))
  }

  @inline private def timeMs[A](body: => A): (A, Double) = {
    val t0 = System.nanoTime()
    val a = body
    (a, (System.nanoTime() - t0) / 1e6)
  }

  /** Generate `pairs` SBN-style table pairs with heavily skewed sizes in
    * [minN, maxN]: sizes are log-scale with the mass concentrated near
    * minN and rare giants near maxN (u^2.5 skew), mimicking open-data
    * collections where most tables are small and a few are huge — this is
    * what makes the paper's mean sit far above its p75.
    */
  def workload(pairs: Int, minN: Int, maxN: Int, seed: Long = 31L): Seq[(KVTable, KVTable)] = {
    val rng = new SplittableRandom(seed)
    (0 until pairs).map { i =>
      val u = math.pow(rng.nextDouble(), 2.5)
      val logN = math.log(minN) + u * (math.log(maxN) - math.log(minN))
      val n = math.max(4, math.exp(logN).toInt)
      val p = TableGen.sbnPair(s"t2-$i", n, rng.nextDouble() * 2 - 1,
        math.max(0.1, rng.nextDouble()), rng.nextLong())
      (p.x, p.y)
    }
  }

  /** Time all six operations over the workload. Sketches are prebuilt
    * (they are, by design, precomputed at indexing time); `warmup` pairs
    * are measured and discarded so JIT compilation does not pollute tails.
    */
  def run(pairs: Seq[(KVTable, KVTable)], sketchSize: Int = 256,
          warmup: Int = 20): Table2 = {
    val sketches = pairs.map { case (a, b) =>
      (CorrelationSketch.fromColumns(a.keys, a.values, sketchSize),
       CorrelationSketch.fromColumns(b.keys, b.values, sketchSize))
    }
    val m = pairs.length
    val fullJoin = new Array[Double](m); val fullRp = new Array[Double](m)
    val fullRs = new Array[Double](m)
    val skJoin = new Array[Double](m); val skRp = new Array[Double](m)
    val skRs = new Array[Double](m)

    def measure(): Unit = {
      var i = 0
      while (i < m) {
        val (a, b) = pairs(i)
        val (joined, tJoin) = timeMs(FullJoin.joinedColumns(a, b, AggFn.Mean))
        val (_, tRp) = timeMs(Correlations.pearson(joined._1, joined._2))
        val (_, tRs) = timeMs(Correlations.spearman(joined._1, joined._2))
        val (ska, skb) = sketches(i)
        val (sj, tSkJoin) = timeMs(CorrelationSketch.join(ska, skb))
        val (_, tSkRp) = timeMs(Correlations.pearson(sj.xs, sj.ys))
        val (_, tSkRs) = timeMs(Correlations.spearman(sj.xs, sj.ys))
        fullJoin(i) = tJoin; fullRp(i) = tRp; fullRs(i) = tRs
        skJoin(i) = tSkJoin; skRp(i) = tSkRp; skRs(i) = tSkRs
        i += 1
      }
    }
    // Warm-up pass over a prefix, results discarded.
    var w = 0
    while (w < math.min(warmup, m)) {
      val (a, b) = pairs(w)
      val joined = FullJoin.joinedColumns(a, b, AggFn.Mean)
      Correlations.pearson(joined._1, joined._2)
      Correlations.spearman(joined._1, joined._2)
      val (ska, skb) = sketches(w)
      val sj = CorrelationSketch.join(ska, skb)
      Correlations.pearson(sj.xs, sj.ys)
      Correlations.spearman(sj.xs, sj.ys)
      w += 1
    }
    measure()

    Table2(Seq(
      stats("full.join", fullJoin),
      stats("full.r_s", fullRs),
      stats("full.r_p", fullRp),
      stats("sketch.join", skJoin),
      stats("sketch.r_p", skRp),
      stats("sketch.r_s", skRs),
    ))
  }

  def render(t: Table2): String = {
    val sb = new StringBuilder
    sb.append("== Table 2: running times (ms) ==\n")
    sb.append(f"${"op"}%-12s ${"mean"}%10s ${"std"}%10s ${"p75"}%10s ${"p90"}%10s ${"p99"}%10s ${"p99.9"}%10s\n")
    t.rows.foreach { r =>
      sb.append(f"${r.label}%-12s ${r.mean}%10.3f ${r.std}%10.3f ${r.p75}%10.3f ${r.p90}%10.3f ${r.p99}%10.3f ${r.p999}%10.3f\n")
    }
    sb.toString
  }
}
