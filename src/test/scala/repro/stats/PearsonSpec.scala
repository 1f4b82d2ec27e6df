package repro.stats

import org.scalacheck.{Gen, Prop}
import repro.{Oracle, PropSupport, SparkSpec}

class PearsonSpec extends SparkSpec with PropSupport {

  test("perfect positive and negative linear relationships") {
    val x = Array(1.0, 2.0, 3.0, 4.0)
    assert(math.abs(Correlations.pearson(x, x.map(2 * _ + 1)) - 1.0) < 1e-12)
    assert(math.abs(Correlations.pearson(x, x.map(-3 * _ + 7)) + 1.0) < 1e-12)
  }

  test("hand-computed example") {
    // x = 1,2,3; y = 2,2,4 → r = 3/(sqrt(2)*sqrt(8/3))/... compute directly
    val r = Correlations.pearson(Array(1.0, 2.0, 3.0), Array(2.0, 2.0, 4.0))
    assert(math.abs(r - 0.866025403784) < 1e-9)
  }

  test("invariance to affine transforms with positive scale (property)") {
    val data = Gen.listOfN(30, Gen.zip(Gen.chooseNum(-10.0, 10.0), Gen.chooseNum(-10.0, 10.0)))
    checkProp(Prop.forAll(data, Gen.chooseNum(0.1, 5.0), Gen.chooseNum(-9.0, 9.0)) {
      (pts, a, b) =>
        val x = pts.map(_._1).toArray; val y = pts.map(_._2).toArray
        val r1 = Correlations.pearson(x, y)
        val r2 = Correlations.pearson(x.map(a * _ + b), y)
        r1.isNaN == r2.isNaN && (r1.isNaN || math.abs(r1 - r2) < 1e-6)
    })
  }

  test("negative scaling flips the sign") {
    val x = Array(1.0, 3.0, 2.0, 5.0)
    val y = Array(2.0, 4.0, 1.0, 6.0)
    val r = Correlations.pearson(x, y)
    assert(math.abs(Correlations.pearson(x.map(-_), y) + r) < 1e-12)
  }

  test("result is always within [-1, 1] (property)") {
    val data = Gen.listOfN(15, Gen.zip(Gen.chooseNum(-1e6, 1e6), Gen.chooseNum(-1e6, 1e6)))
    checkProp(Prop.forAll(data) { pts =>
      val r = Correlations.pearson(pts.map(_._1).toArray, pts.map(_._2).toArray)
      r.isNaN || (r >= -1.0 && r <= 1.0)
    })
  }

  test("degenerate inputs are NaN") {
    assert(Correlations.pearson(Array(1.0), Array(2.0)).isNaN)
    assert(Correlations.pearson(Array.empty[Double], Array.empty[Double]).isNaN)
    assert(Correlations.pearson(Array(1.0, 1.0, 1.0), Array(1.0, 2.0, 3.0)).isNaN)
  }

  test("misaligned inputs are rejected") {
    intercept[IllegalArgumentException] {
      Correlations.pearson(Array(1.0, 2.0), Array(1.0))
    }
  }

  test("independent noise has near-zero correlation") {
    val rng = new java.util.SplittableRandom(9)
    val x = Array.fill(5000)(rng.nextDouble())
    val y = Array.fill(5000)(rng.nextDouble())
    assert(math.abs(Correlations.pearson(x, y)) < 0.05)
  }

  test("matches DuckDB corr() on a concrete table (oracle)") {
    import spark.implicits._
    val rows = Seq((1.0, 2.1), (2.0, 3.9), (3.0, 6.2), (4.0, 7.8), (5.0, 10.1))
    val df = rows.toDF("x", "y")
    val sparkOut = df.agg(org.apache.spark.sql.functions.corr("x", "y").as("c"))
    Oracle.assertEquivalent(sparkOut,
      "SELECT corr(CAST(x AS DOUBLE), CAST(y AS DOUBLE)) AS c FROM t",
      "t" -> df)
    // and our local implementation agrees with Spark's
    val local = Correlations.pearson(rows.map(_._1).toArray, rows.map(_._2).toArray)
    val sparkR = sparkOut.collect()(0).getDouble(0)
    assert(math.abs(local - sparkR) < 1e-9)
  }

  test("agrees with Spark's corr over random data") {
    import spark.implicits._
    val rng = new java.util.SplittableRandom(4)
    val rows = Seq.fill(200)((rng.nextDouble() * 10, rng.nextDouble() * 10))
    val sparkR = rows.toDF("x", "y")
      .agg(org.apache.spark.sql.functions.corr("x", "y")).collect()(0).getDouble(0)
    val local = Correlations.pearson(rows.map(_._1).toArray, rows.map(_._2).toArray)
    assert(math.abs(local - sparkR) < 1e-9)
  }

  test("symmetric in its arguments (property)") {
    val data = Gen.listOfN(12, Gen.zip(Gen.chooseNum(-50.0, 50.0), Gen.chooseNum(-50.0, 50.0)))
    checkProp(Prop.forAll(data) { pts =>
      val x = pts.map(_._1).toArray; val y = pts.map(_._2).toArray
      val r1 = Correlations.pearson(x, y); val r2 = Correlations.pearson(y, x)
      r1.isNaN == r2.isNaN && (r1.isNaN || math.abs(r1 - r2) < 1e-12)
    })
  }
}
