package repro.workloads

import repro.{Oracle, SparkSpec, SynthData}
import KMeansW.Center

class KMeansSpec extends SparkSpec {

  private lazy val pts = SynthData.points(spark, n = 3000, k = 3, spread = 0.4).cache()

  test("assignment counts for two fixed centers match the DuckDB oracle") {
    val c0 = Center(0, 0.0, 0.0)
    val c1 = Center(1, 10.0, 0.0)
    val sparkCounts = KMeansW.assign(pts, Seq(c0, c1))
      .groupBy("assigned").agg(org.apache.spark.sql.functions.count(
        org.apache.spark.sql.functions.lit(1)) as "cnt")
    Oracle.assertEquivalent(sparkCounts, KMeansW.oracleAssignCountSql(c0, c1),
      "pts" -> pts.select("x0", "x1"))
  }

  test("Lloyd iterations recover the true, well-separated centers") {
    // True centers for k=3: (c%3·10, floor(c/3)·10) = (0,0), (10,0), (20,0).
    val init = Seq(Center(0, 2.0, 1.0), Center(1, 8.0, -1.0), Center(2, 18.0, 1.5))
    val out = (1 to 4).foldLeft(init)((cs, _) => KMeansW.step(pts, cs))
    val truth = Seq((0.0, 0.0), (10.0, 0.0), (20.0, 0.0))
    for ((tx, ty) <- truth) {
      assert(out.exists(c => math.abs(c.x0 - tx) < 1.0 && math.abs(c.x1 - ty) < 1.0),
        s"no center near ($tx,$ty): $out")
    }
  }

  test("iterating reduces the inertia") {
    val init = Seq(Center(0, 1.0, 3.0), Center(1, 12.0, -2.0), Center(2, 17.0, 3.0))
    val i0 = KMeansW.inertia(pts, init)
    val after = (1 to 3).foldLeft(init)((cs, _) => KMeansW.step(pts, cs))
    assert(KMeansW.inertia(pts, after) < i0)
  }

  test("end-to-end run returns k centers and a finite inertia") {
    val (centers, inertia) = KMeansW.run(spark, pts, k = 3, iters = 3)
    assert(centers.size <= 3 && centers.nonEmpty)
    assert(inertia > 0 && !inertia.isNaN)
  }
}
