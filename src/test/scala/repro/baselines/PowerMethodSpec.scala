package repro.baselines

import org.apache.spark.sql.functions._
import repro.{Oracle, SparkSpec, TestGraphs}
import repro.eval.ExactSimRank

class PowerMethodSpec extends SparkSpec {

  private val c = 0.6

  test("DataFrame power iteration matches the driver-side exact oracle") {
    for (name <- Seq("toy", "cycle8", "er60")) {
      val g  = TestGraphs.all(spark).toMap.apply(name)
      val df = PowerMethod.allPairs(g, c, iters = 10).collect()
        .map(r => (r.getLong(0).toInt, r.getLong(1).toInt) -> r.getDouble(2)).toMap
      val ex = ExactSimRank.allPairs(g.local, c, iters = 10)
      for (a <- 0 until g.local.n; b <- 0 until g.local.n) {
        assert(math.abs(df.getOrElse((a, b), 0.0) - ex(a)(b)) < 1e-9, s"$name s($a,$b)")
      }
    }
  }

  test("one power iteration matches DuckDB SQL (oracle)") {
    val g = TestGraphs.all(spark).toMap.apply("toy")
    val s0 = spark.range(g.numNodes)
      .select(col("id").as("pa"), col("id").as("pb"), lit(1.0).as("s"))
    val once = PowerMethod.iterateOnce(g, s0, c)
      .select(col("pa"), col("pb"), round(col("s"), 6).as("s"))
    // S_1(a,b) = c/(din(a) din(b)) * |I(a) ∩ I(b)| for a != b (since S_0 = I),
    // expressed directly in SQL over the edge table.
    Oracle.assertEquivalent(
      once,
      s"""WITH din AS (SELECT dst, count(*) AS d FROM edges GROUP BY dst),
              meet AS (
                SELECT e1.dst AS a, e2.dst AS b, count(*) AS common
                FROM edges e1 JOIN edges e2 ON e1.src = e2.src
                WHERE e1.dst <> e2.dst
                GROUP BY e1.dst, e2.dst)
          SELECT CAST(m.a AS VARCHAR) AS pa, CAST(m.b AS VARCHAR) AS pb,
                 ROUND($c * m.common / (da.d * db.d), 6) AS s
          FROM meet m JOIN din da ON m.a = da.dst JOIN din db ON m.b = db.dst
          UNION ALL
          SELECT CAST(x AS VARCHAR), CAST(x AS VARCHAR), 1.0
          FROM generate_series(0, ${g.numNodes - 1}) t(x)""",
      "edges" -> g.edges)
  }

  test("singleSource extracts the row of allPairs") {
    val g   = TestGraphs.all(spark).toMap.apply("toy")
    val row = PowerMethod.singleSource(g, 0, c, 8)
    val ex  = ExactSimRank.allPairs(g.local, c, 8)
    row.foreach { case (v, s) => assert(math.abs(s - ex(0)(v.toInt)) < 1e-9) }
  }
}
