package repro.baselines

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.functions._
import repro.graph.Graph

/** The Power method [10] (Section 6): exact all-pairs SimRank by iterating
  * `S = (c P^T S P) ∨ I` to convergence. O(n^2) state — the paper cites this
  * as the reason it cannot scale, and we use it (a) as a correctness oracle
  * on small graphs and (b) to generate exact ground truth for the benchmark
  * datasets, replacing the paper's Monte-Carlo pooling (our graphs are small
  * enough for the exact computation the paper could not afford).
  *
  * DataFrame form: `S` is a DataFrame of `(a, b, s)` triples; one iteration
  * is two joins against the edge list — `s'(a,b) = c/(din(a) din(b)) *
  * sum_{(a',a) in E, (b',b) in E} s(a',b')` — plus the diagonal overwrite.
  */
object PowerMethod {

  /** One power iteration in Catalyst. Exposed for the DuckDB-oracle test. */
  def iterateOnce(g: Graph, s: DataFrame, c: Double): DataFrame = {
    val e1 = g.edgesWithInDeg.select(col("src").as("a1"), col("dst").as("a"), col("din").as("dina"))
    val e2 = g.edgesWithInDeg.select(col("src").as("b1"), col("dst").as("b"), col("din").as("dinb"))
    val prod = s
      .join(e1, col("pa") === col("a1"))
      .join(e2, col("pb") === col("b1"))
      .where(col("a") =!= col("b"))
      .select(col("a"), col("b"), (lit(c) * col("s") / (col("dina") * col("dinb"))).as("contrib"))
      .groupBy("a", "b").agg(sum("contrib").as("s"))
      .select(col("a").as("pa"), col("b").as("pb"), col("s"))
    val diag = g.spark.range(g.numNodes)
      .select(col("id").as("pa"), col("id").as("pb"), lit(1.0).as("s"))
    prod.unionByName(diag)
  }

  /** All-pairs SimRank to `iters` iterations (error <= c^iters). Dense in
    * the pair space — only call on small graphs.
    */
  def allPairs(g: Graph, c: Double, iters: Int): DataFrame = {
    var s = g.spark.range(g.numNodes)
      .select(col("id").as("pa"), col("id").as("pb"), lit(1.0).as("s"))
      .localCheckpoint(true)
    var k = 0
    while (k < iters) {
      s = iterateOnce(g, s, c).localCheckpoint(true)
      k += 1
    }
    s
  }

  /** Single-source slice of [[allPairs]] as a map. */
  def singleSource(g: Graph, u: Long, c: Double, iters: Int): Map[Long, Double] =
    allPairs(g, c, iters).where(col("pa") === u)
      .collect().map(r => r.getLong(1) -> r.getDouble(2)).toMap
}
