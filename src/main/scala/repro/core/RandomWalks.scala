package repro.core

import java.util.SplittableRandom

import org.apache.spark.sql.{DataFrame, SparkSession}
import repro.graph.Graph

/** Batched \sqrt{c}-walk simulation.
  *
  * The graph's CSR form is broadcast to executors and each partition
  * simulates its share of walks independently — one Spark job regardless of
  * walk count. This is the standard dataflow pattern for random walks on a
  * graph that fits executor memory; the *push* phases (the paper's actual
  * contribution) stay join-based.
  */
object RandomWalks {

  /** SplitMix64 finalizer — decorrelates per-walk seeds. */
  def mix(seed: Long, id: Long): Long = {
    var z = seed + id * 0x9E3779B97F4A7C15L
    z = (z ^ (z >>> 30)) * 0xBF58476D1CE4E5B9L
    z = (z ^ (z >>> 27)) * 0x94D049BB133111EBL
    z ^ (z >>> 31)
  }

  /** Simulate `numWalks` \sqrt{c}-walks from `start`.
    * @return DataFrame `(walkId Long, step Int, node Long)` including step 0.
    */
  def sqrtCWalks(g: Graph, start: Long, numWalks: Long, c: Double,
                 maxSteps: Int, seed: Long): DataFrame = {
    val spark = g.spark
    import spark.implicits._
    val bc = spark.sparkContext.broadcast(g.local)
    val s  = start.toInt
    spark.range(numWalks).as[Long].flatMap { id =>
      val rng  = new SplittableRandom(mix(seed, id))
      val walk = bc.value.sqrtCWalk(s, c, maxSteps, rng)
      walk.iterator.zipWithIndex.map { case (node, step) => (id, step, node.toLong) }.toSeq
    }.toDF("walkId", "step", "node")
  }

  /** Per-(step, node) visit counts `H^{(l)}(u, v)` over `numWalks` walks —
    * the statistic Source-Push uses to pick the max level L (Algorithm 2).
    */
  def visitCounts(g: Graph, start: Long, numWalks: Long, c: Double,
                  maxSteps: Int, seed: Long): DataFrame = {
    import org.apache.spark.sql.functions._
    sqrtCWalks(g, start, numWalks, c, maxSteps, seed)
      .groupBy("step", "node")
      .agg(count(lit(1)).as("visits"))
  }
}
