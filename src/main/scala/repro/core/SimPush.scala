package repro.core

import org.apache.spark.sql.{DataFrame, SparkSession}
import repro.graph.Graph

/** Parameters of a SimPush query (Definition 1 + Algorithm 1).
  *
  * @param eps      absolute error threshold
  * @param delta    failure probability (paper default 1e-4)
  * @param c        SimRank decay factor (paper default 0.6)
  * @param maxWalks cap on the Monte-Carlo walks used for level detection;
  *                 the paper's budget is ~2 log(1/((1-sqrt c) epsH delta))/epsH^2
  * @param seed     RNG seed for the walk phase (deterministic replay)
  */
final case class SimPushParams(
    eps: Double,
    delta: Double = 1e-4,
    c: Double = 0.6,
    maxWalks: Long = 2_000_000L,
    seed: Long = 42L,
) {
  val epsH: Double = SourcePush.epsH(eps, c)
  val lStar: Int   = SourcePush.maxLevelBound(epsH, c)
}

/** Result of a single-source SimPush query.
  *
  * @param scores sparse `\tilde s(u, v)` including `u -> 1`; absent nodes are 0
  */
final case class SimPushResult(
    u: Long,
    scores: Map[Long, Double],
    L: Int,
    attentionCount: Int,
    sourceGraphEdges: Long,
    millis: Long,
)

/** SimPush (Algorithm 1): index-free approximate single-source SimRank.
  *
  * Stage 1 (Source-Push) and stage 3 (Reverse-Push) are distributed,
  * join-based level propagations over the full edge DataFrame; stage 2
  * operates on the tiny per-query source graph `G_u` on the driver —
  * mirroring the paper's separation between O(m)-per-level full-graph work
  * and O(1/eps)-sized attention-node work.
  */
object SimPush {

  def singleSource(g: Graph, u: Long, p: SimPushParams): SimPushResult = {
    val t0 = System.nanoTime()
    val sg = SourcePush.run(g, u, p.c, p.epsH, p.delta, p.maxWalks, p.seed)
    val scores: Map[Long, Double] =
      if (sg.L == 0 || sg.attentionCount == 0) Map.empty
      else {
        val res = LastMeeting.residues(sg, p.c, g.local)
        ReversePush.run(g, res, sg.L, p.c, p.epsH)
      }
    val withSelf = scores - u + (u -> 1.0) // Algorithm 5, line 10
    val millis   = (System.nanoTime() - t0) / 1000000
    SimPushResult(u, withSelf, sg.L, sg.attentionCount, sg.numEdges, millis)
  }

  /** DataFrame view of a result — for jobs and Oracle-style comparisons. */
  def toDF(spark: SparkSession, r: SimPushResult): DataFrame = {
    import spark.implicits._
    r.scores.toSeq.toDF("node", "simrank")
  }
}
