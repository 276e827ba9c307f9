package repro.baselines

import org.apache.spark.sql.functions._
import repro.graph.Graph

/** TopSim [15] (Section 2.2): index-free. Expands a truncated random-walk
  * tree of depth `T` from the query node, keeping at most `H` nodes per
  * level, skipping expansions through very-high-degree nodes (in-degree
  * above `1/h`), and trimming probabilities below `eta`. Similarities are
  * then accumulated through a reverse pass from the retained meeting nodes.
  *
  * As the paper notes (quoting [21, 33]), TopSim's truncation breaks its
  * quality guarantee; our variant inherits exactly those limitations (no
  * first/last-meeting correction, hard truncation), which is what makes it
  * land where it does in the accuracy/time trade-off.
  */
object TopSim {

  /** @param T    walk depth
    * @param invH degree threshold `1/h`: nodes with larger in-degree are not expanded
    * @param H    max frontier width per level
    * @param eta  trim threshold on walk probability
    */
  final case class Params(T: Int, invH: Int, H: Int = 100, eta: Double = 0.001,
                          c: Double = 0.6)

  def query(g: Graph, u: Long, p: Params): Map[Long, Double] = {
    val spark = g.spark
    import spark.implicits._
    val sqrtC = math.sqrt(p.c)
    val local = g.local

    // Truncated forward expansion: h^{(l)}(u, .) with TopSim's pruning.
    var front: Map[Long, Double] = Map(u -> 1.0)
    val levels = scala.collection.mutable.ArrayBuffer[Map[Long, Double]](front)
    var l = 0
    while (l < p.T && front.nonEmpty) {
      val expandable = front.filter { case (v, h) =>
        h >= p.eta && local.inDeg(v.toInt) > 0 && local.inDeg(v.toInt) <= p.invH
      }
      front =
        if (expandable.isEmpty) Map.empty
        else {
          val fDf = expandable.toSeq.toDF("fnode", "h")
          val next = g.edgesWithInDeg
            .join(broadcast(fDf), col("dst") === col("fnode"))
            .select(col("src"), (lit(sqrtC) * col("h") / col("din")).as("contrib"))
            .groupBy("src").agg(sum("contrib").as("h"))
            .orderBy(col("h").desc)
            .limit(p.H)
            .collect().map(r => r.getLong(0) -> r.getDouble(1)).toMap
          next
        }
      levels += front
      l += 1
    }

    // Reverse pass from the retained (level, w) meeting candidates; no
    // last-meeting correction — TopSim counts re-meetings.
    val seeds: Seq[(Long, Long, Int, Double)] = (for {
      (hm, lvl) <- levels.zipWithIndex if lvl >= 1
      (w, h)    <- hm
    } yield (lvl.toLong * (g.numNodes + 1) + w, w, lvl, h)).toSeq
    if (seeds.isEmpty) return Map(u -> 1.0)
    val seedDf = seeds.map { case (k, w, _, _) => (k, w) }.toDF("key", "node")
    val hUDf   = seeds.map { case (k, _, lvl, h) => (k, lvl, h) }.toDF("ukey", "ulvl", "hu")
    val expanded = PushOps.reverseExpand(g, seedDf, p.c, levels.size - 1, p.eta)
    val scores = expanded
      .join(broadcast(hUDf), col("key") === col("ukey") && col("level") === col("ulvl"))
      .select(col("node"), (col("hu") * col("h")).as("contrib"))
      .groupBy("node").agg(sum("contrib").as("s"))
      .collect().map(r => r.getLong(0) -> r.getDouble(1)).toMap
    scores - u + (u -> 1.0)
  }
}
