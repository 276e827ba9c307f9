package repro.graph

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.functions._

/** A directed graph as a DataFrame of distinct edges `(src, dst)` with node
  * ids dense in `[0, numNodes)`. Every level-wise push in this repo joins a
  * (small) frontier against [[edgesWithInDeg]], which is the Catalyst-side
  * representation of the transition structure used by \sqrt{c}-walks.
  */
final class Graph(
    @transient val spark: SparkSession,
    val edges: DataFrame, // columns: src Long, dst Long; distinct
    val numNodes: Long,
) extends Serializable {

  lazy val numEdges: Long = edges.count()

  /** `(node, din)` for every node with at least one incoming edge. */
  lazy val inDeg: DataFrame =
    edges.groupBy(col("dst").as("node")).agg(count(lit(1)).as("din")).cache()

  /** `(node, dout)` for every node with at least one outgoing edge. */
  lazy val outDeg: DataFrame =
    edges.groupBy(col("src").as("node")).agg(count(lit(1)).as("dout")).cache()

  /** Edges enriched with the in-degree of their destination. The quantity
    * `sqrt(c) * h / din` is the push normalizer of every propagation step
    * (a walk leaves `dst` toward a uniform in-neighbor `src`).
    */
  lazy val edgesWithInDeg: DataFrame = {
    val d = inDeg.withColumnRenamed("node", "dnode")
    edges
      .join(d, edges("dst") === d("dnode"))
      .select(col("src"), col("dst"), col("din"))
      .cache()
  }

  /** Driver-side CSR copy, broadcast to executors for walk simulation.
    * Materialized lazily; the graphs in this repro fit comfortably.
    */
  lazy val local: LocalGraph = {
    val es = edges.select(col("src").cast("int"), col("dst").cast("int"))
      .collect()
      .map(r => (r.getInt(0), r.getInt(1)))
    LocalGraph.fromEdges(numNodes.toInt, es)
  }

  /** Force-materialize the cached degree views (used before timing queries). */
  def warm(): Unit = { inDeg.count(); outDeg.count(); edgesWithInDeg.count(); local; () }
}

object Graph {

  /** Wrap an edge DataFrame (columns `src`, `dst`); dedupes and drops
    * self-loops, which SimRank's walk formulation does not use meaningfully
    * and which the generators may emit.
    */
  def fromEdges(spark: SparkSession, edgesDf: DataFrame, numNodes: Long): Graph = {
    val e = edgesDf
      .select(col("src").cast("long"), col("dst").cast("long"))
      .where(col("src") =!= col("dst"))
      .where(col("src") >= 0 && col("src") < numNodes && col("dst") >= 0 && col("dst") < numNodes)
      .distinct()
      .cache()
    new Graph(spark, e, numNodes)
  }

  /** Build from a literal edge list — for unit tests and tiny examples. */
  def fromEdgeList(spark: SparkSession, n: Long, edges: Seq[(Long, Long)]): Graph = {
    import spark.implicits._
    fromEdges(spark, edges.toDF("src", "dst"), n)
  }
}
