package repro.graph

import java.util.SplittableRandom

/** Compact CSR copy of a directed graph, broadcast to executors for
  * embarrassingly-parallel random-walk simulation, and used on the driver
  * for exact reference computations on small graphs.
  *
  * Node ids must be dense in `[0, n)`. Edges are directed `src -> dst`;
  * a \sqrt{c}-walk moves from a node to a uniformly random *in*-neighbor.
  */
final class LocalGraph(
    val n: Int,
    private val inOff: Array[Int],
    private val inAdj: Array[Int],
    private val outOff: Array[Int],
    private val outAdj: Array[Int],
) extends Serializable {

  /** Number of directed edges. */
  def m: Int = inAdj.length

  /** In-degree of node `v` in the full graph. */
  def inDeg(v: Int): Int = inOff(v + 1) - inOff(v)

  /** Out-degree of node `v` in the full graph. */
  def outDeg(v: Int): Int = outOff(v + 1) - outOff(v)

  /** In-neighbors of `v` (nodes `x` with an edge `x -> v`). */
  def inNeighbors(v: Int): IndexedSeq[Int] =
    (inOff(v) until inOff(v + 1)).map(inAdj)

  /** Out-neighbors of `v` (nodes `y` with an edge `v -> y`). */
  def outNeighbors(v: Int): IndexedSeq[Int] =
    (outOff(v) until outOff(v + 1)).map(outAdj)

  /** Uniformly random in-neighbor of `v`; requires `inDeg(v) > 0`. */
  def randomInNeighbor(v: Int, rng: SplittableRandom): Int =
    inAdj(inOff(v) + rng.nextInt(inDeg(v)))

  /** Simulate one \sqrt{c}-walk from `start` (Definition 2 of the paper):
    * at each step the walk stops with probability `1 - sqrt(c)`, otherwise
    * jumps to a random in-neighbor (or stops if there is none). Returns the
    * visited nodes; index `l` is the position at step `l` (index 0 = start).
    * At most `maxSteps` steps are taken beyond the start.
    */
  def sqrtCWalk(start: Int, c: Double, maxSteps: Int, rng: SplittableRandom): Array[Int] = {
    val sqrtC = math.sqrt(c)
    val buf   = new scala.collection.mutable.ArrayBuffer[Int](8)
    var cur   = start
    buf += cur
    var step = 0
    var live = true
    while (live && step < maxSteps) {
      if (rng.nextDouble() >= sqrtC || inDeg(cur) == 0) live = false
      else {
        cur = randomInNeighbor(cur, rng)
        buf += cur
        step += 1
      }
    }
    buf.toArray
  }

  /** Simulate two independent \sqrt{c}-walks from `start` and report whether
    * they ever meet (same node at the same step `>= 1`). Used to estimate the
    * last-meeting probability eta(w) = Pr[never meet] of SLING/PRSim.
    */
  def pairWalksMeet(start: Int, c: Double, maxSteps: Int, rng: SplittableRandom): Boolean = {
    val sqrtC = math.sqrt(c)
    var a = start; var b = start
    var step = 0
    while (step < maxSteps) {
      // advance both; either may die this step
      val aLive = rng.nextDouble() < sqrtC && inDeg(a) > 0
      val bLive = rng.nextDouble() < sqrtC && inDeg(b) > 0
      if (!aLive || !bLive) return false
      a = randomInNeighbor(a, rng)
      b = randomInNeighbor(b, rng)
      step += 1
      if (a == b) return true
    }
    false
  }
}

object LocalGraph {

  /** Build a CSR graph from an edge list with node ids in `[0, n)`. */
  def fromEdges(n: Int, edges: Iterable[(Int, Int)]): LocalGraph = {
    val inCnt  = new Array[Int](n + 1)
    val outCnt = new Array[Int](n + 1)
    var m = 0
    edges.foreach { case (s, d) =>
      require(s >= 0 && s < n && d >= 0 && d < n, s"edge ($s,$d) out of [0,$n)")
      inCnt(d + 1) += 1; outCnt(s + 1) += 1; m += 1
    }
    var i = 0
    while (i < n) { inCnt(i + 1) += inCnt(i); outCnt(i + 1) += outCnt(i); i += 1 }
    val inOff  = inCnt.clone(); val outOff = outCnt.clone()
    val inAdj  = new Array[Int](m); val outAdj = new Array[Int](m)
    val inPos  = inOff.clone(); val outPos = outOff.clone()
    edges.foreach { case (s, d) =>
      inAdj(inPos(d)) = s; inPos(d) += 1
      outAdj(outPos(s)) = d; outPos(s) += 1
    }
    new LocalGraph(n, inOff, inAdj, outOff, outAdj)
  }
}
