package repro.core

import scala.collection.mutable

import repro.graph.LocalGraph

/** Stage 2 of SimPush (Section 4.2): hitting probabilities between attention
  * nodes *within* `G_u` (Algorithm 3) and the last-meeting probabilities
  * `gamma^{(l)}(w)` (Algorithm 4).
  *
  * Both run on the driver: `G_u` is the deliberately small per-query working
  * set (O(1/eps) attention nodes, Lemma 2), and the paper's own design point
  * is that this stage avoids any traversal of the full graph.
  */
object LastMeeting {

  /** Key = (absolute level in G_u, node id). */
  type LevelNode = (Int, Long)

  /** Hitting probabilities within G_u (Algorithm 3, via Equation 12).
    *
    * Returns `hp(l)(node)` = map from attention target `(l + i, w_i)` to
    * `\tilde h^{(i)}(node, w_i)` — the probability that a \sqrt{c}-walk from
    * `node` (at level `l` of G_u, walking within G_u) visits attention node
    * `w_i` at its `i`-th step. Entries exist for all G_u nodes (attention or
    * not) that can reach an attention node; the self entry `(l, w) -> 1` is
    * included for every attention node `w`.
    */
  def hittingProbs(sg: SourceGraph, c: Double, local: LocalGraph): IndexedSeq[mutable.Map[Long, mutable.Map[LevelNode, Double]]] = {
    val sqrtC = math.sqrt(c)
    val L     = sg.L
    val hp    = IndexedSeq.fill(L + 1)(mutable.Map.empty[Long, mutable.Map[LevelNode, Double]])

    def mapOf(lvl: Int, node: Long): mutable.Map[LevelNode, Double] =
      hp(lvl).getOrElseUpdate(node, mutable.Map.empty)

    // Sweep from the deepest level toward level 1 (Algorithm 3: l = L..2).
    var l = L
    while (l >= 2) {
      // Self entries for attention nodes at this level.
      sg.attention(l).keysIterator.foreach { w => mapOf(l, w).update((l, w), 1.0) }
      // Push every node's accumulated probabilities one level down along the
      // G_u edges (level l -> level l-1). The receiver's in-degree in G
      // equals its in-degree in G_u for expanded nodes (Section 4.1).
      val down = sg.downEdges(l - 1) // (upNode at level l, downNode at level l-1)
      down.foreach { case (up, downNode) =>
        hp(l).get(up).foreach { entries =>
          val factor = sqrtC / local.inDeg(downNode.toInt)
          val tgt    = mapOf(l - 1, downNode)
          entries.foreach { case (key, v) =>
            tgt.update(key, tgt.getOrElse(key, 0.0) + factor * v)
          }
        }
      }
      l -= 1
    }
    // Self entries for level-1 (and level-L when L==1) attention nodes that
    // the sweep above did not touch. They carry no deeper info but make the
    // map total over attention nodes.
    (1 to L).foreach { lvl =>
      sg.attention(lvl).keysIterator.foreach { w =>
        val m0 = mapOf(lvl, w); if (!m0.contains((lvl, w))) m0.update((lvl, w), 1.0)
      }
    }
    hp
  }

  /** Last-meeting probabilities `gamma^{(l)}(w)` for every attention node
    * (Algorithm 4, via Equations 9-11), given Algorithm 3's output.
    */
  def gammas(sg: SourceGraph, hp: IndexedSeq[mutable.Map[Long, mutable.Map[LevelNode, Double]]]): Map[LevelNode, Double] = {
    val L   = sg.L
    val out = mutable.Map.empty[LevelNode, Double]
    for (l <- 1 to L; w <- sg.attention(l).keysIterator) {
      val deltaL = L - l
      val hw     = hp(l).getOrElse(w, mutable.Map.empty) // \tilde h^{(i)}(w, .)
      // rho(i)(w_i), computed level by level (Equations 10 and 11).
      val rho = mutable.Map.empty[LevelNode, Double]
      var gamma = 1.0
      var i = 1
      while (i <= deltaL) {
        val lvlI = l + i
        sg.attention(lvlI).keysIterator.foreach { wi =>
          val hti = hw.getOrElse((lvlI, wi), 0.0)
          if (hti > 0.0 || rho.nonEmpty) {
            var r = hti * hti
            var j = 1
            while (j < i) {
              val lvlJ = l + j
              sg.attention(lvlJ).keysIterator.foreach { wj =>
                val rj = rho.getOrElse((lvlJ, wj), 0.0)
                if (rj > 0.0) {
                  val hji = hp(lvlJ).get(wj).flatMap(_.get((lvlI, wi))).getOrElse(0.0)
                  r -= rj * hji * hji
                }
              }
              j += 1
            }
            if (r > 0.0) { rho.update((lvlI, wi), r); gamma -= r }
          }
        }
        i += 1
      }
      out.update((l, w), math.max(0.0, math.min(1.0, gamma)))
    }
    out.toMap
  }

  /** Convenience: run both algorithms and return the per-attention-node
    * initial residues `r^{(l)}(w) = h^{(l)}(u, w) * gamma^{(l)}(w)`
    * consumed by Reverse-Push (Algorithm 1, line 7).
    */
  def residues(sg: SourceGraph, c: Double, local: LocalGraph): Map[LevelNode, Double] = {
    val hp = hittingProbs(sg, c, local)
    val g  = gammas(sg, hp)
    g.map { case ((l, w), gamma) => (l, w) -> sg.h(l)(w) * gamma }
  }
}
