package repro.core

import repro.{SparkSpec, TestGraphs, TestRefs}

class LastMeetingSpec extends SparkSpec {

  private val c     = 0.6
  private val delta = 1e-4

  private def sourceGraph(name: String, eps: Double = 0.25): SourceGraph = {
    val g = TestGraphs.all(spark).toMap.apply(name)
    val u = (0 until g.numNodes.toInt).find(g.local.inDeg(_) > 0).get
    SourcePush.run(g, u, c, SourcePush.epsH(eps, c), delta, maxWalks = 60000, seed = 33)
  }

  // --- Algorithm 3: hitting probabilities within G_u ---

  for (name <- Seq("cycle8", "toy", "er60", "pl80", "complete5")) {
    test(s"G_u hitting probabilities match the in-G_u DP on $name") {
      val g  = TestGraphs.all(spark).toMap.apply(name)
      val sg = sourceGraph(name)
      if (sg.L >= 2) {
        val hp = LastMeeting.hittingProbs(sg, c, g.local)
        // For every attention node w at level l, its entries must equal the
        // restriction of the exact G_u walk DP from (l, w) to attention targets.
        for (l <- 1 to sg.L; w <- sg.attention(l).keys) {
          val dp = TestRefs.guHittingDP(sg, c, l, w)
          val entries = hp(l).getOrElse(w, scala.collection.mutable.Map.empty[(Int, Long), Double])
          // all recorded entries correct
          entries.foreach { case ((lvl, wi), v) =>
            assert(sg.attention(lvl).contains(wi), s"non-attention target ($lvl,$wi)")
            assert(math.abs(v - dp.getOrElse((lvl, wi), 0.0)) < 1e-9,
              s"h~ from ($l,$w) to ($lvl,$wi): $v vs ${dp.getOrElse((lvl, wi), 0.0)}")
          }
          // no attention target missed
          for (lvl <- l to sg.L; wi <- sg.attention(lvl).keys) {
            val expect = dp.getOrElse((lvl, wi), 0.0)
            if (expect > 1e-12)
              assert(entries.contains((lvl, wi)), s"missing target ($lvl,$wi) from ($l,$w)")
          }
        }
      }
    }
  }

  test("attention self-probability is 1 at step 0") {
    val g  = TestGraphs.all(spark).toMap.apply("toy")
    val sg = sourceGraph("toy")
    val hp = LastMeeting.hittingProbs(sg, c, g.local)
    for (l <- 1 to sg.L; w <- sg.attention(l).keys) {
      assert(hp(l)(w)((l, w)) == 1.0)
    }
  }

  // --- Algorithm 4: gamma ---

  for (name <- Seq("cycle8", "toy", "er60", "pl80", "plU60")) {
    test(s"gamma matches the exact pair-state DP on $name") {
      val g  = TestGraphs.all(spark).toMap.apply(name)
      val sg = sourceGraph(name)
      val hp = LastMeeting.hittingProbs(sg, c, g.local)
      val gammas = LastMeeting.gammas(sg, hp)
      for (l <- 1 to sg.L; w <- sg.attention(l).keys) {
        val expect = TestRefs.gammaPairDP(sg, c, l, w)
        val got    = gammas((l, w))
        assert(math.abs(got - expect) < 1e-9, s"gamma($l,$w): $got vs $expect")
      }
    }
  }

  test("gamma is 1 for attention nodes at the deepest level") {
    val sg = sourceGraph("er60")
    val g  = TestGraphs.all(spark).toMap.apply("er60")
    val gammas = LastMeeting.gammas(sg, LastMeeting.hittingProbs(sg, c, g.local))
    sg.attention(sg.L).keys.foreach { w => assert(gammas((sg.L, w)) == 1.0) }
  }

  test("gamma values are probabilities") {
    for (name <- Seq("toy", "pl80", "complete5")) {
      val g  = TestGraphs.all(spark).toMap.apply(name)
      val sg = sourceGraph(name)
      val gammas = LastMeeting.gammas(sg, LastMeeting.hittingProbs(sg, c, g.local))
      gammas.values.foreach(v => assert(v >= 0.0 && v <= 1.0))
      assert(gammas.keySet == (1 to sg.L).flatMap(l => sg.attention(l).keys.map(w => (l, w))).toSet)
    }
  }

  test("residues are h * gamma") {
    val name = "toy"
    val g  = TestGraphs.all(spark).toMap.apply(name)
    val sg = sourceGraph(name)
    val hp = LastMeeting.hittingProbs(sg, c, g.local)
    val gm = LastMeeting.gammas(sg, hp)
    val rs = LastMeeting.residues(sg, c, g.local)
    rs.foreach { case ((l, w), r) =>
      assert(math.abs(r - sg.h(l)(w) * gm((l, w))) < 1e-12)
    }
    assert(rs.keySet == gm.keySet)
  }

  test("on the cycle, converging-path corrections vanish (single in-neighbor chains)") {
    // On a directed cycle each node has exactly one in-neighbor, so two
    // walks from w either both survive and stay together... they DO meet at
    // every subsequent attention step, making gamma < 1 for non-deepest
    // attention nodes whenever a deeper attention node exists directly
    // upstream: gamma = 1 - c (meet at next attention one step up) ... We
    // verify against the pair DP rather than a closed form, and sanity-check
    // that some gamma is strictly below 1.
    val sg = sourceGraph("cycle8")
    val g  = TestGraphs.all(spark).toMap.apply("cycle8")
    val gammas = LastMeeting.gammas(sg, LastMeeting.hittingProbs(sg, c, g.local))
    if (sg.L >= 2) {
      val shallow = gammas.collect { case ((l, _), v) if l < sg.L => v }
      assert(shallow.exists(_ < 1.0), "expected re-meeting corrections on the cycle")
    }
  }
}
