package repro.bench

import repro.SparkSpec
import repro.eval.Datasets

/** Table 4 reproduction: statistics of the synthetic stand-in datasets,
  * printed next to the paper's originals. Run via `sbt "bench/test"`; the
  * printed table is recorded in EXPERIMENTS.md.
  */
class BenchDatasetsSpec extends SparkSpec {

  test("Table 4: dataset statistics") {
    val ds = Datasets.extended(spark)
    println()
    println("=== Table 4 (stand-ins): datasets used in the experiments ===")
    println(f"| ${"name"}%-13s | ${"n"}%7s | ${"m"}%8s | ${"m/n"}%6s | ${"type"}%-10s | ${"paper graph"}%-12s | ${"paper n"}%13s | ${"paper m"}%13s | ${"paper m/n"}%9s |")
    println("|---------------|---------|----------|--------|------------|--------------|---------------|---------------|-----------|")
    ds.foreach { d =>
      val n = d.graph.numNodes; val m = d.graph.numEdges
      println(f"| ${d.name}%-13s | $n%7d | $m%8d | ${m.toDouble / n}%6.1f | ${d.kind}%-10s | ${d.paperName}%-12s | ${d.paperN}%13d | ${d.paperM}%13d | ${d.paperM.toDouble / d.paperN}%9.1f |")
    }
    println()

    // The stand-ins must preserve the paper's average-degree profile within 2x
    // and the directedness of each original.
    ds.foreach { d =>
      val ratio      = d.graph.numEdges.toDouble / d.graph.numNodes
      val paperRatio = d.paperM.toDouble / d.paperN
      assert(ratio > paperRatio / 2.2 && ratio < paperRatio * 2.2,
        s"${d.name}: m/n=$ratio vs paper ${paperRatio}")
      if (d.kind == "undirected") {
        val edges = d.graph.edges.collect().map(r => (r.getLong(0), r.getLong(1))).toSet
        assert(edges.forall { case (s, t) => edges.contains((t, s)) }, s"${d.name} not symmetric")
      }
    }
  }

  test("datasets have a dominant weakly-reachable core (queries are non-trivial)") {
    Datasets.standard(spark).foreach { d =>
      val withIn = (0 until d.graph.numNodes.toInt).count(d.graph.local.inDeg(_) > 0)
      assert(withIn > d.graph.numNodes * 0.3, s"${d.name}: only $withIn nodes have in-edges")
    }
  }
}
