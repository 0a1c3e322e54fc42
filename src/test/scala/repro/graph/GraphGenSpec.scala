package repro.graph

import org.scalatest.funsuite.AnyFunSuite

class GraphGenSpec extends AnyFunSuite {

  lazy val cora: LocalGraph = GraphGen.coraLite()
  lazy val ppi: LocalGraph = GraphGen.ppiLite(nodesPerGraph = 50, avgDegree = 6)
  lazy val uug: LocalGraph = GraphGen.uugLite(n = 1000)

  test("coraLite matches Cora's shape") {
    assert(cora.nodes.length == 2708)
    assert(cora.numClasses == 7 && cora.task == "softmax")
    assert(cora.featDim == 64)
    assert(cora.split("train").length == 140)
    assert(cora.split("val").length == 500)
    assert(cora.split("test").length == 1000)
  }

  test("coraLite splits are disjoint") {
    val ids = Seq("train", "val", "test").flatMap(s => cora.split(s).map(_.id))
    assert(ids.distinct.length == ids.length)
  }

  test("coraLite is homophilous (most edges within class)") {
    val cls = cora.nodes.map(n => n.id -> n.label.indexWhere(_ > 0)).toMap
    val same = cora.edges.count(e => cls(e.src) == cls(e.dst))
    assert(same.toDouble / cora.edges.length > 0.7)
  }

  test("coraLite edges are symmetric directed pairs without self-loops") {
    val set = cora.edges.map(e => (e.src, e.dst)).toSet
    assert(cora.edges.forall(e => e.src != e.dst))
    assert(cora.edges.forall(e => set((e.dst, e.src))))
  }

  test("coraLite is deterministic in its seed") {
    val a = GraphGen.coraLite(seed = 99)
    val b = GraphGen.coraLite(seed = 99)
    assert(a.nodes.length == b.nodes.length)
    a.nodes.zip(b.nodes).foreach { case (x, y) =>
      assert(x.id == y.id && x.split == y.split)
      assert(x.feat.toSeq == y.feat.toSeq && x.label.toSeq == y.label.toSeq)
    }
    assert(a.edges.toSeq == b.edges.toSeq) // GEdge has value equality
    val c = GraphGen.coraLite(seed = 100)
    assert(c.edges.toSeq != a.edges.toSeq)
  }

  test("ppiLite has per-graph splits with no cross-graph edges") {
    val perGraph = 50
    assert(ppi.edges.forall(e => e.src / perGraph == e.dst / perGraph))
    val trainGraphs = ppi.split("train").map(_.id / perGraph).distinct
    val valGraphs = ppi.split("val").map(_.id / perGraph).distinct
    val testGraphs = ppi.split("test").map(_.id / perGraph).distinct
    assert(trainGraphs.length == 20 && valGraphs.length == 2 && testGraphs.length == 2)
    assert((trainGraphs.toSet & valGraphs.toSet).isEmpty)
    assert((trainGraphs.toSet & testGraphs.toSet).isEmpty)
  }

  test("ppiLite labels are multilabel and neighborhood-dependent") {
    assert(ppi.numClasses == 16 && ppi.task == "bce")
    val counts = ppi.nodes.map(_.label.count(_ > 0))
    assert(counts.exists(_ > 1), "some node should carry several labels")
    val posRate = ppi.nodes.map(_.label.sum).sum / (ppi.nodes.length * 16.0)
    assert(posRate > 0.2 && posRate < 0.8, s"degenerate label rate $posRate")
  }

  test("ppiLite every node has all 50 features") {
    assert(ppi.nodes.forall(_.feat.length == 50))
  }

  test("uugLite has hub nodes (skewed in-degree)") {
    val indeg = uug.edges.groupBy(_.dst).view.mapValues(_.length)
    val maxDeg = indeg.values.max
    val avgDeg = uug.edges.length.toDouble / uug.nodes.length
    assert(maxDeg > 10 * avgDeg, s"max in-degree $maxDeg vs avg $avgDeg — no skew")
  }

  test("uugLite labels are binary with both classes present") {
    assert(uug.numClasses == 1 && uug.task == "bce")
    val pos = uug.nodes.count(_.label(0) > 0.5)
    assert(pos > 100 && pos < 900)
  }

  test("uugLite reliability flag sits in feature 0 and marks ~25% of nodes") {
    val rel = uug.nodes.count(_.feat(0) > 0.5)
    assert(rel > 150 && rel < 350, s"reliable count $rel")
  }

  test("uugLite directed edges are unique") {
    val keys = uug.edges.map(e => (e.src, e.dst))
    assert(keys.distinct.length == keys.length)
  }

  test("uugLite splits only cover labeled fraction") {
    val labeled = uug.nodes.count(_.split != "none")
    assert(labeled == (1000 * 0.5).toInt)
    assert(uug.split("train").length > uug.split("test").length)
    assert(uug.split("val").nonEmpty)
  }

  test("node/edge datasets round-trip through Spark") {
    val spark = repro.SparkSpec.shared
    val g = GraphGen.uugLite(n = 120)
    assert(g.nodeDs(spark).count() == 120)
    assert(g.edgeDs(spark).count() == g.edges.length.toLong)
    val back = g.nodeDs(spark).collect().sortBy(_.id)
    assert(back.map(_.id).toSeq == g.nodes.map(_.id).toSeq)
  }
}
