package repro.graph

import org.scalatest.funsuite.AnyFunSuite
import scala.util.Random

class CodecSpec extends AnyFunSuite {

  private def randomGf(seed: Long): GraphFeature = {
    val rng = new Random(seed)
    val nf = 1 + rng.nextInt(6)
    val ef = rng.nextInt(4)
    val nodes = Array.tabulate(1 + rng.nextInt(10)) { i =>
      GNode(rng.nextLong(), Array.fill(nf)(rng.nextFloat()))
    }
    val edges = Array.tabulate(rng.nextInt(15)) { _ =>
      GEdge(nodes(rng.nextInt(nodes.length)).id, nodes(rng.nextInt(nodes.length)).id,
        rng.nextFloat(), Array.fill(ef)(rng.nextFloat()))
    }
    GraphFeature(nodes.head.id, nodes, edges)
  }

  test("encode/decode round-trips random GraphFeatures") {
    for (seed <- 0 until 50) {
      val gf = randomGf(seed)
      val back = GraphFeature.decode(GraphFeature.encode(gf))
      assert(back.target == gf.target)
      assert(back.nodes.toSeq == gf.nodes.toSeq)
      assert(back.edges.toSeq == gf.edges.toSeq)
    }
  }

  test("empty neighborhood round-trips") {
    val gf = GraphFeature(42L, Array(GNode(42L, Array(1.5f))), Array.empty)
    val back = GraphFeature.decode(GraphFeature.encode(gf))
    assert(back.target == 42L && back.nodes.length == 1 && back.edges.isEmpty)
  }

  test("encoding is deterministic") {
    val gf = randomGf(7)
    assert(GraphFeature.encode(gf) == GraphFeature.encode(gf))
  }

  test("FlatExample.decoded reverses the flattening") {
    val gf = randomGf(3)
    val fe = FlatExample(gf.target, Array(1.0f, 0.0f), GraphFeature.encode(gf))
    val ex = fe.decoded
    assert(ex.target == gf.target)
    assert(ex.label.toSeq == Seq(1.0f, 0.0f))
    assert(ex.gf.nodes.toSeq == gf.nodes.toSeq && ex.gf.edges.toSeq == gf.edges.toSeq)
  }

  test("GNode/GEdge equality compares feature contents") {
    assert(GNode(1, Array(1f, 2f)) == GNode(1, Array(1f, 2f)))
    assert(GNode(1, Array(1f, 2f)) != GNode(1, Array(1f, 3f)))
    assert(GEdge(1, 2, 1f, Array(0.5f)) == GEdge(1, 2, 1f, Array(0.5f)))
    assert(GEdge(1, 2, 1f, Array(0.5f)) != GEdge(1, 2, 2f, Array(0.5f)))
  }

  test("encoded form is pure base64 (storable as a flat string column)") {
    val s = GraphFeature.encode(randomGf(11))
    assert(s.matches("[A-Za-z0-9+/=]+"))
  }
}
