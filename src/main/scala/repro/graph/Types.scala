package repro.graph

import java.io.{ByteArrayInputStream, ByteArrayOutputStream, DataInputStream, DataOutputStream}
import java.util.Base64

/** A node record: id + feature vector (and a label vector for labeled nodes,
  * empty otherwise; labels ride on the node table, not on GraphFeatures).
  */
case class GNode(id: Long, feat: Array[Float]) {
  override def equals(o: Any): Boolean = o match {
    case g: GNode => g.id == id && java.util.Arrays.equals(g.feat, feat)
    case _        => false
  }
  override def hashCode(): Int = id.hashCode
}

/** A directed edge src → dst: dst aggregates from src ("in-edge" of dst). */
case class GEdge(src: Long, dst: Long, weight: Float, feat: Array[Float]) {
  override def equals(o: Any): Boolean = o match {
    case g: GEdge =>
      g.src == src && g.dst == dst && g.weight == weight && java.util.Arrays.equals(g.feat, feat)
    case _ => false
  }
  override def hashCode(): Int = (src, dst).hashCode
}

/** The K-hop neighborhood of `target`, flattened. This is the paper's
  * "GraphFeature": an information-complete subgraph — self-contained input
  * for computing target's K-layer embedding.
  *
  * The paper serializes to protobuf; we use a compact binary codec
  * ([[GraphFeature.encode]]) playing the same role (flat string on a DFS).
  */
case class GraphFeature(target: Long, nodes: Array[GNode], edges: Array[GEdge]) {
  def numNodes: Int = nodes.length
  def numEdges: Int = edges.length
}

object GraphFeature {
  /** Flatten to a Base64 string (the paper's "protobuf string"). */
  def encode(gf: GraphFeature): String = {
    val bos = new ByteArrayOutputStream()
    val out = new DataOutputStream(bos)
    out.writeLong(gf.target)
    out.writeInt(gf.nodes.length)
    out.writeInt(if (gf.nodes.isEmpty) 0 else gf.nodes.head.feat.length)
    gf.nodes.foreach { n =>
      out.writeLong(n.id)
      n.feat.foreach(out.writeFloat)
    }
    out.writeInt(gf.edges.length)
    out.writeInt(if (gf.edges.isEmpty) 0 else gf.edges.head.feat.length)
    gf.edges.foreach { e =>
      out.writeLong(e.src); out.writeLong(e.dst); out.writeFloat(e.weight)
      e.feat.foreach(out.writeFloat)
    }
    out.flush()
    Base64.getEncoder.encodeToString(bos.toByteArray)
  }

  def decode(s: String): GraphFeature = {
    val in = new DataInputStream(new ByteArrayInputStream(Base64.getDecoder.decode(s)))
    val target = in.readLong()
    val nNodes = in.readInt()
    val nf = in.readInt()
    val nodes = Array.fill(nNodes) {
      val id = in.readLong()
      GNode(id, Array.fill(nf)(in.readFloat()))
    }
    val nEdges = in.readInt()
    val ef = in.readInt()
    val edges = Array.fill(nEdges) {
      val s0 = in.readLong(); val d = in.readLong(); val w = in.readFloat()
      GEdge(s0, d, w, Array.fill(ef)(in.readFloat()))
    }
    GraphFeature(target, nodes, edges)
  }
}

/** One training/inference example: the triple <TargetedNodeId, Label,
  * GraphFeature> from §3.3.1.
  */
case class Example(target: Long, label: Array[Float], gf: GraphFeature)

/** Same triple with the GraphFeature still flattened — what sits on "disk"
  * (the distributed filesystem) between GraphFlat and GraphTrainer.
  */
case class FlatExample(target: Long, label: Array[Float], gfEncoded: String) {
  def decoded: Example = Example(target, label, GraphFeature.decode(gfEncoded))
}
