package repro.core

import org.apache.spark.sql.{Dataset, SparkSession}
import org.apache.spark.storage.StorageLevel
import repro.graph._

/** Configuration of the GraphFlat pipeline (and of GraphInfer, which must
  * process data identically — §3.4).
  *
  * @param k                 number of hops / Reduce rounds
  * @param sampling          in-edge sampling strategy (per node, per salt)
  * @param reindexThreshold  in-degree above which a node is a "hub" whose
  *                          shuffle key gets salted (re-indexing, §3.2.2)
  * @param numSalts          number of random suffixes for hub keys
  * @param seed              seed for deterministic sampling
  */
case class FlatConfig(
    k: Int,
    sampling: SamplingStrategy = NoSampling,
    reindexThreshold: Int = Int.MaxValue,
    numSalts: Int = 8,
    seed: Long = 0L
)

/** GraphFlat (§3.2): the distributed K-hop neighborhood generator, expressed
  * as Spark Dataset shuffles instead of raw Hadoop MapReduce.
  *
  * Per round ("Reduce phase"):
  *   - every node ships its current self information (the accumulated
  *     subgraph) along each out-edge to the destination ("propagation"),
  *     implemented as `joinWith` on src;
  *   - every node merges its previous self information with the sampled
  *     in-edge messages ("merging"), implemented as `groupByKey(dst)` +
  *     `mapGroups`.
  *
  * Hub destinations (in-degree > threshold) go through a salted partial
  * merge first (re-indexing), and the partials are recombined under the
  * original key (inverted indexing).
  *
  * After K rounds, each node's self information *is* its K-hop neighborhood;
  * it is flattened to a GraphFeature (and optionally an encoded string).
  */
object GraphFlat {

  /** Self information of a node: the subgraph accumulated so far. */
  case class NodeState(id: Long, nodes: Array[GNode], edges: Array[GEdge])

  /** A shuffle record. kind: 0 = self info, 1 = in-edge message (`via` is the
    * connecting edge), 2 = hub partial merge result.
    */
  case class Packet(key: Long, kind: Int, st: NodeState, via: Array[GEdge])

  /** Ids of nodes whose in-degree exceeds the re-indexing threshold. */
  def hubIds(edges: Dataset[GEdge], cfg: FlatConfig): Set[Long] = {
    if (cfg.reindexThreshold == Int.MaxValue) Set.empty
    else {
      import edges.sparkSession.implicits._
      edges
        .groupByKey(_.dst)
        .count()
        .filter(_._2 > cfg.reindexThreshold.toLong)
        .map(_._1)
        .collect()
        .toSet
    }
  }

  /** Run the pipeline; returns every node's K-hop neighborhood. Restrict to
    * labeled targets downstream (Theorem 1 applies per target).
    */
  def run(
      spark: SparkSession,
      nodes: Dataset[LabeledNode],
      edges: Dataset[GEdge],
      cfg: FlatConfig
  ): Dataset[GraphFeature] = {
    import spark.implicits._
    val hubs = spark.sparkContext.broadcast(hubIds(edges, cfg))
    val numSalts = cfg.numSalts
    val sampling = cfg.sampling
    val seed = cfg.seed

    // Map phase: runs once; seeds each node's self information.
    var state: Dataset[NodeState] = nodes
      .map(n => NodeState(n.id, Array(GNode(n.id, n.feat)), Array.empty[GEdge]))
      .persist(StorageLevel.MEMORY_AND_DISK)
    state.count()

    var round = 0
    while (round < cfg.k) {
      val selfPk = state.map(s => Packet(s.id, 0, s, Array.empty[GEdge]))
      val msgPk = state
        .joinWith(edges, state.col("id") === edges.col("src"))
        .map { case (s, e) => Packet(e.dst, 1, s, Array(e)) }

      val hubMsgs = msgPk.filter(p => hubs.value.contains(p.key))
      val normalMsgs = msgPk.filter(p => !hubs.value.contains(p.key))

      // Re-indexing: salt hub keys, partially merge per salt (with sampling),
      // then inverted indexing restores the original key via Packet.key.
      val partials = hubMsgs
        .groupByKey(p => (p.key, Sampling.saltOf(p.st.id, numSalts)))
        .mapGroups { (keySalt: (Long, Int), it: Iterator[Packet]) =>
          val (key, salt) = keySalt
          val cands = it.toArray.toSeq
          val sel = Sampling.selectGroup[Packet](
            cands, _.st.id, _.via.head.weight.toDouble, sampling, seed, key, salt)
          Packet(key, 2, mergeInto(NodeState(key, Array.empty, Array.empty), sel), Array.empty)
        }

      val newState = selfPk
        .union(normalMsgs)
        .union(partials)
        .groupByKey(_.key)
        .mapGroups { (key, it) =>
          val pk = it.toArray
          val self = pk.find(_.kind == 0).map(_.st).getOrElse(NodeState(key, Array.empty, Array.empty))
          val partialsHere = pk.filter(_.kind == 2)
          val cands = pk.filter(_.kind == 1).toSeq
          val sel = Sampling.selectInEdges[Packet](
            cands, _.st.id, _.via.head.weight.toDouble, sampling, seed, key,
            isHub = false, numSalts = numSalts)
          val merged = mergeInto(self, sel)
          partialsHere.foldLeft(merged)((acc, p) => unionStates(acc, p.st))
        }
        .persist(StorageLevel.MEMORY_AND_DISK)
      newState.count()
      state.unpersist()
      state = newState
      round += 1
    }

    // Storing phase: materialize the flattened neighborhoods and release the
    // pipeline's working state — callers unpersist the returned Dataset when
    // done (leaked caches would otherwise pile up across pipeline runs).
    val out = state.map(s => GraphFeature(s.id, s.nodes, s.edges))
      .persist(StorageLevel.MEMORY_AND_DISK)
    out.count()
    state.unpersist()
    out
  }

  /** Merge sampled in-edge messages into a self state: union the message
    * subgraphs plus each connecting edge; dedup nodes by id, edges by
    * (src, dst).
    */
  private def mergeInto(self: NodeState, msgs: Seq[Packet]): NodeState =
    msgs.foldLeft(self) { (acc, m) =>
      unionStates(acc, NodeState(acc.id, m.st.nodes, m.st.edges ++ m.via))
    }

  private def unionStates(a: NodeState, b: NodeState): NodeState = {
    val nodeIds = a.nodes.map(_.id).toSet
    val nn = a.nodes ++ b.nodes.filterNot(n => nodeIds(n.id))
    val edgeKeys = a.edges.map(e => (e.src, e.dst)).toSet
    val ee = a.edges ++ b.edges.filterNot(e => edgeKeys((e.src, e.dst)))
    NodeState(a.id, nn, ee)
  }

  /** Convenience: run GraphFlat and join labels for a given split, producing
    * the <TargetedNodeId, Label, GraphFeature> triples of §3.3.1, with the
    * GraphFeature flattened to its on-DFS string form.
    */
  def flatExamples(
      spark: SparkSession,
      graph: LocalGraph,
      cfg: FlatConfig,
      split: String
  ): Dataset[FlatExample] = {
    import spark.implicits._
    val nodes = graph.nodeDs(spark)
    val edges = graph.edgeDs(spark)
    val feats = run(spark, nodes, edges, cfg)
    val targets = nodes.filter(_.split == split).map(n => (n.id, n.label))
    val out = feats
      .joinWith(targets, feats.col("target") === targets.col("_1"))
      .map { case (gf, (id, label)) => FlatExample(id, label, GraphFeature.encode(gf)) }
      .persist(StorageLevel.MEMORY_AND_DISK)
    out.count()
    feats.unpersist()
    out
  }
}
