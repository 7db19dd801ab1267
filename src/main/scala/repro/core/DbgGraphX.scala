package repro.core

import org.apache.spark.graphx.{Edge => GxEdge, Graph, VertexRDD}
import org.apache.spark.rdd.RDD

/** GraphX view of the de Bruijn graph — the vertex-centric API used for
  * edge-along operations and for cross-validation.
  *
  * Contig-end recognition (paper §IV-B ②, supersteps 1-2: every ⟨m-n⟩
  * vertex broadcasts its ID to all neighbours) maps directly onto
  * `aggregateMessages`. GraphX's `connectedComponents` (a GraphX-Pregel
  * min-label propagation needing O(path length) supersteps, vs LR's
  * O(log)) doubles as an independent labeling the tests compare against and
  * as the "GraphX-CC" comparison column of the Table II bench.
  */
object DbgGraphX {

  /** Directed-copy edge list: every adjacency item of every node. Each
    * physical DBG edge appears once per endpoint, so `sendToDst` alone
    * reaches all neighbours of a source.
    */
  def edgeList(nodes: RDD[(Long, Node)]): RDD[GxEdge[Unit]] =
    nodes.flatMap { case (id, n) => n.edges.map(e => GxEdge(id, e.nbr, ())) }

  /** The typed GraphX graph. */
  def graph(nodes: RDD[(Long, Node)]): Graph[VType, Unit] =
    Graph(nodes.mapValues(_.typ), edgeList(nodes), VType.MN)

  /** For each vertex, the set of its ambiguous neighbours' IDs (the
    * superstep-1 broadcast). Also returns the number of messages sent.
    */
  def ambiguousNeighbors(nodes: RDD[(Long, Node)]): (VertexRDD[Set[Long]], Long) = {
    val g = graph(nodes)
    val msgs: VertexRDD[Set[Long]] = g.aggregateMessages[Set[Long]](
      ctx => if (ctx.srcAttr == VType.MN) ctx.sendToDst(Set(ctx.srcId)),
      _ ++ _,
    )
    val msgCount = nodes
      .filter(_._2.typ == VType.MN)
      .map(_._2.edges.size.toLong)
      .fold(0L)(_ + _)
    (msgs, msgCount)
  }

  /** Contig labeling via GraphX connectedComponents over the unambiguous
    * subgraph (edges between two unambiguous vertices only). Returns
    * (labels for unambiguous vertices, supersteps ~ iterations, messages).
    * Used as a correctness oracle and as the GraphX comparison column.
    */
  def contigLabelsViaCC(nodes: RDD[(Long, Node)],
                        maxIterations: Int = Int.MaxValue): (RDD[(Long, Long)], Long) = {
    val types = nodes.mapValues(_.typ).cache()
    val unambiguous = types.filter(_._2 != VType.MN)
    val edges = nodes
      .flatMap { case (id, n) => n.edges.map(e => (e.nbr, id)) }
      .join(types.filter(_._2 != VType.MN))  // neighbour end unambiguous
      .map { case (nbr, (id, _)) => (id, nbr) }
      .join(unambiguous)                      // this end unambiguous
      .map { case (id, (nbr, _)) => GxEdge(id, nbr, ()) }
    val g  = Graph(unambiguous.mapValues(_ => ()), edges, ())
    val cc = g.connectedComponents(maxIterations)
    val labels = cc.vertices.map { case (id, label) => (id, label) }
    val msgCount = edges.count() // lower bound: one message per edge copy per iteration
    (labels, msgCount)
  }
}
