package repro.core

import org.apache.spark.rdd.RDD
import repro.dna.{PackedSeq, PackedSeqBuilder}

/** Operation ③ — contig merging (paper §IV-B).
  *
  * A mini-MapReduce groups the labeled unambiguous nodes by contig label;
  * each group is ordered from a contig-end vertex (or an arbitrary vertex
  * for a cycle), then stitched: the first node contributes its whole
  * oriented sequence, each subsequent node its oriented sequence minus the
  * (k-1)-base overlap; a node entered through its Right side is read
  * reverse-complemented (the paper's polarity-H case). Contig coverage is
  * the minimum coverage over merged edges; contig IDs are assigned per
  * worker partition (Fig. 7c).
  *
  * Per the paper, a group whose far end is a dead-end (type ⟨1⟩) is dropped
  * during reduce if its stitched length is within the tip-length threshold.
  */
object ContigMerging {

  final case class Opts(k: Int, dropDanglingShort: Boolean = true, tipLen: Int = 80)

  /** Stitched contig before ID assignment. */
  final case class Stitched(seq: PackedSeq, leftEdge: Option[Edge],
                            rightEdge: Option[Edge], cov: Long)

  /** Order and stitch one contig group. Returns None for dropped tips. */
  def stitch(members: Seq[Node], opts: Opts): Option[Stitched] = {
    val byId = members.map(n => n.id -> n).toMap
    def inGroupEdge(n: Node, side: Int): Option[Edge] =
      n.edgesOn(side).find(e => byId.contains(e.nbr) && e.nbr != n.id)

    // A contig-end member has at most one side continuing inside the group.
    val ends = members.filter(n =>
      Seq(Side.Left, Side.Right).count(s => inGroupEdge(n, s).isDefined) <= 1)
    val isCycle = ends.isEmpty
    val start =
      if (isCycle) members.minBy(_.id)
      else ends.minBy(_.id)
    val startExit =
      if (isCycle) Side.Right
      else if (inGroupEdge(start, Side.Right).isDefined) Side.Right
      else if (inGroupEdge(start, Side.Left).isDefined) Side.Left
      else Side.Right // single-node contig: orientation is forward

    val sb = new PackedSeqBuilder(members.map(_.seqLen).sum)
    val covs = Vector.newBuilder[Long]
    members.foreach(n => if (n.cov > 0) covs += n.cov) // round-2 contig members

    // First node: oriented so that it exits via its startExit side.
    val startForward = startExit == Side.Right
    sb.appendSeq(if (startForward) start.seq else start.seq.rc)

    var cur      = start
    var exitSide = startExit
    var count    = 1
    var closed   = false
    var lastForward = startForward
    while ({
      inGroupEdge(cur, exitSide) match {
        case Some(e) if !(isCycle && e.nbr == start.id && count == members.size) =>
          require(count < members.size, s"contig group walk exceeded group size (label group of ${members.size})")
          covs += e.cov
          val next    = byId(e.nbr)
          val forward = e.nbrSide == Side.Left
          val oriented = if (forward) next.seq else next.seq.rc
          sb.appendSeq(oriented, from = opts.k - 1)
          cur = next
          lastForward = forward
          exitSide = Side.other(e.nbrSide)
          count += 1
          true
        case Some(e) => // cycle closed
          covs += e.cov
          closed = true
          false
        case None => false
      }
    }) ()
    require(count == members.size,
      s"contig group is not a single path: visited $count of ${members.size}")

    val seq = sb.result()
    // Contig-frame end edges: the start's away side is the contig's Left,
    // the final node's exit side is the contig's Right (both mapped through
    // each node's own orientation).
    val leftEdge =
      if (closed) None
      else start.edgesOn(if (startForward) Side.Left else Side.Right).headOption
        .filter(e => !byId.contains(e.nbr))
        .map(e => e.copy(mySide = Side.Left))
    val rightEdge =
      if (closed) None
      else cur.edgesOn(if (lastForward) Side.Right else Side.Left).headOption
        .filter(e => !byId.contains(e.nbr))
        .map(e => e.copy(mySide = Side.Right))

    if (opts.dropDanglingShort && (leftEdge.isEmpty || rightEdge.isEmpty) &&
        !closed && seq.length <= opts.tipLen) None
    else {
      val internal = covs.result()
      val cov =
        if (internal.nonEmpty) internal.min
        else (leftEdge.toSeq ++ rightEdge.toSeq).map(_.cov) match {
          case Nil => 1L
          case cs  => cs.min
        }
      Some(Stitched(seq, leftEdge, rightEdge, cov))
    }
  }

  /** Merge labeled nodes into contig nodes, keyed by new contig ID. */
  def merge(nodes: RDD[(Long, Node)], labels: RDD[(Long, Long)],
            opts: Opts): RDD[(Long, Node)] = {
    nodes
      .join(labels)
      .map { case (_, (n, label)) => (label, n) }
      .groupByKey()
      .mapPartitionsWithIndex { (pi, groups) =>
        groups.zipWithIndex.flatMap { case ((_, ns), j) =>
          stitch(ns.toSeq, opts).map { s =>
            val id = Ids.contigId(pi, j + 1L)
            val edges = (s.leftEdge.toVector ++ s.rightEdge.toVector)
            (id, Node(id, s.seq, edges, s.cov))
          }
        }
      }
  }
}
