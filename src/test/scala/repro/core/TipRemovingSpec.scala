package repro.core

import org.apache.spark.rdd.RDD
import repro.SparkSpec
import repro.dna.PackedSeq

class TipRemovingSpec extends SparkSpec {

  val k = 15

  /** Ambiguous k-mer node (edges filled by relink). */
  def amb(id: Long, edges: (Long, Int, Int, Long, Int)*): Node =
    Node(id, PackedSeq.fromString("A" * k),
      edges.map { case (nbr, ms, ns, cov, nl) => Edge(nbr, ms, ns, cov, nl) }.toVector, 0L)

  /** Contig node of a given length with optional end neighbours. */
  def contig(j: Long, len: Int, left: Option[Long], right: Option[Long]): Node = {
    val id = Ids.contigId(1, j)
    val es = left.map(l => Edge(l, Side.Left, Side.Right, 10, k)).toVector ++
             right.map(r => Edge(r, Side.Right, Side.Left, 10, k)).toVector
    Node(id, PackedSeq.fromString("A" * len), es, 10L)
  }

  def rdd(ns: Node*): RDD[(Long, Node)] =
    spark.sparkContext.parallelize(ns.map(n => (n.id, n)), 2)

  def surviving(ambs: Seq[Node], contigs: Seq[Node], tipLen: Int = 80): Map[Long, Node] =
    TipRemoving.run(rdd(ambs: _*), rdd(contigs: _*), k, tipLen).nodes.collect().toMap

  test("relink attaches contig edges to ambiguous endpoints and drops stale ones") {
    val x = amb(10L, (11L, Side.Right, Side.Left, 5, k), // edge to another ambiguous
                     (999L, Side.Left, Side.Right, 5, k)) // stale: merged-away k-mer
    val y = amb(11L, (10L, Side.Left, Side.Right, 5, k))
    val c = contig(1, 200, left = Some(10L), right = Some(11L))
    val relinked = TipRemoving.relink(rdd(x, y), rdd(c)).collect().toMap
    val nx = relinked(10L)
    assert(nx.edges.exists(_.nbr == 11L), "ambiguous-ambiguous edge kept")
    assert(!nx.edges.exists(_.nbr == 999L), "stale edge dropped")
    val ce = nx.edges.find(_.nbr == c.id)
    assert(ce.isDefined, "contig edge attached")
    assert(ce.get.nbrLen == 200)
    // the helper's left-end edge carries nbrSide=Right: x sees it on its Right
    assert(ce.get.mySide == Side.Right)
    assert(ce.get.nbrSide == Side.Left)
  }

  test("a short dangling contig (a tip) is deleted and the hub loses its edge") {
    // hub X is ambiguous: main path via contigs c1, c2; tip c3 (short dangling)
    val x  = amb(10L)
    val c1 = contig(1, 300, left = None, right = Some(10L))
    val c2 = contig(2, 300, left = Some(10L), right = None)
    val c3 = contig(3, 40, left = Some(10L), right = None) // 40 <= 80: tip
    val out = surviving(Seq(x), Seq(c1, c2, c3))
    assert(!out.contains(c3.id), "tip contig deleted")
    assert(out.contains(c1.id) && out.contains(c2.id))
    assert(!out(10L).edges.exists(_.nbr == c3.id), "hub edge to tip removed")
  }

  test("a long dangling contig survives") {
    val x  = amb(10L)
    val c1 = contig(1, 300, left = None, right = Some(10L))
    val c2 = contig(2, 300, left = Some(10L), right = None)
    val c3 = contig(3, 200, left = Some(10L), right = None) // 200 > 80
    val out = surviving(Seq(x), Seq(c1, c2, c3))
    assert(out.contains(c3.id))
    assert(out(10L).edges.exists(_.nbr == c3.id))
  }

  test("cascading tips: removing one exposes and removes the next (multi-phase)") {
    // X(MN) has exactly: an edge to hub path?  Build: c1 - X - c2 and X - t (tip).
    // After t dies, X becomes <1-1>: no new request. Build a deeper cascade:
    // Y(MN): edges to t2 (short) and X; X: edges to Y and t1(short).
    // After t1 dies, X -> <1>, X requests toward Y with cum=len(t?)...
    val x  = amb(10L)
    val y  = amb(11L)
    val t1 = contig(1, 30, left = Some(10L), right = None)
    val cXY = contig(2, 20, left = Some(10L), right = Some(11L))
    val main1 = contig(3, 400, left = None, right = Some(11L))
    val main2 = contig(4, 400, left = Some(11L), right = None)
    val out = surviving(Seq(x, y), Seq(t1, cXY, main1, main2))
    // phase 1: t1 (30 <= 80) deleted; X becomes <1> with only cXY
    // phase 2: X requests via cXY to Y: cum = 15 + (20-14) ... <= 80: deleted
    assert(!out.contains(t1.id))
    assert(!out.contains(cXY.id), "second-phase tip removed")
    assert(!out.contains(10L) || out(10L).edges.isEmpty ||
           out.get(10L).forall(_.edges.forall(e => e.nbr != cXY.id)))
    assert(out.contains(main1.id) && out.contains(main2.id))
    assert(out(11L).edges.map(_.nbr).toSet ==
           Set(main1.id, main2.id), "Y keeps only the main path")
  }

  test("an isolated long contig is untouched") {
    val c = contig(1, 500, None, None)
    val out = surviving(Seq.empty, Seq(c))
    assert(out.contains(c.id))
  }

  test("a tip with two dead-ends: DELETEs meet in the middle") {
    // isolated chain: t1(<1>) - X? No ambiguity at all: c1 - c2 joined by an
    // ambiguous vertex is impossible; use k-mer relay: a(One) - m(OneOne) - b(One)
    val a = amb(20L, (21L, Side.Right, Side.Left, 3, k))
    val m = amb(21L, (20L, Side.Left, Side.Right, 3, k), (22L, Side.Right, Side.Left, 3, k))
    val b = amb(22L, (21L, Side.Left, Side.Right, 3, k))
    assert(a.typ == VType.One && m.typ == VType.OneOne && b.typ == VType.One)
    // total length: 15 + 1 + 1 = 17 <= 80: the whole chain is a tip
    val out = surviving(Seq(a, m, b), Seq.empty)
    assert(out.isEmpty)
  }

  test("a two-dead-end chain longer than the threshold survives") {
    val a = amb(20L, (21L, Side.Right, Side.Left, 3, k))
    val m = amb(21L, (20L, Side.Left, Side.Right, 3, k), (22L, Side.Right, Side.Left, 3, k))
    val b = amb(22L, (21L, Side.Left, Side.Right, 3, k))
    val out = surviving(Seq(a, m, b), Seq.empty, tipLen = 10)
    assert(out.keySet == Set(20L, 21L, 22L))
  }

  test("hub with several short tips loses them all and can become unambiguous") {
    val x  = amb(10L)
    val main1 = contig(1, 400, left = None, right = Some(10L))
    val main2 = contig(2, 400, left = Some(10L), right = None)
    val t1 = contig(3, 30, left = Some(10L), right = None)
    val t2 = contig(4, 50, left = Some(10L), right = None)
    val out = surviving(Seq(x), Seq(main1, main2, t1, t2))
    assert(!out.contains(t1.id) && !out.contains(t2.id))
    assert(out(10L).edges.map(_.nbr).toSet == Set(main1.id, main2.id))
    assert(out(10L).typ == VType.OneOne, "hub became unambiguous for round 2")
  }

  test("stats report a terminating Pregel run") {
    val x = amb(10L)
    val c = contig(1, 40, left = Some(10L), right = None)
    val res = TipRemoving.run(rdd(x), rdd(c), k, 80)
    res.nodes.count()
    assert(res.stats.supersteps >= 2)
    assert(res.stats.messages >= 2) // REQUEST + DELETE at least
  }
}
