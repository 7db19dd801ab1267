package repro.core

import repro.SparkSpec
import repro.dna.Dna

class DbgGraphXSpec extends SparkSpec {

  val k = 15
  def mk(seed: Long, repeats: Int = 4) = TestGraphs.nodes(spark,
    TestGraphs.perfectReads(
      Dna.genome(Dna.GenomeSpec(1200, longRepeats = repeats, longRepeatLen = 80), seed),
      40, k), k).cache()

  test("edgeList emits one directed copy per adjacency item") {
    val ns = mk(41)
    val expected = ns.map(_._2.edges.size.toLong).fold(0L)(_ + _)
    assert(DbgGraphX.edgeList(ns).count() == expected)
  }

  test("graph holds every vertex with its type") {
    val ns = mk(42)
    val g = DbgGraphX.graph(ns)
    assert(g.vertices.count() == ns.count())
    val types = ns.mapValues(_.typ).collect().toMap
    g.vertices.collect().foreach { case (id, t) => assert(types(id) == t) }
  }

  test("ambiguousNeighbors delivers exactly the MN-adjacent IDs") {
    val ns = mk(43)
    val nodes = ns.collect().toMap
    val mn = nodes.filter(_._2.typ == VType.MN).keySet
    assume(mn.nonEmpty)
    val (recv, msgCount) = DbgGraphX.ambiguousNeighbors(ns)
    val got = recv.collect().toMap
    // every vertex's received set == its neighbours that are ambiguous
    for ((id, n) <- nodes) {
      val expect = n.edges.map(_.nbr).filter(mn.contains).toSet
      assert(got.getOrElse(id, Set.empty) == expect, s"vertex $id")
    }
    assert(msgCount == nodes.filter(x => mn.contains(x._1)).map(_._2.edges.size).sum)
  }

  test("contigLabelsViaCC labels only unambiguous vertices") {
    val ns = mk(44)
    val (labels, _) = DbgGraphX.contigLabelsViaCC(ns)
    val unamb = ns.filter(_._2.typ != VType.MN).keys.collect().toSet
    assert(labels.keys.collect().toSet == unamb)
  }

  test("maxIterations caps the GraphX propagation (may not converge)") {
    val ns = mk(45, repeats = 0) // one long path: needs many iterations
    val (capped, _) = DbgGraphX.contigLabelsViaCC(ns, maxIterations = 2)
    // with 2 iterations a >1000-vertex path cannot all agree on one label
    assert(capped.values.distinct().count() > 1)
  }
}
