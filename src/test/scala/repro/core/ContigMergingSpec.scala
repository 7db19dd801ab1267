package repro.core

import org.apache.spark.rdd.RDD
import repro.SparkSpec
import repro.dna.Dna

class ContigMergingSpec extends SparkSpec {

  val k = 15
  def opts(drop: Boolean = false, tipLen: Int = 80) =
    ContigMerging.Opts(k, dropDanglingShort = drop, tipLen = tipLen)

  def assembleOnce(reads: Seq[String], drop: Boolean = false): Seq[Node] = {
    val ns  = TestGraphs.nodes(spark, reads, k).cache()
    val lab = ContigLabeling.labelLR(ns)
    ContigMerging.merge(ns, lab.labels, opts(drop)).values.collect().toSeq
  }

  test("golden: a repeat-free genome reassembles into itself") {
    val g = Dna.genome(Dna.GenomeSpec(500, longRepeats = 0, shortRepeats = 0), 21)
    val contigs = assembleOnce(TestGraphs.perfectReads(g, 40, k))
    assert(contigs.size == 1)
    val s = contigs.head.seq.toString
    assert(s == g || s == Dna.rc(g), "contig must equal the genome or its rc")
  }

  test("golden: mixed-strand reads reassemble the same genome") {
    val g = Dna.genome(Dna.GenomeSpec(500, longRepeats = 0, shortRepeats = 0), 22)
    val contigs = assembleOnce(TestGraphs.mixedStrandReads(g, 40, k))
    assert(contigs.size == 1)
    val s = contigs.head.seq.toString
    assert(s == g || s == Dna.rc(g))
  }

  test("two chromosomes give two contigs") {
    val g1 = Dna.genome(Dna.GenomeSpec(300, longRepeats = 0, shortRepeats = 0), 23)
    val g2 = Dna.genome(Dna.GenomeSpec(260, longRepeats = 0, shortRepeats = 0), 24)
    val contigs = assembleOnce(
      TestGraphs.perfectReads(g1, 40, k) ++ TestGraphs.perfectReads(g2, 40, k))
    val seqs = contigs.map(_.seq.toString).toSet
    assert(contigs.size == 2)
    assert(seqs.exists(s => s == g1 || s == Dna.rc(g1)))
    assert(seqs.exists(s => s == g2 || s == Dna.rc(g2)))
  }

  test("a circular genome merges into a single cycle contig") {
    val g = Dna.genome(Dna.GenomeSpec(150, longRepeats = 0, shortRepeats = 0), 25)
    val circ = g + g.substring(0, 40)
    val contigs = assembleOnce(TestGraphs.perfectReads(circ, 40, k))
    assert(contigs.size == 1)
    val c = contigs.head
    assert(c.edges.isEmpty, "cycle contig has no outside neighbours")
    // the contig spells the cycle: it is a substring of g+g (or its rc)
    val doubled = g + g
    val s = c.seq.toString
    assert(s.length == g.length + k - 1)
    assert(doubled.contains(s) || Dna.rc(doubled + g).contains(s))
  }

  test("repeat-split genome: contigs cover unambiguous stretches and carry end edges") {
    val g = Dna.genome(Dna.GenomeSpec(2000, longRepeats = 8, longRepeatLen = 100), 26)
    val ns  = TestGraphs.nodes(spark, TestGraphs.perfectReads(g, 40, k), k).cache()
    val amb = ns.filter(_._2.typ == VType.MN).keys.collect().toSet
    assert(amb.nonEmpty)
    val lab = ContigLabeling.labelLR(ns)
    val contigs = ContigMerging.merge(ns, lab.labels, opts()).values.collect()
    assert(contigs.length > 1)
    // every real end edge points at an ambiguous vertex
    for (c <- contigs; e <- c.edges) assert(amb.contains(e.nbr), s"contig ${c.id}")
    // contig sequences occur in the genome (or its rc)
    for (c <- contigs) {
      val s = c.seq.toString
      assert(g.contains(s) || g.contains(Dna.rc(s)), s"contig ${c.id} not in genome")
    }
  }

  test("total stitched bases equal k-mer count accounting for overlaps") {
    val g = Dna.genome(Dna.GenomeSpec(900, longRepeats = 3, longRepeatLen = 80), 27)
    val ns  = TestGraphs.nodes(spark, TestGraphs.perfectReads(g, 40, k), k).cache()
    val lab = ContigLabeling.labelLR(ns)
    val merged = ContigMerging.merge(ns, lab.labels, opts())
    val labelSizes = lab.labels.map(x => (x._2, 1L)).reduceByKey(_ + _).values.collect()
    val contigLens = merged.values.map(_.seqLen.toLong).collect()
    assert(contigLens.sorted.toSeq == labelSizes.map(_ + (k - 1).toLong).sorted.toSeq)
  }

  test("dropDanglingShort removes short isolated contigs (the merge-time tip check)") {
    val g = Dna.genome(Dna.GenomeSpec(60, longRepeats = 0, shortRepeats = 0), 28)
    assert(assembleOnce(TestGraphs.perfectReads(g, 40, k), drop = false).size == 1)
    assert(assembleOnce(TestGraphs.perfectReads(g, 40, k), drop = true).isEmpty)
  }

  test("long dangling contigs survive the merge-time tip check") {
    val g = Dna.genome(Dna.GenomeSpec(400, longRepeats = 0, shortRepeats = 0), 29)
    assert(assembleOnce(TestGraphs.perfectReads(g, 40, k), drop = true).size == 1)
  }

  test("contig coverage is the minimum edge coverage along the path") {
    // cover one (k+1)-mer region twice so edge coverages differ
    val g = Dna.genome(Dna.GenomeSpec(200, longRepeats = 0, shortRepeats = 0), 30)
    val reads = TestGraphs.perfectReads(g, 40, k) :+ g.substring(50, 90)
    val contigs = assembleOnce(reads)
    assert(contigs.size == 1)
    assert(contigs.head.cov == 1L) // some edge is covered only once
  }

  test("contig IDs are valid contig-space IDs") {
    val g = Dna.genome(Dna.GenomeSpec(600, longRepeats = 2, longRepeatLen = 60), 31)
    val contigs = assembleOnce(TestGraphs.perfectReads(g, 40, k))
    assert(contigs.nonEmpty)
    for (c <- contigs) {
      assert(Ids.isContig(c.id))
      assert(!Ids.isFlipped(c.id))
    }
    assert(contigs.map(_.id).distinct.size == contigs.size)
  }

  test("merging with SV labels yields the same contig sequences as LR labels") {
    val g = Dna.genome(Dna.GenomeSpec(1500, longRepeats = 6, longRepeatLen = 90), 32)
    val ns  = TestGraphs.nodes(spark, TestGraphs.perfectReads(g, 40, k), k).cache()
    def canon(s: String) = Seq(s, Dna.rc(s)).min
    val viaLR = ContigMerging.merge(ns, ContigLabeling.labelLR(ns).labels, opts())
      .values.map(c => canon(c.seq.toString)).collect().sorted.toSeq
    val viaSV = ContigMerging.merge(ns, ContigLabeling.labelSV(ns).labels, opts())
      .values.map(c => canon(c.seq.toString)).collect().sorted.toSeq
    assert(viaLR == viaSV)
  }
}
