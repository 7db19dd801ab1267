package repro.core

import repro.SparkSpec
import repro.dna.{Dna, ReadSim}
import repro.quality.Quast

class AssemblerSpec extends SparkSpec {

  val k = 15
  def opts(theta: Long = 1, method: ContigLabeling.Method = ContigLabeling.LR) =
    Assembler.Opts(k = k, theta = theta, tipLen = 80, bubbleEditThr = 5, method = method)

  val genome = Dna.genome(
    Dna.GenomeSpec(8000, longRepeats = 6, longRepeatLen = 80, shortRepeats = 0), 71)

  def noisyReads(coverage: Double, err: Double, seed: Long = 5) = {
    val spec = ReadSim.ReadSpec(readLen = 60,
      nReads = (genome.length * coverage / 60).toLong, errRate = err, nRate = 0.0005)
    ReadSim.reads(spark, genome, spec, seed)
  }

  test("error-free reads assemble the genome at ~full fraction") {
    val reads = TestGraphs.toDs(spark, TestGraphs.perfectReads(genome, 60, k))
    val res = Assembler.assemble(reads, opts(theta = 0))
    // minLen 50: keep the short inter-repeat contigs this 8 kb genome produces
    val rep = Quast.evaluate(res.sequences, Some(genome), k, minLen = 50)
    assert(rep.genomeFraction.exists(_ > 90.0), s"gf=${rep.genomeFraction}")
    assert(rep.misassemblies.contains(0L))
    assert(rep.mismatchesPer100kbp.contains(0.0))
  }

  test("noisy reads assemble with high genome fraction and few mismatches") {
    val res = Assembler.assemble(noisyReads(20, 0.01), opts(theta = 1))
    val rep = Quast.evaluate(res.sequences, Some(genome), k, minLen = 200)
    assert(rep.genomeFraction.exists(_ > 70.0), s"gf=${rep.genomeFraction}")
    assert(rep.mismatchesPer100kbp.exists(_ < 200.0), s"mm=${rep.mismatchesPer100kbp}")
  }

  test("the second merge round does not reduce N50 (paper: it roughly doubles)") {
    val res = Assembler.assemble(noisyReads(20, 0.01), opts(theta = 1))
    def n50of(c: org.apache.spark.rdd.RDD[(Long, Node)]) =
      Quast.n50(c.values.map(_.seqLen.toLong).collect().toSeq)
    assert(n50of(res.finalContigs) >= n50of(res.round1Contigs))
  }

  test("error correction shrinks the graph (paper's in-text vertex counts)") {
    val res = Assembler.assemble(noisyReads(20, 0.01), opts(theta = 1))
    assert(res.graph2Vertices < res.dbgVertices,
      s"${res.graph2Vertices} vs ${res.dbgVertices}")
    assert(res.labeling2.isDefined && res.tipStats.isDefined)
  }

  test("errorCorrection=false returns the round-1 contigs as final") {
    val reads = noisyReads(15, 0.005)
    val res = Assembler.assemble(reads, opts().copy(errorCorrection = false))
    assert(res.finalContigs.count() == res.round1Contigs.count())
    assert(res.labeling2.isEmpty && res.tipStats.isEmpty)
  }

  test("LR and SV produce the same final assembly") {
    val reads = noisyReads(15, 0.01, seed = 9).cache()
    def canon(s: String) = Seq(s, Dna.rc(s)).min
    val a = Assembler.assemble(reads, opts(method = ContigLabeling.LR))
      .sequences.map(canon).collect().sorted.toSeq
    val b = Assembler.assemble(reads, opts(method = ContigLabeling.SV))
      .sequences.map(canon).collect().sorted.toSeq
    assert(a == b)
  }

  test("with theta=0, tips and bubbles from errors are corrected away") {
    // sparse errors, no theta filter: error branches enter the DBG and must
    // be cleaned by merge-time tip drop + bubble filter + tip removal
    val res = Assembler.assemble(noisyReads(20, 0.0005, seed = 11), opts(theta = 0))
    val rep = Quast.evaluate(res.sequences, Some(genome), k, minLen = 100)
    assert(rep.genomeFraction.exists(_ > 60.0), s"gf=${rep.genomeFraction}")
    assert(rep.misassemblies.contains(0L))
    // residual mismatches only where an error path survived filtering
    assert(rep.mismatchesPer100kbp.exists(_ < 500.0), s"mm=${rep.mismatchesPer100kbp}")
  }

  test("final contigs carry sequences, not placeholders") {
    val res = Assembler.assemble(noisyReads(15, 0.01, seed = 13), opts())
    val seqs = res.sequences.collect()
    assert(seqs.nonEmpty)
    assert(seqs.forall(s => s.nonEmpty && s.forall(c => "ACGT".contains(c))))
  }
}
