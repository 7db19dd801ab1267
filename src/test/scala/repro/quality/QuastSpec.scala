package repro.quality

import repro.SparkSpec
import repro.dna.Dna

class QuastSpec extends SparkSpec {

  val ref = Dna.genome(Dna.GenomeSpec(8000, longRepeats = 2, longRepeatLen = 120), 55)
  val k = 31

  def eval(contigs: Seq[String], withRef: Boolean = true, minLen: Int = 500): Quast.Report =
    Quast.evaluate(spark.sparkContext.parallelize(contigs, 2),
                   if (withRef) Some(ref) else None, k, minLen)

  test("n50: textbook cases") {
    assert(Quast.n50(Seq.empty) == 0)
    assert(Quast.n50(Seq(10)) == 10)
    // total 20; 8+7=15 >= 10 at 7
    assert(Quast.n50(Seq(2, 3, 8, 7)) == 7)
    // equal halves: the larger one reaches half first
    assert(Quast.n50(Seq(5, 5)) == 5)
  }

  test("oracle: n50 matches a DuckDB window-function formulation") {
    import spark.implicits._
    val lengths = Seq(120L, 800L, 560L, 90L, 1500L, 700L, 700L)
    val ours = Quast.n50(lengths)
    val oursDf = Seq(ours).toDF("n50")
    repro.Oracle.assertEquivalent(
      oursDf,
      """SELECT MAX(l) AS n50 FROM (
        |  SELECT CAST(len AS BIGINT) AS l,
        |         SUM(CAST(len AS BIGINT)) OVER (ORDER BY CAST(len AS BIGINT) DESC) AS run,
        |         SUM(CAST(len AS BIGINT)) OVER () AS tot
        |  FROM lengths) WHERE run * 2 >= tot""".stripMargin,
      "lengths" -> lengths.toDF("len"))
  }

  test("contigs below minLen are excluded from all metrics") {
    val r = eval(Seq(ref.substring(0, 1000), ref.substring(2000, 2400)))
    assert(r.nContigs == 1)
    assert(r.totalLength == 1000)
  }

  test("an exact substring aligns fully with zero mismatches") {
    val r = eval(Seq(ref.substring(100, 1600)))
    assert(r.misassemblies.contains(0L))
    assert(r.unalignedLength.contains(0L))
    assert(r.mismatchesPer100kbp.contains(0.0))
    assert(r.largestAlignment.contains(1500L))
  }

  test("a reverse-complemented contig aligns just as well") {
    val r = eval(Seq(Dna.rc(ref.substring(100, 1600))))
    assert(r.misassemblies.contains(0L))
    assert(r.unalignedLength.contains(0L))
    assert(r.mismatchesPer100kbp.contains(0.0))
  }

  test("substitutions are counted as mismatches") {
    val c = ref.substring(100, 1100).toCharArray
    c(500) = Dna.complement(c(500)) // guaranteed different base
    val r = eval(Seq(new String(c)))
    assert(r.misassemblies.contains(0L))
    val perK = r.mismatchesPer100kbp.get
    assert(math.abs(perK - 100000.0 / 1000.0) < 11.0, s"perK=$perK")
  }

  test("a chimeric contig (two distant loci welded) is a misassembly") {
    val chimera = ref.substring(100, 700) + ref.substring(5000, 5600)
    val r = eval(Seq(chimera))
    assert(r.misassemblies.contains(1L))
    assert(r.misassembledLength.contains(1200L))
    // both halves still align and cover the reference
    assert(r.genomeFraction.exists(_ > 10.0))
  }

  test("random sequence is unaligned") {
    val junk = Dna.genome(Dna.GenomeSpec(800), 1234)
    val r = eval(Seq(junk, ref.substring(0, 800)))
    assert(r.unalignedLength.exists(_ >= 700L))
  }

  test("genome fraction reflects covered reference bases") {
    val r = eval(Seq(ref.substring(0, 4000)))
    val gf = r.genomeFraction.get
    assert(math.abs(gf - 50.0) < 2.0, s"gf=$gf")
  }

  test("GC percentage is computed over kept contigs") {
    val r = eval(Seq("G" * 600, "A" * 600))
    assert(math.abs(r.gcPct - 50.0) < 1e-9)
  }

  test("reference-free evaluation reports only assembly statistics") {
    val r = eval(Seq(ref.substring(0, 900), ref.substring(1000, 2500)), withRef = false)
    assert(r.nContigs == 2)
    assert(r.largestContig == 1500)
    assert(r.n50 == 1500)
    assert(r.misassemblies.isEmpty && r.genomeFraction.isEmpty)
  }

  test("largest alignment tracks the biggest single block") {
    val chimera = ref.substring(100, 1300) + ref.substring(5000, 5400)
    val r = eval(Seq(chimera))
    val la = r.largestAlignment.get
    assert(la >= 1100 && la <= 1300, s"la=$la")
  }

  test("contigs spanning a planted repeat still align to one diagonal") {
    // long repeats are exact copies, so every seed also hits the true locus
    val r = eval(Seq(ref.substring(0, 6000)))
    assert(r.misassemblies.contains(0L))
    assert(r.mismatchesPer100kbp.contains(0.0))
  }
}
