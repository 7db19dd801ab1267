package repro.bench

import repro.SparkSpec
import repro.exp.Tables

/** Table V -- sequencing quality on HC-14 (no reference used, as in the
  * paper: GAGE's HC-14 ships without one).
  *
  * Paper (HC-14):                   PPA      ABySS     Ray      SWAP
  *   # contigs                      41,445   18,008    45,984   47,252
  *   Total length                   62.7M    26.6M     63.5M    63.8M
  *   N50                             1,891    1,847     1,641    1,605
  *   Largest contig                 16,069   15,744    15,116   13,251
  * Shape to reproduce: PPA has the highest N50 and largest contig.
  */
class Table5Bench extends SparkSpec {

  test("Table V -- quality comparison on HC-14") {
    val rows = Tables.table5(spark)
    println(Tables.printQualityTable("Table V -- quality on HC-14 (simulated)",
      rows, withReference = false))

    val by = rows.map(r => r.assembler -> r.report).toMap
    val ppa = by("PPA")
    assert(ppa.n50 >= by("ABySS").n50)
    assert(ppa.n50 >= by("Ray").n50)
    assert(ppa.largestContig >= by("Ray").largestContig)
    assert(rows.forall(_.report.nContigs > 0), "every assembler produces contigs")
    // reference-free: no alignment metrics reported
    assert(rows.forall(_.report.genomeFraction.isEmpty))
  }
}
