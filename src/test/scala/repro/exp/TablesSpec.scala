package repro.exp

import org.scalatest.funsuite.AnyFunSuite
import repro.pregel.PregelStats
import repro.quality.Quast

class TablesSpec extends AnyFunSuite {

  test("printTable1 renders one row per dataset") {
    val out = Tables.printTable1(Seq(
      Tables.DatasetRow("HC2", "Homo Sapiens Chromosome 2", 24000, 100.0, 240000)))
    assert(out.contains("HC2"))
    assert(out.contains("24000"))
    assert(out.contains("240000"))
  }

  test("printLabelingTable renders stats columns") {
    val row = Tables.LabelingRow("BI",
      PregelStats(23, 15973779L, 37200L), PregelStats(39, 32961935L, 43430L),
      graphxMillis = 12010L, vertices = 671419L, unambiguous = 665408L)
    val out = Tables.printLabelingTable("T", Seq(row))
    assert(out.contains("BI"))
    assert(out.contains("23") && out.contains("39"))
    assert(out.contains("15973779") && out.contains("32961935"))
  }

  test("printQualityTable renders reference metrics only when asked") {
    val rep = Quast.Report(10, 1000, 200, 400, 41.0,
      Some(1), Some(30), Some(5), Some(80.0), Some(0.5), Some(0.0), Some(390))
    val rows = Seq(Tables.QualityRow("PPA", rep))
    val withRef = Tables.printQualityTable("T", rows, withReference = true)
    val noRef   = Tables.printQualityTable("T", rows, withReference = false)
    assert(withRef.contains("Genome fraction"))
    assert(!noRef.contains("Genome fraction"))
    assert(noRef.contains("N50"))
  }

  test("paper parameter defaults are wired through") {
    assert(Tables.K == 31)
    assert(Tables.TipLen == 80)
    assert(Tables.BubbleThr == 5)
    val o = Tables.ppaOpts()
    assert(o.k == 31 && o.tipLen == 80 && o.bubbleEditThr == 5 && o.errorCorrection)
  }

  test("PregelStats accumulate with +") {
    val s = PregelStats(2, 10, 100) + PregelStats(3, 5, 50)
    assert(s == PregelStats(5, 15, 150))
  }
}
