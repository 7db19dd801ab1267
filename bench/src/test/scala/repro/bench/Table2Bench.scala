package repro.bench

import repro.SparkSpec
import repro.exp.Tables

/** Table II -- LR vs S-V for labeling unambiguous k-mers.
  *
  * Paper (16-machine cluster, full-size data):
  *   HC-X:  LR 26 SS / 2,325M msgs /  93s   S-V 86 SS /  5,913M msgs / 212s
  *   HC-2:  LR 28 SS / 1,498M msgs /  58s   S-V 93 SS /  3,644M msgs / 128s
  *   HC-14: LR 67 SS / 2,342M msgs / 213s   S-V 93 SS /  6,852M msgs / 415s
  *   BI:    LR 60 SS / 6,705M msgs / 239s   S-V 86 SS / 22,958M msgs / 723s
  * Shape to reproduce: LR < S-V on supersteps, messages and runtime, on
  * every dataset. (GraphX-CC column: capped at 30 iterations — lower bound.)
  */
class Table2Bench extends SparkSpec {

  test("Table II -- LR vs S-V for labeling unambiguous k-mers") {
    val rows = LabelingRuns.pairs(spark).map(_.round1)
    println(Tables.printLabelingTable(
      "Table II -- LR vs S-V, labeling unambiguous k-mers", rows))

    for (r <- rows) {
      assert(r.lr.supersteps < r.sv.supersteps,
        s"${r.dataset}: LR supersteps ${r.lr.supersteps} !< SV ${r.sv.supersteps}")
      assert(r.lr.messages < r.sv.messages,
        s"${r.dataset}: LR messages ${r.lr.messages} !< SV ${r.sv.messages}")
      // wall time at local[*] scale is dominated by per-superstep Spark
      // scheduling noise (see EXPERIMENTS.md); supersteps/messages above are
      // the decisive columns, the time check only guards gross regressions
      assert(r.lr.millis < 1.3 * r.sv.millis,
        s"${r.dataset}: LR time ${r.lr.millis} not < 1.3x SV ${r.sv.millis}")
      // PPA bound: supersteps are logarithmic in graph size
      val logN = 64 - java.lang.Long.numberOfLeadingZeros(math.max(2, r.vertices))
      assert(r.lr.supersteps <= 2 * logN + 12, s"${r.dataset}: LR not logarithmic")
      assert(r.sv.supersteps <= 9 * logN + 12, s"${r.dataset}: SV not logarithmic")
    }
  }
}
