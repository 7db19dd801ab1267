package repro.bench

import repro.SparkSpec
import repro.exp.Tables

/** Table I — dataset statistics (paper: HC-2 4.81M x 100bp / 48.17Mbp, HC-X
  * 9.26M x 100bp / 96.30Mbp, HC-14 18.25M x 101bp, BI 151.55M x 155bp; ours
  * are the ~1/200-scale synthetic equivalents of DESIGN.md §2).
  */
class Table1Bench extends SparkSpec {

  test("Table I — datasets") {
    val rows = Tables.table1(spark)
    println(Tables.printTable1(rows))

    val byName = rows.map(r => r.name -> r).toMap
    // cardinalities and lengths must match the specs exactly
    assert(byName("HC2").nReads == 48000 && byName("HC2").refLen == 240000)
    assert(byName("HCX").nReads == 96000 && byName("HCX").refLen == 480000)
    assert(byName("HC14").nReads == 43500 && byName("HC14").refLen == 220000)
    assert(byName("BI").nReads == 116000 && byName("BI").refLen == 600000)
    // read lengths as in the paper's Table I
    assert(byName("HC2").avgReadLen == 100.0)
    assert(byName("HC14").avgReadLen == 101.0)
    assert(byName("BI").avgReadLen == 155.0)
    // paper's size ordering: BI is the largest data volume
    assert(rows.map(r => (r.nReads * r.avgReadLen)).max ==
           byName("BI").nReads * byName("BI").avgReadLen)
  }
}
