package repro.core

import repro.{Oracle, SparkSpec}
import repro.dna.Dna

/** Extra DuckDB oracle checks over the relational summaries the pipeline
  * and the benches compute.
  */
class OracleStatsSpec extends SparkSpec {

  val k = 15

  lazy val contigLens: Seq[Long] = {
    val g = Dna.genome(Dna.GenomeSpec(2500, longRepeats = 8, longRepeatLen = 90), 61)
    val ns = TestGraphs.nodes(spark, TestGraphs.perfectReads(g, 40, k), k).cache()
    val lab = ContigLabeling.labelLR(ns)
    ContigMerging.merge(ns, lab.labels, ContigMerging.Opts(k, dropDanglingShort = false))
      .values.map(_.seqLen.toLong).collect().toSeq
  }

  test("oracle: contig count and total length match DuckDB aggregates") {
    import spark.implicits._
    val lensDf = contigLens.toDF("len")
    val agg = lensDf.selectExpr("COUNT(*) AS n", "SUM(len) AS total")
    Oracle.assertEquivalent(
      agg,
      "SELECT COUNT(*) AS n, SUM(CAST(len AS BIGINT)) AS total FROM lens",
      "lens" -> lensDf)
  }

  test("oracle: QUAST-style minimum-length filter matches DuckDB") {
    import spark.implicits._
    val lensDf = contigLens.toDF("len")
    val kept = lensDf.filter("len >= 100").selectExpr("COUNT(*) AS n")
    Oracle.assertEquivalent(
      kept,
      "SELECT COUNT(*) AS n FROM lens WHERE CAST(len AS BIGINT) >= 100",
      "lens" -> lensDf)
  }

  test("oracle: per-dataset read-length stats match DuckDB") {
    import spark.implicits._
    val reads = repro.SynthData.dnaReads(spark, sf = 0.02, readLen = 80, coverage = 4.0)
    val stats = reads.selectExpr("COUNT(*) AS n", "MIN(LENGTH(read)) AS minl",
                                 "MAX(LENGTH(read)) AS maxl")
    Oracle.assertEquivalent(
      stats,
      "SELECT COUNT(*) AS n, MIN(LENGTH(read)) AS minl, MAX(LENGTH(read)) AS maxl FROM reads",
      "reads" -> reads)
  }

  test("oracle: bubble-group sizes match a DuckDB GROUP BY over end pairs") {
    import spark.implicits._
    // contigs keyed by (left, right) ambiguous ends, as bubble filtering does
    val rows = Seq((1L, 2L), (1L, 2L), (2L, 3L), (1L, 2L), (4L, 5L))
      .toDF("nb1", "nb2")
    val grouped = rows.groupBy("nb1", "nb2").count()
      .selectExpr("nb1", "nb2", "count AS cnt")
    Oracle.assertEquivalent(
      grouped,
      "SELECT nb1, nb2, COUNT(*) AS cnt FROM pairs GROUP BY nb1, nb2",
      "pairs" -> rows)
  }
}
