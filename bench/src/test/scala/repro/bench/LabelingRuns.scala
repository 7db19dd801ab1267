package repro.bench

import org.apache.spark.sql.SparkSession
import repro.dna.Datasets
import repro.exp.Tables

/** Shared, once-per-JVM labeling runs: Table II uses the round-1 rows,
  * Table III the round-2 rows — one pipeline execution feeds both.
  */
object LabelingRuns {
  private var cached: Option[Seq[Tables.LabelingPair]] = None

  def pairs(spark: SparkSession): Seq[Tables.LabelingPair] = synchronized {
    cached.getOrElse {
      val ps = Datasets.all.map { ds =>
        Console.err.println(s"[bench] labeling pipeline on ${ds.name} ...")
        Tables.labelingPair(spark, ds)
      }
      cached = Some(ps)
      ps
    }
  }
}
