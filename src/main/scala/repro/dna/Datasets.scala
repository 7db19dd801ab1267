package repro.dna

import org.apache.spark.sql.{Dataset, SparkSession}

/** The four evaluation datasets of the paper (Table I), as scaled-down
  * synthetic equivalents (~1/200 of the originals — see DESIGN.md §2).
  *
  * Paper datasets: HC-2 and HC-X are ART-simulated reads over NCBI reference
  * chromosomes; HC-14 and BI are GAGE read sets without a usable reference.
  * Ours are generated over synthetic genomes with planted repeats; the HC-14
  * and BI references exist (read generation needs them) but, as in the
  * paper, Table V only reports reference-free metrics for HC-14.
  */
object Datasets {

  final case class DnaDataset(
      name: String,
      paperName: String,
      genomeSpec: Dna.GenomeSpec,
      readSpec: ReadSim.ReadSpec,
      seed: Long,
  ) {
    def genome: String = Dna.genome(genomeSpec, seed)
    def reads(spark: SparkSession, partitions: Int = 16): Dataset[String] =
      ReadSim.reads(spark, genome, readSpec, seed + 7, partitions)
  }

  private def spec(len: Int): Dna.GenomeSpec = Dna.GenomeSpec(
    length = len,
    gc = 0.41,
    longRepeats = len / 8000,  // genuinely ambiguous vertices (all assemblers)
    longRepeatLen = 300,
    shortRepeats = len / 3000, // (k-1)-mer-only repeats: ABySS false probe edges
    shortRepeatLen = 30,       // == k-1 for k=31
  )

  // Coverage note: the paper's HC-2/HC-X read sets are ~10x, but at 1/200
  // scale a 10x Poisson draw leaves theta-filtered (k+1)-mer coverage gaps
  // every few hundred bases, and assemblies then measure generator noise
  // rather than algorithm differences (ABySS's probe edges even *bridge*
  // the gaps). ~20x restores the paper's gap-free regime; read lengths are
  // kept identical to Table I.

  /** HC-2: paper 48.17 Mbp reference, 4.81 M x 100 bp reads. */
  val HC2: DnaDataset = DnaDataset(
    "HC2", "Homo Sapiens Chromosome 2",
    spec(240000), ReadSim.ReadSpec(readLen = 100, nReads = 48000), seed = 42)

  /** HC-X: paper 96.30 Mbp reference, 9.26 M x 100 bp reads. */
  val HCX: DnaDataset = DnaDataset(
    "HCX", "Homo Sapiens Chromosome X",
    spec(480000), ReadSim.ReadSpec(readLen = 100, nReads = 96000), seed = 43)

  /** HC-14: paper 18.25 M x 101 bp GAGE reads (~21x over ~88 Mbp). */
  val HC14: DnaDataset = DnaDataset(
    "HC14", "Human Chromosome 14",
    spec(220000), ReadSim.ReadSpec(readLen = 101, nReads = 43500), seed = 44)

  /** BI: paper 151.55 M x 155 bp GAGE reads (Bombus Impatiens). */
  val BI: DnaDataset = DnaDataset(
    "BI", "Bombus Impatiens",
    spec(600000), ReadSim.ReadSpec(readLen = 155, nReads = 116000), seed = 45)

  /** Table ordering used in the paper's benchmark tables. */
  val all: Seq[DnaDataset] = Seq(HCX, HC2, HC14, BI)
}
