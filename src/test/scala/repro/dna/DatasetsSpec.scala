package repro.dna

import repro.SparkSpec

class DatasetsSpec extends SparkSpec {

  test("the four paper datasets exist in size order of Table I roles") {
    assert(Datasets.all.map(_.name) == Seq("HCX", "HC2", "HC14", "BI"))
  }

  test("reference lengths follow the ~1/200 scaling of DESIGN.md") {
    assert(Datasets.HC2.genomeSpec.length == 240000)
    assert(Datasets.HCX.genomeSpec.length == 480000)
    assert(Datasets.HC14.genomeSpec.length == 220000)
    assert(Datasets.BI.genomeSpec.length == 600000)
  }

  test("read lengths match the paper's Table I") {
    assert(Datasets.HC2.readSpec.readLen == 100)
    assert(Datasets.HCX.readSpec.readLen == 100)
    assert(Datasets.HC14.readSpec.readLen == 101)
    assert(Datasets.BI.readSpec.readLen == 155)
  }

  test("genomes are deterministic and GC tracks the human-like 41%") {
    val g1 = Datasets.HC2.genome
    val g2 = Datasets.HC2.genome
    assert(g1 == g2)
    val gc = Dna.gcCount(g1).toDouble / g1.length
    assert(math.abs(gc - 0.41) < 0.02, s"gc=$gc")
  }

  test("read sets have the configured cardinality") {
    val n = Datasets.HC14.reads(spark, partitions = 8).count()
    assert(n == Datasets.HC14.readSpec.nReads)
  }

  test("each dataset uses a distinct seed (distinct genomes)") {
    val genomes = Datasets.all.map(_.genome.substring(0, 1000)).toSet
    assert(genomes.size == 4)
  }
}
