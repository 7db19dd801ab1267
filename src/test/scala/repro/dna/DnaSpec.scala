package repro.dna

import org.scalatest.funsuite.AnyFunSuite
import scala.util.Random

class DnaSpec extends AnyFunSuite {

  def randomSeq(rnd: Random, len: Int): String =
    (0 until len).map(_ => "ACGT"(rnd.nextInt(4))).mkString

  test("code/char roundtrip for all bases") {
    for (c <- "ACGT") assert(Dna.char(Dna.code(c)) == c)
  }

  test("codes follow the paper's Fig 7a encoding: A=0 C=1 G=2 T=3") {
    assert(Dna.code('A') == 0); assert(Dna.code('C') == 1)
    assert(Dna.code('G') == 2); assert(Dna.code('T') == 3)
  }

  test("complement pairs: A<->T, C<->G") {
    assert(Dna.complement('A') == 'T'); assert(Dna.complement('T') == 'A')
    assert(Dna.complement('C') == 'G'); assert(Dna.complement('G') == 'C')
  }

  test("complementCode is bitwise negation within 2 bits") {
    for (b <- 0 to 3) assert(Dna.complementCode(b) == (b ^ 3))
  }

  test("rc of the paper's strand-1 example gives strand 2 read 5'-to-3'") {
    // Fig 3: strand 1 "ATTGCAAGTC" -> strand 2 read left is "GACTTGCAAT"
    assert(Dna.rc("ATTGCAAGTC") == "GACTTGCAAT")
  }

  test("rc is an involution") {
    val rnd = new Random(1)
    for (_ <- 1 to 200) {
      val s = randomSeq(rnd, 1 + rnd.nextInt(50))
      assert(Dna.rc(Dna.rc(s)) == s)
    }
  }

  test("rc reverses and complements") {
    assert(Dna.rc("A") == "T")
    assert(Dna.rc("AC") == "GT")
    assert(Dna.rc("AAGT") == "ACTT") // Fig 6: read 4 on strand 2
  }

  test("gcCount") {
    assert(Dna.gcCount("GGCC") == 4)
    assert(Dna.gcCount("ATAT") == 0)
    assert(Dna.gcCount("ACGT") == 2)
  }

  test("code rejects non-bases") {
    intercept[IllegalArgumentException](Dna.code('N'))
  }

  test("genome has the requested length and is deterministic") {
    val spec = Dna.GenomeSpec(5000)
    val g1 = Dna.genome(spec, 7)
    val g2 = Dna.genome(spec, 7)
    assert(g1.length == 5000)
    assert(g1 == g2)
    assert(Dna.genome(spec, 8) != g1)
  }

  test("genome GC fraction tracks the spec") {
    val g = Dna.genome(Dna.GenomeSpec(50000, gc = 0.41), 3)
    val gc = Dna.gcCount(g).toDouble / g.length
    assert(math.abs(gc - 0.41) < 0.02, s"gc=$gc")
  }

  test("genome contains only ACGT") {
    val g = Dna.genome(Dna.GenomeSpec(2000, longRepeats = 2, shortRepeats = 2), 5)
    assert(g.forall(c => "ACGT".contains(c)))
  }

  test("planted long repeats duplicate a k-sized window") {
    val g = Dna.genome(Dna.GenomeSpec(20000, longRepeats = 4, longRepeatLen = 300), 11)
    // some 31-mer must appear at least twice (forward or reverse complement)
    val k = 31
    val seen = scala.collection.mutable.HashSet[String]()
    var dup = false
    for (i <- 0 to g.length - k if !dup) {
      val s = g.substring(i, i + k)
      val canon = Seq(s, Dna.rc(s)).min
      if (!seen.add(canon)) dup = true
    }
    assert(dup, "expected at least one repeated canonical 31-mer")
  }

  test("genome without repeats has (mostly) unique 31-mers") {
    val g = Dna.genome(Dna.GenomeSpec(5000, longRepeats = 0, shortRepeats = 0), 13)
    val k = 31
    val all = (0 to g.length - k).map(i => g.substring(i, i + k))
    assert(all.distinct.size == all.size)
  }
}
