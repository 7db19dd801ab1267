package repro.dna

import org.scalatest.funsuite.AnyFunSuite
import scala.util.Random

class KmerSpec extends AnyFunSuite {

  def randomSeq(rnd: Random, len: Int): String =
    (0 until len).map(_ => "ACGT"(rnd.nextInt(4))).mkString

  test("paper Fig 7a: ID of 5-mer ATTGC") {
    // A T T G C = 00 11 11 10 01 right-aligned = 0b0011111001 = 249
    assert(Kmer.pack("ATTGC") == 249L)
  }

  test("pack/unpack roundtrip over random k-mers") {
    val rnd = new Random(2)
    for (_ <- 1 to 300) {
      val k = 1 + rnd.nextInt(31)
      val s = randomSeq(rnd, k)
      assert(Kmer.unpack(Kmer.pack(s), k) == s)
    }
  }

  test("pack orders k-mers lexicographically (unsigned)") {
    val rnd = new Random(3)
    for (_ <- 1 to 200) {
      val k = 1 + rnd.nextInt(31)
      val a = randomSeq(rnd, k); val b = randomSeq(rnd, k)
      assert((a < b) == (java.lang.Long.compareUnsigned(Kmer.pack(a), Kmer.pack(b)) < 0))
    }
  }

  test("baseAt reads bases left to right") {
    val s = "ATTGC"
    val x = Kmer.pack(s)
    for (i <- s.indices) assert(Dna.char(Kmer.baseAt(x, s.length, i)) == s.charAt(i))
  }

  test("rc agrees with string reverse complement") {
    val rnd = new Random(4)
    for (_ <- 1 to 300) {
      val k = 1 + rnd.nextInt(31)
      val s = randomSeq(rnd, k)
      assert(Kmer.unpack(Kmer.rc(Kmer.pack(s), k), k) == Dna.rc(s))
    }
  }

  test("rc is an involution on packed form") {
    val rnd = new Random(5)
    for (_ <- 1 to 100) {
      val k = 1 + rnd.nextInt(31)
      val x = Kmer.pack(randomSeq(rnd, k))
      assert(Kmer.rc(Kmer.rc(x, k), k) == x)
    }
  }

  test("canonical is the lexicographically smaller of s and rc(s)") {
    val rnd = new Random(6)
    for (_ <- 1 to 300) {
      val k = 1 + rnd.nextInt(31)
      val s = randomSeq(rnd, k)
      val expect = Seq(s, Dna.rc(s)).min
      assert(Kmer.unpack(Kmer.canonical(Kmer.pack(s), k), k) == expect)
    }
  }

  test("canonical of GT with k=2 is AC (paper Fig 6)") {
    assert(Kmer.unpack(Kmer.canonical(Kmer.pack("GT"), 2), 2) == "AC")
  }

  test("canonical is invariant under rc") {
    val rnd = new Random(7)
    for (_ <- 1 to 200) {
      val k = 1 + rnd.nextInt(31)
      val x = Kmer.pack(randomSeq(rnd, k))
      assert(Kmer.canonical(x, k) == Kmer.canonical(Kmer.rc(x, k), k))
    }
  }

  test("no palindromic k-mers for odd k") {
    val rnd = new Random(8)
    for (_ <- 1 to 200) {
      val k = 1 + 2 * rnd.nextInt(16) // odd in [1,31]
      val x = Kmer.pack(randomSeq(rnd, k))
      assert(Kmer.rc(x, k) != x)
    }
  }

  test("canonical comparison is unsigned at 32 bases (k+1 with k=31)") {
    // "T"*32 packs to -1 (all ones); its rc is "A"*32 = 0, the canonical.
    val t32 = Kmer.pack("T" * 32)
    assert(t32 == -1L)
    assert(Kmer.canonical(t32, 32) == 0L)
  }

  test("prefix and suffix of a (k+1)-mer match string slicing") {
    val rnd = new Random(9)
    for (_ <- 1 to 200) {
      val k = 1 + rnd.nextInt(31)
      val s = randomSeq(rnd, k + 1)
      val e = Kmer.pack(s)
      assert(Kmer.unpack(Kmer.prefix(e), k) == s.substring(0, k))
      assert(Kmer.unpack(Kmer.suffix(e, k), k) == s.substring(1))
    }
  }

  test("slideRight drops the first base and appends") {
    val x = Kmer.pack("ACGTA")
    assert(Kmer.unpack(Kmer.slideRight(x, 5, Dna.code('T')), 5) == "CGTAT")
  }

  test("extend appends one base") {
    assert(Kmer.unpack(Kmer.extend(Kmer.pack("ACG"), Dna.code('T')), 4) == "ACGT")
  }

  test("mask(32) covers all 64 bits") {
    assert(Kmer.mask(32) == -1L)
    assert(Kmer.mask(31) == (1L << 62) - 1)
  }
}
