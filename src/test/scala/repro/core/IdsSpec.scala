package repro.core

import org.scalatest.funsuite.AnyFunSuite
import repro.dna.Kmer

class IdsSpec extends AnyFunSuite {

  test("NULL is MSB-only (paper Fig 7b)") {
    assert(Ids.NULL == java.lang.Long.MIN_VALUE)
    assert(java.lang.Long.toBinaryString(Ids.NULL) == "1" + "0" * 63)
  }

  test("flip sets bit 62; strip removes it; involution-free") {
    val id = Kmer.pack("ACGTACGTACG")
    assert(!Ids.isFlipped(id))
    val f = Ids.flip(id)
    assert(Ids.isFlipped(f))
    assert(Ids.strip(f) == id)
    assert(Ids.flip(f) == f)
    assert(Ids.strip(id) == id)
  }

  test("bit 62 is free in any k-mer ID (k <= 31)") {
    val maxKmer = Kmer.pack("T" * 31)
    assert((maxKmer & (1L << 62)) == 0)
    assert((maxKmer & (1L << 63)) == 0)
  }

  test("contig IDs: worker high, sequence low, MSB set (paper Fig 7c)") {
    val id = Ids.contigId(5, 17)
    assert(id < 0) // MSB set
    assert(((id >>> 32) & 0x3FFFFFFFL) == 5)
    assert((id & 0xFFFFFFFFL) == 17)
  }

  test("contig IDs never collide with NULL (sequence numbers start at 1)") {
    intercept[IllegalArgumentException](Ids.contigId(0, 0))
    assert(Ids.contigId(0, 1) != Ids.NULL)
  }

  test("contig IDs keep bit 62 free for flipping") {
    val id = Ids.contigId((1 << 30) - 1, (1L << 32) - 1)
    assert(!Ids.isFlipped(id))
    assert(Ids.strip(Ids.flip(id)) == id)
  }

  test("isContig / isKmer classification") {
    assert(Ids.isKmer(Kmer.pack("ACGTT")))
    assert(Ids.isKmer(Ids.flip(Kmer.pack("ACGTT"))))
    assert(Ids.isContig(Ids.contigId(3, 9)))
    assert(!Ids.isContig(Ids.NULL))
    assert(!Ids.isKmer(Ids.contigId(3, 9)))
  }

  test("contigId rejects out-of-range inputs") {
    intercept[IllegalArgumentException](Ids.contigId(-1, 1))
    intercept[IllegalArgumentException](Ids.contigId(1 << 30, 1))
    intercept[IllegalArgumentException](Ids.contigId(0, 1L << 32))
  }
}
