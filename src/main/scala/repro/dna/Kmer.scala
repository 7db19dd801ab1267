package repro.dna

/** k-mer packing into 64-bit integers (paper §IV-A, Fig. 7).
  *
  * A k-mer (k <= 31) is encoded 2 bits per base (A=00, C=01, G=10, T=11),
  * first base in the highest-order occupied bits, right-aligned in the
  * 64-bit word with zero padding on the left. For (k+1)-mers with k = 31
  * all 64 bits are used, so canonical comparison is **unsigned**.
  *
  * Bit 63 marks non-k-mer IDs (NULL and contig IDs, Fig. 7b/7c); bit 62 is
  * the "flipped" marker used by bidirectional list ranking (§IV-B) and is
  * never part of a k-mer encoding (k <= 31 uses at most bits 0..61).
  */
object Kmer {

  /** Maximum supported k for k-mer vertex IDs. */
  val MaxK = 31

  /** Pack a base string (length <= 32) into a Long, first base high. */
  def pack(s: String): Long = {
    require(s.length <= 32, s"sequence too long to pack: ${s.length}")
    var x = 0L
    var i = 0
    while (i < s.length) { x = (x << 2) | Dna.code(s.charAt(i)).toLong; i += 1 }
    x
  }

  /** Unpack a Long into a base string of length k. */
  def unpack(x: Long, k: Int): String = {
    val sb = new StringBuilder(k)
    var i = k - 1
    while (i >= 0) { sb.append(Dna.char(((x >>> (2 * i)) & 3L).toInt)); i -= 1 }
    sb.toString
  }

  /** Base code at position i (0 = first/leftmost base) of a packed k-mer. */
  def baseAt(x: Long, k: Int, i: Int): Int = ((x >>> (2 * (k - 1 - i))) & 3L).toInt

  /** Reverse complement of a packed k-mer. */
  def rc(x: Long, k: Int): Long = {
    var out = 0L
    var i = 0
    while (i < k) {
      val b = (x >>> (2 * i)) & 3L // base k-1-i (from the right)
      out = (out << 2) | (b ^ 3L)
      i += 1
    }
    out
  }

  /** Canonical form: unsigned-min of the k-mer and its reverse complement. */
  def canonical(x: Long, k: Int): Long = {
    val r = rc(x, k)
    if (java.lang.Long.compareUnsigned(x, r) <= 0) x else r
  }

  /** True iff the packed k-mer is its own canonical form (label L). */
  def isCanonical(x: Long, k: Int): Boolean = canonical(x, k) == x

  /** Prefix k-mer of a packed (k+1)-mer: drop the last base. */
  def prefix(e: Long): Long = e >>> 2

  /** Suffix k-mer of a packed (k+1)-mer: drop the first base (keep low 2k bits). */
  def suffix(e: Long, k: Int): Long = e & mask(k)

  /** Low 2k-bit mask. */
  def mask(k: Int): Long = if (k >= 32) -1L else (1L << (2 * k)) - 1

  /** Append a base to a packed k-mer, dropping the first base (slide right). */
  def slideRight(x: Long, k: Int, b: Int): Long = ((x << 2) | b.toLong) & mask(k)

  /** Extend a packed k-mer by one base on the right into a (k+1)-mer. */
  def extend(x: Long, b: Int): Long = (x << 2) | b.toLong
}
