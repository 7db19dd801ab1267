package repro.dna

import scala.util.Random

/** Nucleotide alphabet utilities and a synthetic genome generator.
  *
  * Encoding follows the paper (Fig. 7a): A=00, C=01, G=10, T=11. With this
  * encoding, the complement of a base is its bitwise negation within 2 bits
  * (`b ^ 3`) and lexicographic order on sequences equals numeric order on
  * the packed representation.
  */
object Dna {

  /** 2-bit code for a base character. */
  def code(c: Char): Int = c match {
    case 'A' => 0
    case 'C' => 1
    case 'G' => 2
    case 'T' => 3
    case other => throw new IllegalArgumentException(s"not a base: $other")
  }

  /** Base character for a 2-bit code. */
  def char(b: Int): Char = b match {
    case 0 => 'A'
    case 1 => 'C'
    case 2 => 'G'
    case 3 => 'T'
    case other => throw new IllegalArgumentException(s"not a 2-bit code: $other")
  }

  /** Complement of a 2-bit base code: A<->T, C<->G. */
  def complementCode(b: Int): Int = b ^ 3

  /** Complement of a base character. */
  def complement(c: Char): Char = char(complementCode(code(c)))

  /** Reverse complement of a sequence string (the paper's rc(s)). */
  def rc(s: String): String = {
    val sb = new StringBuilder(s.length)
    var i = s.length - 1
    while (i >= 0) { sb.append(complement(s.charAt(i))); i -= 1 }
    sb.toString
  }

  /** Number of G/C bases in a sequence. */
  def gcCount(s: String): Long = s.count(c => c == 'G' || c == 'C').toLong

  /** Parameters for the synthetic genome generator.
    *
    * @param length        total genome length in bases
    * @param gc            target GC fraction (paper datasets ~0.41)
    * @param longRepeats   number of planted long repeats; each copies an
    *                      earlier segment (possibly reverse-complemented),
    *                      creating genuinely ambiguous DBG vertices
    * @param longRepeatLen length of each long repeat
    * @param shortRepeats  number of planted short repeats of length
    *                      `shortRepeatLen`; with shortRepeatLen in [k-1, k)
    *                      these share (k-1)-mers but no k-mers, which creates
    *                      ABySS-style false probe edges only
    * @param shortRepeatLen length of each short repeat
    */
  final case class GenomeSpec(
      length: Int,
      gc: Double = 0.41,
      longRepeats: Int = 0,
      longRepeatLen: Int = 400,
      shortRepeats: Int = 0,
      shortRepeatLen: Int = 30,
  )

  /** Generate a synthetic genome, deterministic in (spec, seed).
    *
    * The genome is built left to right from iid GC-weighted bases; at
    * randomly chosen positions a copy of an earlier segment is spliced in
    * (50% reverse-complemented), planting exact repeats.
    */
  def genome(spec: GenomeSpec, seed: Long): String = {
    val rnd = new Random(seed)
    val sb  = new StringBuilder(spec.length)
    def randomBase(): Char = {
      val r = rnd.nextDouble()
      if (r < spec.gc / 2) 'G'
      else if (r < spec.gc) 'C'
      else if (r < spec.gc + (1 - spec.gc) / 2) 'A'
      else 'T'
    }
    // Repeat insertion points, spread uniformly after a random-prefix warmup.
    val warmup = math.max(spec.longRepeatLen * 2, spec.length / 10)
    val inserts: List[(Int, Int)] = // (insertAt, repeatLen); sorted by position
      (List.fill(spec.longRepeats)(spec.longRepeatLen) ++
        List.fill(spec.shortRepeats)(spec.shortRepeatLen))
        .map(len => (warmup + rnd.nextInt(math.max(1, spec.length - warmup)), len))
        .sortBy(_._1)
    var pending = inserts
    while (sb.length < spec.length) {
      pending match {
        case (at, len) :: rest if sb.length >= at && sb.length >= len + 1 =>
          val src  = rnd.nextInt(sb.length - len)
          val copy = sb.substring(src, src + len)
          sb.append(if (rnd.nextBoolean()) rc(copy) else copy)
          pending = rest
        case _ =>
          sb.append(randomBase())
      }
    }
    sb.substring(0, spec.length)
  }
}
