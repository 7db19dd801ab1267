package repro.core

/** Vertex ID scheme (paper §IV-A, Fig. 7).
  *
  * - k-mer vertex: the 2-bit-packed sequence, right-aligned; bits 62..63
  *   are 0 (k <= 31).
  * - NULL (dummy dead-end neighbour): bit 63 set, all others 0 (Fig. 7b).
  * - contig vertex: bit 63 set, worker index in bits 32..61, per-worker
  *   sequence number in bits 0..31 (Fig. 7c); the sequence number starts at
  *   1 so contig IDs never collide with NULL.
  * - flipped ID: bit 62 set — the contig-end marker used by bidirectional
  *   list ranking (§IV-B); bit 62 is free in both k-mer and contig IDs.
  */
object Ids {

  /** The dummy NULL neighbour: MSB 1, all other bits 0. */
  val NULL: Long = java.lang.Long.MIN_VALUE

  private val FlipBit: Long = 1L << 62

  def flip(id: Long): Long      = id | FlipBit
  def strip(id: Long): Long     = id & ~FlipBit
  def isFlipped(id: Long): Boolean = (id & FlipBit) != 0

  /** Contig ID for the j-th contig (j >= 1) built by worker/partition i. */
  def contigId(worker: Int, j: Long): Long = {
    require(worker >= 0 && worker < (1 << 30), s"worker out of range: $worker")
    require(j >= 1 && j < (1L << 32), s"contig index out of range: $j")
    (1L << 63) | (worker.toLong << 32) | j
  }

  def isContig(id: Long): Boolean = id < 0 && strip(id) != NULL
  def isKmer(id: Long): Boolean   = strip(id) >= 0
}
