package repro.core

/** Gray-code utilities used by Odyssey's DENSITY-AWARE partitioner (§3.4.1).
  *
  * Summarization buffers are keyed by a w-bit iSAX word; ordering the
  * buffers by the *rank* of their word in the Gray-code sequence places
  * buffers whose words differ in a single bit next to each other, so a
  * round-robin assignment over that order spreads similar buffers across
  * system nodes.
  */
object Gray {

  /** The n-th codeword of the reflected binary Gray code. */
  @inline def encode(n: Long): Long = n ^ (n >>> 1)

  /** Inverse of [[encode]]: position of codeword `g` in the Gray sequence. */
  def decode(g: Long): Long = {
    var n = g
    var shift = 1
    while (shift < 64) { n ^= n >>> shift; shift <<= 1 }
    n
  }

  /** Rank of a plain binary word `w` when the word space is enumerated in
    * Gray-code order — i.e., how late `w` appears in the sequence
    * encode(0), encode(1), ….
    */
  @inline def rank(w: Long): Long = decode(w)
}
