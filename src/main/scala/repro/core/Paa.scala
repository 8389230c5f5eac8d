package repro.core

/** Piecewise Aggregate Approximation.
  *
  * Series length need not be divisible by the segment count: the first
  * `length % w` segments get one extra point. All lower bounds in
  * [[ISax]] weight each segment by its true point count, so the uneven
  * split stays a valid lower bound (for equal segments it reduces to the
  * classic sqrt(L/w) formula).
  */
object Paa {

  /** Per-segment point counts for a series of `length` split into `w` parts. */
  def segmentSizes(length: Int, w: Int): Array[Int] = {
    require(w > 0 && length >= w, s"need length >= w > 0, got length=$length w=$w")
    val base = length / w
    val rem  = length % w
    Array.tabulate(w)(i => if (i < rem) base + 1 else base)
  }

  /** PAA of `values` into `w` segment means. */
  def of(values: Array[Double], w: Int): Array[Double] = {
    val sizes = segmentSizes(values.length, w)
    val out   = new Array[Double](w)
    var i = 0
    var p = 0
    while (i < w) {
      var s = 0.0
      var j = 0
      while (j < sizes(i)) { s += values(p); p += 1; j += 1 }
      out(i) = s / sizes(i)
      i += 1
    }
    out
  }
}
