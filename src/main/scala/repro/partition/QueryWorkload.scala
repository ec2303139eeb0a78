package repro.partition

import scala.util.Random

/** Synthetic query workloads over a file catalog (Section VI set-up).
  *
  * A *query family* is the set of all queries touching the same file set;
  * each family yields one initial partition whose rho is the family's total
  * access frequency. Enterprise workloads are skewed, so frequencies can be
  * drawn Zipf-like; file footprints are contiguous ranges (time-series-like
  * access) or random subsets (ad-hoc access).
  */
object QueryWorkload {

  /** Draw a Zipf(alpha) rank in [1, n] by inverse-CDF over rank weights. */
  def zipfRank(rng: Random, n: Int, alpha: Double): Int = {
    val weights = (1 to n).map(k => 1.0 / math.pow(k, alpha))
    val total   = weights.sum
    var u       = rng.nextDouble() * total
    var k       = 0
    while (k < n - 1 && u > weights(k)) { u -= weights(k); k += 1 }
    k + 1
  }

  /** Contiguous-range query families (time-series-style access).
    *
    * Each family reads files [start, start+len); start is uniform, len is
    * 1..maxSpanFiles. Frequencies are Zipf(alpha) over family rank when
    * alpha > 0, else uniform in [1, 20]. Families are returned in end-file
    * order so they can feed [[OrderedDP]] directly.
    */
  def rangeFamilies(nFiles: Int, nFamilies: Int, maxSpanFiles: Int,
                    zipfAlpha: Double, seed: Long): Vector[Part] = {
    val rng = new Random(seed)
    val raw = (0 until nFamilies).map { i =>
      val len   = 1 + rng.nextInt(math.max(1, maxSpanFiles))
      val start = rng.nextInt(math.max(1, nFiles - len + 1))
      val freq =
        if (zipfAlpha > 0) 100.0 / math.pow(i + 1, zipfAlpha) max 1.0
        else 1.0 + rng.nextInt(20)
      (start, len, freq)
    }
    raw.zipWithIndex
      .map { case ((start, len, freq), i) => Part.initial(i, start until (start + len), freq) }
      .sortBy(p => p.files.max)
      .toVector
  }

  /** Random-subset query families (ad-hoc access): each family touches
    * `filesPerFamily` uniformly chosen files.
    */
  def subsetFamilies(nFiles: Int, nFamilies: Int, filesPerFamily: Int,
                     zipfAlpha: Double, seed: Long): Vector[Part] = {
    val rng = new Random(seed)
    (0 until nFamilies).map { i =>
      val files = rng.shuffle((0 until nFiles).toVector).take(filesPerFamily)
      val freq =
        if (zipfAlpha > 0) 100.0 / math.pow(i + 1, zipfAlpha) max 1.0
        else 1.0 + rng.nextInt(20)
      Part.initial(i, files, freq)
    }.toVector
  }

  /** A synthetic file catalog: `nFiles` files of ~rowsPerFile rows (+-50%,
    * deterministic in seed) and bytesPerRow bytes per row.
    */
  def syntheticCatalog(nFiles: Int, rowsPerFile: Long, bytesPerRow: Long, seed: Long): FileCatalog = {
    val rng  = new Random(seed)
    val rows = Vector.fill(nFiles)(math.max(1L, (rowsPerFile * (0.5 + rng.nextDouble())).toLong))
    FileCatalog(rows, rows.map(_ * bytesPerRow))
  }
}
