package repro.arrays

import scala.util.Random

/** Synthetic stand-ins for the IMDB non-commercial tables the paper's
  * relational experiments use (title.basics ⋈ title.episode on `tconst`,
  * group-by on unsorted low-cardinality columns). The properties the paper
  * calls out are preserved: `tconst` is sorted and unique in basics, sorted
  * with duplicates in episode (episodes of one parent title are contiguous),
  * and `genres`/`isAdult` are unsorted and low-cardinality.
  */
object SynthTables {

  /** Unsorted genre ids for `n` basics rows, cardinality `card`. */
  def genres(n: Int, card: Int = 400, seed: Long = 11): Array[Int] = {
    val rng = new Random(seed)
    Array.fill(n)(rng.nextInt(card))
  }

  /** Unsorted binary isAdult column. */
  def isAdult(n: Int, seed: Long = 12): Array[Int] = {
    val rng = new Random(seed)
    Array.fill(n)(if (rng.nextDouble() < 0.03) 1 else 0)
  }

  /** Sorted episode→parent keys: parent `tconst` values in ascending order
    * with a geometric number of episodes per parent (mean `avgEpisodes`),
    * producing `approxRows`-ish rows referencing parents `[0, nParents)`.
    */
  def episodeParents(
      nParents: Int, avgEpisodes: Double = 40.0, seed: Long = 13,
  ): Array[Int] = {
    val rng = new Random(seed)
    val p = 1.0 / avgEpisodes
    val out = Array.newBuilder[Int]
    var parent = 0
    while (parent < nParents) {
      // Only some titles are series with episodes.
      if (rng.nextDouble() < 0.15) {
        var k = 1 + (math.log(rng.nextDouble() + 1e-12) / math.log(1 - p)).toInt
        k = math.min(k, 400)
        var i = 0
        while (i < k) { out += parent; i += 1 }
      }
      parent += 1
    }
    out.result()
  }
}
