package repro.arrays

import org.scalatest.funsuite.AnyFunSuite

class SynthTablesSpec extends AnyFunSuite {

  test("episodeParents is sorted with contiguous duplicates") {
    val p = SynthTables.episodeParents(2000, avgEpisodes = 20.0, seed = 1)
    assert(p.nonEmpty)
    assert(p.sameElements(p.sorted), "parents must be ascending")
    assert(p.forall(v => v >= 0 && v < 2000))
    // duplicates exist (series with >1 episode)
    assert(p.length > p.distinct.length)
  }

  test("episodeParents only covers a fraction of titles (series share)") {
    val p = SynthTables.episodeParents(5000, seed = 2)
    val series = p.distinct.length
    assert(series < 5000 / 2, s"only some titles are series, got $series")
  }

  test("episodeParents is deterministic in the seed") {
    assert(SynthTables.episodeParents(1000, seed = 3)
      .sameElements(SynthTables.episodeParents(1000, seed = 3)))
  }

  test("genres are unsorted and low-cardinality") {
    val g = SynthTables.genres(10000, card = 50, seed = 4)
    assert(g.forall(v => v >= 0 && v < 50))
    assert(!g.sameElements(g.sorted), "genres column must be unsorted")
    assert(g.distinct.length == 50)
  }

  test("isAdult is a rare binary flag") {
    val a = SynthTables.isAdult(10000, seed = 5)
    assert(a.forall(v => v == 0 || v == 1))
    val ones = a.count(_ == 1)
    assert(ones > 0 && ones < 1000)
  }
}
