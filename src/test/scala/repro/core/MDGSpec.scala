package repro.core

import org.scalatest.funsuite.AnyFunSuite
import repro.embed.Embed

class MDGSpec extends AnyFunSuite {

  private def rec(id: Long, ent: Long, text: String) =
    Record(id, ent, text, Embed.embed(text))

  // Two tight groups of similar records, far apart from each other.
  private val a1 = rec(1, 10, "kamilu venqui belgan dorsel")
  private val a2 = rec(2, 10, "kamilu venqui belgan dorsel extra")
  private val a3 = rec(3, 10, "kamilu venqui belgan")
  private val b1 = rec(4, 20, "tosfir nolhex drapol quimar")
  private val b2 = rec(5, 20, "tosfir nolhex drapol quimar zen")
  private val b3 = rec(6, 20, "tosfir nolhex drapol")

  test("a similarity-consistent clustering is acceptable") {
    val good = Clustering(Vector(Vector(a1, a2, a3), Vector(b1, b2, b3)))
    assert(MDG.acceptable(good))
    assert(MDG.misclustered(good).isEmpty)
  }

  test("a record planted in the wrong cluster is detected") {
    val bad = Clustering(Vector(Vector(a1, a2), Vector(b1, b2, a3)))
    val flagged = MDG.misclustered(bad).map(_.id)
    assert(flagged.contains(3L))
    assert(!MDG.acceptable(bad))
  }

  test("swapped records across both clusters are detected") {
    val bad = Clustering(Vector(Vector(a1, a2, b3), Vector(b1, b2, a3)))
    assert(MDG.misclustered(bad).map(_.id).toSet.intersect(Set(3L, 6L)).nonEmpty)
  }

  test("singleton clusters are vacuously coherent under the relative test") {
    val c = Clustering(Vector(Vector(a1), Vector(b1)))
    // a1 vs b1 are dissimilar: intra=1.0 (vacuous) > inter.
    assert(MDG.acceptable(c))
  }

  test("the coherence floor flags an incoherent lone giant cluster") {
    val giant = Clustering(Vector(Vector(a1, a2, a3, b1, b2, b3)))
    assert(MDG.acceptable(giant, floor = 0.0)) // no rival cluster, no floor: passes
    assert(!MDG.acceptable(giant, floor = 0.6)) // floor catches it
  }

  test("the floor does not flag a genuinely coherent lone cluster") {
    val fine = Clustering(Vector(Vector(a1, a2, a3)))
    assert(MDG.acceptable(fine, floor = 0.6))
  }

  test("similarities returns (intra, inter) with expected ordering") {
    val c = Clustering(Vector(Vector(a1, a2, a3), Vector(b1, b2, b3)))
    val (intra, inter) = MDG.similarities(c, a1)
    assert(intra > inter)
    assert(intra <= 1.0 && inter >= -1.0)
  }

  test("similarities rejects a record not in the clustering") {
    val c = Clustering(Vector(Vector(a1, a2)))
    intercept[IllegalArgumentException] { MDG.similarities(c, b1) }
  }

  test("regenerate keeps exactly the same records") {
    val bad = Clustering(Vector(Vector(a1, a2), Vector(b1, b2, a3)))
    val out = MDG.regenerate(bad)
    assert(out.map(_.id).sorted == Vector(1L, 2L, 3L, 4L, 5L))
  }

  test("regenerate relocates the misclustered record next to its most similar cluster") {
    val bad = Clustering(Vector(Vector(a1, a2), Vector(b1, b2, a3)))
    val out = MDG.regenerate(bad)
    val i   = out.indexWhere(_.id == 3L)
    // a3 should now sit adjacent to a cluster-A record, not between Bs.
    val neighbours = Seq(i - 1, i + 1).filter(j => j >= 0 && j < out.size).map(out(_).entityId)
    assert(neighbours.contains(10L))
  }

  test("regenerate of a clean clustering is the identity on record order") {
    val good = Clustering(Vector(Vector(a1, a2, a3), Vector(b1, b2, b3)))
    assert(MDG.regenerate(good).map(_.id) == good.records.map(_.id))
  }

  test("regenerate of a lone cluster falls back to sequential reordering") {
    val lone = Clustering(Vector(Vector(a1, b1, a2, b2)))
    val out  = MDG.regenerate(lone, floor = 0.9)
    assert(out.map(_.id).sorted == Vector(1L, 2L, 4L, 5L))
  }
}
