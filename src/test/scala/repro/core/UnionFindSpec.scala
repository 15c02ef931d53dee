package repro.core

import org.scalatest.funsuite.AnyFunSuite
import org.scalacheck.{Gen, Prop}
import repro.PropSupport

class UnionFindSpec extends AnyFunSuite with PropSupport {

  test("fresh elements are their own components") {
    val uf = new UnionFind(Seq(1L, 2L, 3L))
    assert(uf.find(1L) == 1L)
    assert(!uf.connected(1L, 2L))
    assert(uf.partition.size == 3)
  }

  test("union connects transitively") {
    val uf = new UnionFind(1L to 5L)
    uf.union(1, 2); uf.union(2, 3)
    assert(uf.connected(1, 3))
    assert(!uf.connected(1, 4))
    assert(uf.partition.map(_.size).sorted == Vector(1, 1, 3))
  }

  test("union is idempotent") {
    val uf = new UnionFind(Seq(1L, 2L))
    uf.union(1, 2); uf.union(1, 2); uf.union(2, 1)
    assert(uf.partition == Vector(Set(1L, 2L)))
  }

  test("partition covers exactly the initial ids") {
    val uf = new UnionFind(1L to 10L)
    uf.union(1, 5); uf.union(7, 9)
    assert(uf.partition.flatten.toSet == (1L to 10L).toSet)
  }

  test("chain of unions yields one component") {
    val uf = new UnionFind(1L to 100L)
    (1L until 100L).foreach(i => uf.union(i, i + 1))
    assert(uf.partition.size == 1)
  }

  test("property: components equal reference partition of random union sequences") {
    val gen = for {
      n     <- Gen.choose(2, 30)
      edges <- Gen.listOf(Gen.zip(Gen.choose(1, n), Gen.choose(1, n)))
    } yield (n, edges)
    checkProp(Prop.forAll(gen) { case (n, edges) =>
      val uf = new UnionFind((1 to n).map(_.toLong))
      edges.foreach { case (a, b) => uf.union(a.toLong, b.toLong) }
      // Reference: repeated closure over edge list.
      var part = (1 to n).map(i => Set(i.toLong)).toVector
      edges.foreach { case (a, b) =>
        val ca = part.find(_.contains(a.toLong)).get
        val cb = part.find(_.contains(b.toLong)).get
        if (ca != cb) part = part.filterNot(c => c == ca || c == cb) :+ (ca ++ cb)
      }
      uf.partition.map(_.toSeq.sorted).sortBy(_.head) ==
        part.map(_.toSeq.sorted).sortBy(_.head)
    })
  }
}
