package repro.core

/** Union-find over record ids — the transitive-closure substrate used by
  * the pairwise/BQ/CrowdER baselines' combining phase and by canopy
  * blocking's block merging.
  */
final class UnionFind(ids: Iterable[Long]) {
  private val parent = scala.collection.mutable.Map.empty[Long, Long]
  private val rank   = scala.collection.mutable.Map.empty[Long, Int]
  ids.foreach { id => parent(id) = id; rank(id) = 0 }

  def find(x: Long): Long = {
    var root = x
    while (parent(root) != root) root = parent(root)
    var cur = x
    while (parent(cur) != root) { val nxt = parent(cur); parent(cur) = root; cur = nxt }
    root
  }

  def union(a: Long, b: Long): Unit = {
    val ra = find(a); val rb = find(b)
    if (ra != rb) {
      if (rank(ra) < rank(rb)) parent(ra) = rb
      else if (rank(ra) > rank(rb)) parent(rb) = ra
      else { parent(rb) = ra; rank(ra) = rank(ra) + 1 }
    }
  }

  def connected(a: Long, b: Long): Boolean = find(a) == find(b)

  /** Current partition as a set of clusters. */
  def partition: Vector[Set[Long]] =
    parent.keys.groupBy(find).values.map(_.toSet).toVector
}
