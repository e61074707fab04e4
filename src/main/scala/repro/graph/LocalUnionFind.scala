package repro.graph

import scala.collection.mutable

/** Driver-side weighted union-find with path compression.
  *
  * The exact-answer reference (§I cites Union/Find as the sequential optimum,
  * unusable distributed — here it serves as the correctness oracle and as the
  * component counter for the Table II dataset statistics, where edge lists at
  * bench scale comfortably fit on the driver).
  */
final class LocalUnionFind {
  private val parent = mutable.LongMap.empty[Long]
  private val size   = mutable.LongMap.empty[Long]

  /** Ensure a vertex exists (its own singleton component until united). */
  def add(v: Long): Unit =
    if (!parent.contains(v)) { parent(v) = v; size(v) = 1L }

  /** Root of v's component, compressing the path walked. */
  def find(v: Long): Long = {
    add(v)
    var root = v
    while (parent(root) != root) root = parent(root)
    var cur = v
    while (parent(cur) != root) { val next = parent(cur); parent(cur) = root; cur = next }
    root
  }

  /** Merge the components of a and b (weighted by size). */
  def union(a: Long, b: Long): Unit = {
    val ra = find(a)
    val rb = find(b)
    if (ra != rb) {
      val (big, small) = if (size(ra) >= size(rb)) (ra, rb) else (rb, ra)
      parent(small) = big
      size(big) += size(small)
    }
  }

  /** All vertices seen so far. */
  def verticesSeen: Iterator[Long] = parent.keysIterator

  /** Number of components among the vertices seen. */
  def componentCount: Long = parent.keysIterator.count(v => parent(v) == v)

  /** Canonical labelling: every vertex mapped to the min ID of its component. */
  def minLabels: Map[Long, Long] = {
    val minOfRoot = mutable.LongMap.empty[Long]
    parent.keysIterator.foreach { v =>
      val r = find(v)
      minOfRoot(r) = math.min(minOfRoot.getOrElse(r, Long.MaxValue), v)
    }
    parent.keysIterator.map(v => v -> minOfRoot(find(v))).toMap
  }

  /** Sizes of each component, keyed by root. */
  def componentSizes: Map[Long, Long] = {
    val acc = mutable.LongMap.empty[Long]
    parent.keysIterator.foreach { v =>
      val r = find(v)
      acc(r) = acc.getOrElse(r, 0L) + 1L
    }
    acc.toMap
  }
}

object LocalUnionFind {
  /** Build from an edge list; loop edges register isolated vertices. */
  def fromEdges(edges: IterableOnce[(Long, Long)]): LocalUnionFind = {
    val uf = new LocalUnionFind
    edges.iterator.foreach { case (a, b) => if (a == b) uf.add(a) else uf.union(a, b) }
    uf
  }
}
