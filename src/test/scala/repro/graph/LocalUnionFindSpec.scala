package repro.graph

import org.scalatest.funsuite.AnyFunSuite
import scala.util.Random

class LocalUnionFindSpec extends AnyFunSuite {

  test("singletons are their own components") {
    val uf = new LocalUnionFind
    uf.add(1L); uf.add(2L)
    assert(uf.find(1L) != uf.find(2L))
    assert(uf.componentCount == 2)
  }

  test("union merges, transitively") {
    val uf = new LocalUnionFind
    uf.union(1L, 2L); uf.union(2L, 3L); uf.union(10L, 11L)
    assert(uf.find(1L) == uf.find(3L))
    assert(uf.find(1L) != uf.find(10L))
    assert(uf.componentCount == 2)
  }

  test("minLabels maps every vertex to its component minimum") {
    val uf = LocalUnionFind.fromEdges(Seq((5L, 3L), (3L, 9L), (20L, 21L), (7L, 7L)))
    assert(uf.minLabels == Map(3L -> 3L, 5L -> 3L, 9L -> 3L, 20L -> 20L, 21L -> 20L, 7L -> 7L))
  }

  test("loop edges register isolated vertices") {
    val uf = LocalUnionFind.fromEdges(Seq((4L, 4L)))
    assert(uf.componentCount == 1)
    assert(uf.minLabels == Map(4L -> 4L))
  }

  test("componentSizes sums to the vertex count") {
    val uf = LocalUnionFind.fromEdges(Seq((1L, 2L), (2L, 3L), (10L, 11L), (42L, 42L)))
    assert(uf.componentSizes.values.sum == 6L)
    assert(uf.componentSizes.values.toSeq.sorted == Seq(1L, 2L, 3L))
  }

  test("idempotent unions and repeated edges") {
    val uf = LocalUnionFind.fromEdges(Seq.fill(50)((1L, 2L)) ++ Seq((2L, 1L)))
    assert(uf.componentCount == 1)
  }

  test("handles negative and extreme IDs") {
    val uf = LocalUnionFind.fromEdges(Seq((-9L, Long.MaxValue), (Long.MinValue, -9L)))
    assert(uf.componentCount == 1)
    assert(uf.minLabels.values.toSet == Set(Long.MinValue))
  }

  test("agrees with brute-force reachability on random graphs") {
    val rng = new Random(77)
    for (_ <- 1 to 5) {
      val n     = 30
      val edges = Seq.fill(25)((rng.nextInt(n).toLong, rng.nextInt(n).toLong))
      val uf    = LocalUnionFind.fromEdges(edges)
      // brute force: transitive closure over adjacency
      val adj = edges.flatMap { case (a, b) => Seq(a -> b, b -> a) }
        .groupBy(_._1).view.mapValues(_.map(_._2).toSet).toMap
      def reach(s: Long): Set[Long] = {
        var seen = Set(s); var frontier = Set(s)
        while (frontier.nonEmpty) {
          val next = frontier.flatMap(adj.getOrElse(_, Set.empty)) -- seen
          seen ++= next; frontier = next
        }
        seen
      }
      val verts = edges.flatMap(e => Seq(e._1, e._2)).distinct
      for (v <- verts; u <- verts)
        assert((uf.find(v) == uf.find(u)) == reach(v).contains(u), s"vertices $v,$u disagree")
    }
  }

  test("scales to 100k edges quickly") {
    val rng   = new Random(3)
    val edges = Seq.fill(100000)((rng.nextInt(50000).toLong, rng.nextInt(50000).toLong))
    val t0    = System.nanoTime()
    val uf    = LocalUnionFind.fromEdges(edges)
    assert(uf.componentCount > 0)
    assert((System.nanoTime() - t0) / 1e9 < 10.0)
  }
}
