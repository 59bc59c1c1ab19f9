package repro.graph

import repro.SparkSpec
import scala.util.Random

class EntityGraphSpec extends SparkSpec {

  // path 0-1-2-3 plus triangle 1-2-4
  private val edges = Seq((0, 1, 0), (1, 2, 0), (2, 3, 1), (1, 4, 1), (2, 4, 0))
  private lazy val g = EntityGraph.fromEdges(edges, 5)

  test("degrees and edge count") {
    assert(g.numEdges == 5)
    assert(g.degree(0) == 1 && g.degree(1) == 3 && g.degree(2) == 3 && g.degree(3) == 1 && g.degree(4) == 2)
  }

  test("adjacency is symmetric") {
    edges.foreach { case (u, v, _) =>
      assert(g.hasEdge(u, v) && g.hasEdge(v, u))
    }
    assert(!g.hasEdge(0, 3))
  }

  test("fromEdgeDf round-trips through a DataFrame") {
    import spark.implicits._
    val df = edges.toDF("src", "dst", "rel_type")
    val g2 = EntityGraph.fromEdgeDf(df, 5)
    assert(g2.numEdges == g.numEdges)
    (0 until 5).foreach(u => assert(g2.neighborsOf(u).sorted.sameElements(g.neighborsOf(u).sorted)))
  }

  test("duplicate edges are deduplicated") {
    val g2 = EntityGraph.fromEdges(edges ++ Seq((0, 1, 0), (1, 0, 0)), 5)
    assert(g2.numEdges == 5)
  }

  test("neighbor sampling returns only true neighbors, self-loop for isolated") {
    val rng = new Random(1)
    val sample = g.sampleNeighbors(4, rng)
    assert(sample.length == 20)
    (0 until 5).foreach { u =>
      val nb = g.neighborSet(u)
      (0 until 4).foreach(j => assert(nb.contains(sample(u * 4 + j))))
    }
    val gIso = EntityGraph.fromEdges(Seq((0, 1, 0)), 3)
    val s2 = gIso.sampleNeighbors(2, rng)
    assert(s2(2 * 2) == 2 && s2(2 * 2 + 1) == 2, "isolated node must self-loop")
  }

  test("typed neighbor sampling respects rel_type") {
    val rng = new Random(2)
    val s = g.sampleNeighborsOfType(6, 1, rng)
    // node 1's type-1 neighbours: only 4
    (0 until 6).foreach(j => assert(s(1 * 6 + j) == 4))
    // node 0 has no type-1 edges → self-loop
    (0 until 6).foreach(j => assert(s(0 * 6 + j) == 0))
  }

  test("common neighbors / adamic-adar / jaccard against brute force") {
    // nodes 1 and 2 share neighbor 4; 1's nbrs {0,2,4}, 2's nbrs {1,3,4}
    assert(g.commonNeighbors(1, 2) == 1)
    assert(g.jaccard(1, 2) == 1.0 / 5.0)
    val expectedAa = 1.0 / math.log(g.degree(4) + math.E)
    assert(math.abs(g.adamicAdar(1, 2) - expectedAa) < 1e-12)
    assert(g.commonNeighbors(0, 3) == 0 && g.jaccard(0, 3) == 0.0)
  }

  test("sampling distribution is roughly uniform over neighbors") {
    val rng = new Random(3)
    val counts = scala.collection.mutable.Map[Int, Int]().withDefaultValue(0)
    (0 until 300).foreach { _ =>
      val s = g.sampleNeighbors(1, rng)
      counts(s(1)) += 1 // node 1 has neighbors 0, 2, 4
    }
    assert(counts.keySet.subsetOf(Set(0, 2, 4)))
    counts.values.foreach(c => assert(c > 50, s"skewed sampling: $counts"))
  }
}
