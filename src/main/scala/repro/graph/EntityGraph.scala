package repro.graph

import org.apache.spark.sql.DataFrame
import scala.util.Random

/** Driver-side CSR adjacency over the entity graph, built from a Spark edge
  * DataFrame. Spark owns edge *construction* (joins, k-NN, splits); the CSR
  * is what the GNN trainers iterate over, and what neighbour sampling and
  * structural features (CN/AA/Jaccard) read.
  *
  * Edges are stored undirected (both directions present).
  */
final class EntityGraph(val n: Int, val offsets: Array[Int], val neighbors: Array[Int],
                        val relTypes: Array[Int]) extends Serializable {

  def degree(u: Int): Int = offsets(u + 1) - offsets(u)
  def numEdges: Int = neighbors.length / 2

  def neighborsOf(u: Int): Array[Int] =
    java.util.Arrays.copyOfRange(neighbors, offsets(u), offsets(u + 1))

  def neighborSet(u: Int): Set[Int] = neighborsOf(u).toSet

  def hasEdge(u: Int, v: Int): Boolean = {
    var i = offsets(u)
    while (i < offsets(u + 1)) { if (neighbors(i) == v) return true; i += 1 }
    false
  }

  /** Samples exactly `k` neighbours per node (with replacement; isolated nodes
    * fall back to self-loops). Returns a flat array of length n*k: the layout
    * the autodiff attention-pooling op expects.
    */
  def sampleNeighbors(k: Int, rng: Random): Array[Int] = {
    val out = new Array[Int](n * k)
    var u = 0
    while (u < n) {
      val d = degree(u)
      var j = 0
      while (j < k) {
        out(u * k + j) = if (d == 0) u else neighbors(offsets(u) + rng.nextInt(d))
        j += 1
      }
      u += 1
    }
    out
  }

  /** Same, restricted to one relation type (for CompGCN). */
  def sampleNeighborsOfType(k: Int, relType: Int, rng: Random): Array[Int] = {
    val byType = Array.tabulate(n) { u =>
      (offsets(u) until offsets(u + 1)).filter(i => relTypes(i) == relType).map(neighbors).toArray
    }
    val out = new Array[Int](n * k)
    var u = 0
    while (u < n) {
      val pool = byType(u)
      var j = 0
      while (j < k) {
        out(u * k + j) = if (pool.isEmpty) u else pool(rng.nextInt(pool.length))
        j += 1
      }
      u += 1
    }
    out
  }

  def commonNeighbors(u: Int, v: Int): Int = {
    val su = neighborSet(u)
    neighborsOf(v).count(su.contains)
  }

  def adamicAdar(u: Int, v: Int): Double = {
    val su = neighborSet(u)
    neighborsOf(v).filter(su.contains).map(w => 1.0 / math.log(degree(w) + math.E)).sum
  }

  def jaccard(u: Int, v: Int): Double = {
    val su = neighborSet(u); val sv = neighborSet(v)
    val inter = su.intersect(sv).size
    val union = su.union(sv).size
    if (union == 0) 0.0 else inter.toDouble / union
  }
}

object EntityGraph {

  /** Builds the CSR from an undirected edge DataFrame (src, dst[, rel_type]).
    * Each input edge is materialised in both directions; duplicates are kept
    * once per (src,dst,rel) triple.
    */
  def fromEdgeDf(edges: DataFrame, n: Int): EntityGraph = {
    val hasRel = edges.columns.contains("rel_type")
    val raw = edges.select("src", "dst" +: (if (hasRel) Seq("rel_type") else Seq.empty): _*)
      .collect()
      .map(r => (r.getInt(0), r.getInt(1), if (hasRel) r.getInt(2) else 0))
    fromEdges(raw, n)
  }

  def fromEdges(edgeList: Seq[(Int, Int, Int)], n: Int): EntityGraph = {
    val dedup = edgeList.flatMap { case (u, v, t) => Seq(((u, v), t), ((v, u), t)) }
      .groupBy(_._1).map { case ((u, v), ts) => (u, v, ts.map(_._2).min) }.toArray
    val deg = new Array[Int](n)
    dedup.foreach { case (u, _, _) => deg(u) += 1 }
    val offsets = deg.scanLeft(0)(_ + _)
    val cursor = offsets.clone()
    val neighbors = new Array[Int](dedup.length)
    val relTypes = new Array[Int](dedup.length)
    dedup.foreach { case (u, v, t) =>
      neighbors(cursor(u)) = v
      relTypes(cursor(u)) = t
      cursor(u) += 1
    }
    new EntityGraph(n, offsets, neighbors, relTypes)
  }
}
