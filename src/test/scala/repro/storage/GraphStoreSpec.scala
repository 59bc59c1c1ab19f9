package repro.storage

import org.apache.spark.sql.functions._
import repro.{Oracle, SparkSpec}
import java.nio.file.Files

class GraphStoreSpec extends SparkSpec {

  private def newStore(): GraphStore =
    new GraphStore(spark, Files.createTempDirectory("geabase").resolve("edges").toString)

  private def edgesDf = {
    import spark.implicits._
    // path 0-1-2-3-4 plus shortcut 0-5, 5-3
    Seq((0, 1, 0.9), (1, 2, 0.8), (2, 3, 0.7), (3, 4, 0.6), (0, 5, 0.5), (5, 3, 0.4))
      .toDF("src", "dst", "score")
  }

  test("write/read round-trips the relations") {
    val store = newStore()
    store.write(edgesDf)
    val back = store.edges()
    assert(back.count() == 6)
    assert(back.columns.toSet == Set("src", "dst", "score"))
  }

  test("adjacency doubles every edge — Oracle-checked") {
    val store = newStore()
    store.write(edgesDf)
    val adj = store.adjacency().groupBy("a").agg(count("*").as("deg"))
    Oracle.assertEquivalent(adj,
      """SELECT a, count(*) AS deg FROM (
        |  SELECT src AS a FROM e UNION ALL SELECT dst AS a FROM e
        |) GROUP BY a""".stripMargin,
      "e" -> edgesDf)
  }

  test("kHop depths match brute-force BFS") {
    val store = newStore()
    store.write(edgesDf)
    val res = store.kHop(Seq(0), 2).collect().map(r => r.getInt(0) -> r.getInt(1)).toMap
    // BFS from 0: hop0={0}, hop1={1,5}, hop2={2,3}
    assert(res == Map(0 -> 0, 1 -> 1, 5 -> 1, 2 -> 2, 3 -> 2))
  }

  test("kHop with k=1 stops at direct neighbours") {
    val store = newStore()
    store.write(edgesDf)
    val res = store.kHop(Seq(2), 1).collect().map(r => r.getInt(0) -> r.getInt(1)).toMap
    assert(res == Map(2 -> 0, 1 -> 1, 3 -> 1))
  }

  test("kHop from multiple seeds takes the min hop") {
    val store = newStore()
    store.write(edgesDf)
    val res = store.kHop(Seq(0, 4), 1).collect().map(r => r.getInt(0) -> r.getInt(1)).toMap
    assert(res(0) == 0 && res(4) == 0 && res(1) == 1 && res(3) == 1 && res(5) == 1)
  }

  test("path_score is the product of edge scores along the found path") {
    val store = newStore()
    store.write(edgesDf)
    val res = store.kHop(Seq(0), 2).collect()
      .map(r => r.getInt(0) -> r.getDouble(2)).toMap
    assert(math.abs(res(1) - 0.9) < 1e-12)
    assert(math.abs(res(2) - 0.9 * 0.8) < 1e-12)
    // node 3 reachable via 0-5-3 (0.5*0.4=0.2) and via 0-1-2-3 (3 hops, out of k);
    // max path within 2 hops is 0.2
    assert(math.abs(res(3) - 0.2) < 1e-12)
  }

  test("weekly overwrite replaces the graph") {
    import spark.implicits._
    val store = newStore()
    store.write(edgesDf)
    store.write(Seq((7, 8, 1.0)).toDF("src", "dst", "score"))
    assert(store.edges().count() == 1)
  }
}
