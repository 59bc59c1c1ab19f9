package repro.linkpred

import repro.SparkSpec

class LinkPredDataSpec extends SparkSpec {

  private lazy val data: LinkPredData = {
    import spark.implicits._
    val n = 60
    val rng = new scala.util.Random(5)
    val edges = (for (u <- 0 until n; v <- u + 1 until n if rng.nextDouble() < 0.1)
      yield (u, v, rng.nextInt(2))).toDF("src", "dst", "rel_type")
    val feat = Array.fill(n)(Array.fill(4)(rng.nextDouble()))
    LinkPredData.split(spark, edges, n, feat, feat, testFrac = 0.2, negRatio = 3, seed = 7)
  }

  test("split fractions approximate the request") {
    val total = data.trainPos.length + data.testPos.length
    val frac = data.testPos.length.toDouble / total
    assert(frac > 0.1 && frac < 0.3, s"test fraction $frac")
  }

  test("training negatives respect the 1:3 ratio, test is 1:1") {
    assert(data.trainNeg.length == data.trainPos.length * 3)
    assert(data.testNeg.length == data.testPos.length)
  }

  test("negatives are non-edges") {
    val all = (data.trainPos ++ data.testPos).flatMap { case (u, v) => Seq((u, v), (v, u)) }.toSet
    (data.trainNeg ++ data.testNeg).foreach { case (u, v) =>
      assert(!all.contains((u, v)) && u != v)
    }
  }

  test("train graph excludes test edges") {
    data.testPos.foreach { case (u, v) => assert(!data.trainGraph.hasEdge(u, v)) }
    data.trainPos.foreach { case (u, v) => assert(data.trainGraph.hasEdge(u, v)) }
  }

  test("features concatenate semantic and co-occurrence blocks") {
    assert(data.features(0).length == 8)
    assert(data.features(3).take(4).sameElements(data.featSe(3)))
    assert(data.features(3).drop(4).sameElements(data.featCo(3)))
  }

  test("trainPairs and labels align") {
    assert(data.trainPairs.length == data.trainLabels.length)
    assert(data.trainLabels.take(data.trainPos.length).forall(_ == 1.0))
    assert(data.trainLabels.drop(data.trainPos.length).forall(_ == 0.0))
  }

  test("split is deterministic in the seed") {
    import spark.implicits._
    val n = 60
    val rng = new scala.util.Random(5)
    val edges = (for (u <- 0 until n; v <- u + 1 until n if rng.nextDouble() < 0.1)
      yield (u, v, rng.nextInt(2))).toDF("src", "dst", "rel_type")
    val feat = Array.fill(n)(Array.fill(4)(rng.nextDouble()))
    val d2 = LinkPredData.split(spark, edges, n, feat, feat, testFrac = 0.2, negRatio = 3, seed = 7)
    assert(d2.trainPos.sameElements(data.trainPos))
    assert(d2.testNeg.sameElements(data.testNeg))
  }
}
