package repro.eval

import repro.SparkSpec
import repro.world.{EntityWorld, WorldConfig}

class AnnotatorsSpec extends SparkSpec {

  private lazy val world = new EntityWorld(WorldConfig(nEntities = 120, nTopics = 6, nUsers = 10, seed = 59))

  test("same-topic unpopular pairs are judged related, cross-topic are not") {
    // use tail entities so popularity leniency stays out of the comparison
    val t0 = world.entities.filter(_.topic == 0).takeRight(5).toSeq
    val t1 = world.entities.filter(_.topic == 1).takeRight(5).toSeq
    val sameScores = for (a <- t0; b <- t0 if a.id < b.id) yield Annotators.judgePair(world, a.id, b.id)
    val crossScores = for (a <- t0; b <- t1) yield Annotators.judgePair(world, a.id, b.id)
    assert(sameScores.sum / sameScores.size > 0.5)
    assert(crossScores.sum / crossScores.size < 0.3)
  }

  test("popularity leniency lifts famous cross-topic pairs") {
    val popA = world.entities.filter(_.topic == 0).minBy(_.id)   // most popular of topic 0
    val popB = world.entities.filter(_.topic == 1).minBy(_.id)
    val tailA = world.entities.filter(_.topic == 0).maxBy(_.id)
    val tailB = world.entities.filter(_.topic == 1).maxBy(_.id)
    val lenient = Annotators.AnnotatorConfig(popLeniency = 0.6)
    val famous = Annotators.judgePair(world, popA.id, popB.id, lenient)
    val obscure = Annotators.judgePair(world, tailA.id, tailB.id, lenient)
    assert(famous >= obscure)
  }

  test("judgement is deterministic in the config seed") {
    val a = Annotators.judgePair(world, 3, 9)
    val b = Annotators.judgePair(world, 3, 9)
    assert(a == b)
  }

  test("scores take only the three annotator values") {
    val pairs = for (i <- 0 until 30; j <- i + 1 until 30) yield (i, j)
    pairs.foreach { case (u, v) =>
      val s = Annotators.judgePair(world, u, v)
      assert(s == 0.0 || s == 0.5 || s == 1.0)
    }
  }

  test("evaluate computes ACC and CorS consistently") {
    val pairs = (0 until 20).flatMap(t => {
      val es = world.entities.filter(_.topic == t % 6).take(3)
      if (es.length >= 2) Seq((es(0).id, es(1).id)) else Nil
    }).toArray
    val j = Annotators.evaluate(world, pairs)
    assert(j.judged == pairs.length)
    assert(j.acc >= 0 && j.acc <= 1)
    assert(j.cors <= j.acc, "CorS cannot exceed ACC (scores ≤ 1 and zero scores count in both)")
  }

  test("evaluate on empty input is defined") {
    val j = Annotators.evaluate(world, Array.empty)
    assert(j.acc == 0.0 && j.cors == 0.0 && j.judged == 0)
  }

  test("evaluate samples down very large pair sets") {
    val pairs = Array.tabulate(5000)(i => (i % 100, (i * 7) % 100)).filter { case (a, b) => a != b }
    val j = Annotators.evaluate(world, pairs, maxSample = 500)
    assert(j.judged == 500)
  }

  test("AEEC counts both endpoints of undirected relations") {
    assert(Annotators.aeec(nRelations = 300, nEntities = 100) == 6.0)
  }
}
