package repro.preference

import org.apache.spark.sql.functions._
import repro.{Oracle, SparkSpec}

class UserPreferenceSpec extends SparkSpec {

  private lazy val emb = Array(
    Array(1.0, 0.0), Array(0.0, 1.0), Array(1.0, 1.0), Array(2.0, 0.0))

  private def flatSeq = {
    import spark.implicits._
    // user 0 saw entities 0,1,2; user 1 saw 3,3
    Seq((0, 0, 0), (0, 1, 1), (0, 2, 2), (1, 0, 3), (1, 1, 3))
      .toDF("user_id", "rank", "entity_id")
  }

  test("embeddingsDf exposes (entity_id, vec)") {
    val df = UserPreference.embeddingsDf(spark, emb)
    assert(df.count() == 4)
    val r = df.filter(col("entity_id") === 2).head.getSeq[Double](1)
    assert(r == Seq(1.0, 1.0))
  }

  test("user embedding is the element-wise mean over the sequence (eq. 7)") {
    val ue = UserPreference.userEmbeddings(flatSeq, UserPreference.embeddingsDf(spark, emb))
    val m = ue.collect().map(r => r.getInt(0) -> r.getSeq[Double](1)).toMap
    assert(m(0) == Seq(2.0 / 3, 2.0 / 3))
    assert(m(1) == Seq(2.0, 0.0))
  }

  test("user embedding mean matches DuckDB per-dimension average") {
    val ue = UserPreference.userEmbeddings(flatSeq, UserPreference.embeddingsDf(spark, emb))
    val got = ue.select(col("user_id"),
      element_at(col("vec"), 1).as("d0"), element_at(col("vec"), 2).as("d1"))
    val embDf = {
      import spark.implicits._
      emb.zipWithIndex.toSeq.map { case (v, i) => (i, v(0), v(1)) }.toDF("entity_id", "e0", "e1")
    }
    Oracle.assertEquivalent(got,
      """SELECT s.user_id, avg(CAST(e.e0 AS DOUBLE)) AS d0, avg(CAST(e.e1 AS DOUBLE)) AS d1
        |FROM s JOIN e ON s.entity_id = e.entity_id GROUP BY s.user_id""".stripMargin,
      "s" -> flatSeq, "e" -> embDf)
  }

  test("preference score is the dot product r_u · h_e (eq. 7)") {
    val embDf = UserPreference.embeddingsDf(spark, emb)
    val ue = UserPreference.userEmbeddings(flatSeq, embDf)
    val scores = UserPreference.preferenceScores(spark, ue, embDf, Seq(0, 2))
      .collect().map(r => (r.getInt(0), r.getInt(1)) -> r.getDouble(2)).toMap
    // user0 = (2/3, 2/3): score vs e0=(1,0) → 2/3; vs e2=(1,1) → 4/3
    assert(math.abs(scores((0, 0)) - 2.0 / 3) < 1e-12)
    assert(math.abs(scores((0, 2)) - 4.0 / 3) < 1e-12)
    // user1 = (2,0): vs e0 → 2; vs e2 → 2
    assert(math.abs(scores((1, 0)) - 2.0) < 1e-12)
    assert(math.abs(scores((1, 2)) - 2.0) < 1e-12)
  }

  test("preference scores cover the full user × chosen-entity cross product") {
    val embDf = UserPreference.embeddingsDf(spark, emb)
    val ue = UserPreference.userEmbeddings(flatSeq, embDf)
    val scores = UserPreference.preferenceScores(spark, ue, embDf, Seq(0, 1, 3))
    assert(scores.count() == 2 * 3)
  }
}
