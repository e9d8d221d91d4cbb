package repro.baselines

import org.apache.spark.sql.DataFrame
import org.apache.spark.sql.functions._
import repro.{SparkSpec, TestUtil}
import repro.TestUtil.planar

class MatchersSpec extends SparkSpec {

  /** Item frame (id, vec, text). */
  private def items(rows: Seq[(Long, Array[Double], String)]): DataFrame = {
    import spark.implicits._
    rows.map { case (i, v, t) => (i, v.toSeq, t) }.toDF("id", "vec", "text")
  }

  private def pairs(df: DataFrame): Set[(Long, Long)] =
    df.collect().map(r => (r.getLong(0), r.getLong(1))).toSet

  test("EmbeddingThresholdMatcher matches mutual nearest below m") {
    val a = items(Seq((1L, planar(0.0), "x"), (2L, planar(1.5), "y")))
    val b = items(Seq((10L, planar(0.05), "x"), (20L, planar(2.9), "z")))
    val out = pairs(EmbeddingThresholdMatcher(0.3).matchPairs(a, b))
    assert(out == Set((1L, 10L)))
  }

  test("AutoFJLite picks the threshold at the largest distance gap") {
    // Three near mutual pairs (dist ≈ 0.001) and one far-but-mutual pair
    // (≈ 0.08): the gap separates them, so only the near pairs match.
    val a = items(Seq(
      (1L, planar(0.00), ""), (2L, planar(0.50), ""), (3L, planar(1.00), ""), (4L, planar(2.0), "")))
    val b = items(Seq(
      (11L, planar(0.045), ""), (12L, planar(0.54), ""), (13L, planar(1.05), ""), (14L, planar(2.4), "")))
    val out = pairs(AutoFJLite(maxDist = 1.2).matchPairs(a, b))
    assert(out == Set((1L, 11L), (2L, 12L), (3L, 13L)))
  }

  test("AutoFJLite with under 3 candidates falls back to maxDist/2") {
    val a = items(Seq((1L, planar(0.0), "")))
    val b = items(Seq((10L, planar(0.1), "")))
    val out = pairs(AutoFJLite(maxDist = 0.9).matchPairs(a, b))
    assert(out == Set((1L, 10L))) // dist ≈ 0.005 ≤ 0.45
  }

  test("SupervisedMatcher (cos) filters by the learned threshold") {
    val a = items(Seq((1L, planar(0.0), ""), (2L, planar(1.0), "")))
    val b = items(Seq((10L, planar(0.1), ""), (20L, planar(1.8), "")))
    // dist(1,10) ≈ 0.005; dist(2,20) ≈ 0.31 — threshold at 0.1 keeps only the first
    val out = pairs(SupervisedMatcher("t", threshold = 0.1, "cos").matchPairs(a, b))
    assert(out == Set((1L, 10L)))
  }

  test("SupervisedMatcher (cos+jac) uses the blended score") {
    // Identical vectors (cos dist 0) but disjoint token sets (jac dist 1):
    // blended score = 0.5 → rejected at θ=0.4, accepted at θ=0.6.
    val a = items(Seq((1L, planar(0.0), "alpha beta")))
    val b = items(Seq((10L, planar(0.0), "gamma delta")))
    assert(pairs(SupervisedMatcher("t", 0.4, "cos+jac").matchPairs(a, b)).isEmpty)
    assert(pairs(SupervisedMatcher("t", 0.6, "cos+jac").matchPairs(a, b)) == Set((1L, 10L)))
  }

  test("jaccardDist handles identical, disjoint and null inputs") {
    assert(ThresholdLearner.jaccardDist("a b c", "a b c") == 0.0)
    assert(ThresholdLearner.jaccardDist("a b", "c d") == 1.0)
    assert(ThresholdLearner.jaccardDist(null, null) == 0.0)
    assert(math.abs(ThresholdLearner.jaccardDist("a b", "b c") - (1.0 - 1.0 / 3)) < 1e-9)
  }

  test("bestThreshold separates a clean bimodal sample") {
    val ex = Seq((0.05, true), (0.08, true), (0.10, true), (0.60, false), (0.70, false), (0.80, false))
    val th = ThresholdLearner.bestThreshold(ex)
    assert(th > 0.10 && th < 0.60, s"threshold=$th")
  }

  test("bestThreshold maximises F1 when classes overlap") {
    val ex = Seq((0.1, true), (0.2, true), (0.25, false), (0.3, true), (0.6, false), (0.7, false))
    val th = ThresholdLearner.bestThreshold(ex)
    // Cutting after 0.3 gives P=3/4, R=1, F1≈0.857 — the optimum here.
    assert(th > 0.3 && th < 0.6, s"threshold=$th")
  }

  test("bestThreshold of empty/positive-free samples is safe") {
    assert(ThresholdLearner.bestThreshold(Seq.empty) == 0.5)
    val th = ThresholdLearner.bestThreshold(Seq((0.4, false), (0.6, false)))
    assert(th < 0.4)
  }

  test("trainExamples labels sampled gt pairs positive and random pairs negative") {
    import spark.implicits._
    val its = items((0 until 20).map(i => (i.toLong, planar(i * 0.1), s"tok$i")))
    val gt = Seq((0L, 1L), (2L, 3L), (4L, 5L), (6L, 7L), (8L, 9L)).toDF("a", "b")
    val ex = ThresholdLearner.trainExamples(its, gt, "cos", ratio = 1.0, negPerPos = 2, seed = 3L)
    assert(ex.count(_._2) == 5)
    assert(ex.count(!_._2) > 0)
    assert(ex.forall { case (s, _) => s >= 0.0 && s <= 2.0 })
  }
}
