package repro.baselines

import org.apache.spark.sql.DataFrame
import org.apache.spark.sql.functions._
import repro.ann.{AnnConfig, MutualTopK}

/** A two-table matcher: the unit of the pairwise / chain extensions.
  * Input tables carry (id: Long, vec: Array[Double], text: String).
  * Output: matched pairs (a, b) with a from the left, b from the right.
  */
trait PairMatcher {
  def name: String
  def matchPairs(left: DataFrame, right: DataFrame): DataFrame
}

/** Shared candidate generation: mutual top-K by embedding distance. */
object Candidates {
  def mutual(left: DataFrame, right: DataFrame, k: Int, m: Double, ann: AnnConfig): DataFrame = {
    val cols = if (ann.exact) Seq("id", "vec") else Seq("id", "vec", "keys")
    MutualTopK.mutualPairs(left.select(cols.map(col): _*), right.select(cols.map(col): _*), k, m, ann)
      .select(col("lid") as "a", col("rid") as "b", col("dist"))
  }
}

/** Plain unsupervised embedding-threshold matcher (mutual top-1, dist ≤ m) —
  * the "two-table EM" kernel the paper's complexity analysis assumes.
  */
case class EmbeddingThresholdMatcher(m: Double, ann: AnnConfig = AnnConfig(exact = true), k: Int = 1)
    extends PairMatcher {
  val name = "EmbedThreshold"
  def matchPairs(left: DataFrame, right: DataFrame): DataFrame =
    Candidates.mutual(left, right, k, m, ann).select("a", "b")
}

/** AutoFuzzyJoin proxy: unsupervised, precision-first. Candidates are mutual
  * top-1 pairs under a loose cap; the match threshold is auto-programmed as
  * the midpoint of the largest gap in the sorted candidate-distance
  * distribution (a distribution-gap heuristic standing in for AutoFJ's
  * precision-target threshold search). See DESIGN.md substitutions.
  */
case class AutoFJLite(maxDist: Double = 0.9, ann: AnnConfig = AnnConfig(exact = true))
    extends PairMatcher {
  val name = "AutoFJ"
  def matchPairs(left: DataFrame, right: DataFrame): DataFrame = {
    val cand = Candidates.mutual(left, right, 1, maxDist, ann).localCheckpoint()
    val dists = cand.select("dist").collect().map(_.getDouble(0)).sorted
    if (dists.length < 3) return cand.filter(col("dist") <= maxDist / 2).select("a", "b")
    val gaps = dists.sliding(2).map(w => (w(1) - w(0), (w(0) + w(1)) / 2)).toSeq
    val threshold = gaps.maxBy(_._1)._2
    cand.filter(col("dist") <= threshold).select("a", "b")
  }
}

/** Supervised threshold matcher — the offline stand-in for fine-tuned-PLM
  * matchers (DittoLite) and prompt-tuned matchers (PromptEMLite). The match
  * score is either pure embedding cosine distance ("cos") or a 50/50 blend
  * with token-Jaccard distance ("cos+jac"); `threshold` is learned from the
  * 5 % labeled split by `ThresholdLearner`.
  */
case class SupervisedMatcher(
    name: String,
    threshold: Double,
    feature: String = "cos",
    candMax: Double = 1.2,
    ann: AnnConfig = AnnConfig(exact = true),
) extends PairMatcher {

  def matchPairs(left: DataFrame, right: DataFrame): DataFrame = {
    val cand = Candidates.mutual(left, right, 1, candMax, ann)
    val scored =
      if (feature == "cos") cand.withColumn("score", col("dist"))
      else {
        cand
          .join(left.select(col("id") as "a", col("text") as "ta"), Seq("a"))
          .join(right.select(col("id") as "b", col("text") as "tb"), Seq("b"))
          .withColumn("score", ThresholdLearner.blendCol(col("dist"), col("ta"), col("tb")))
      }
    scored.filter(col("score") <= threshold).select("a", "b")
  }
}

/** Learns the score threshold that maximises F1 on a labeled pair sample —
  * the training loop of the supervised proxies.
  */
object ThresholdLearner {

  /** Token-Jaccard distance between two strings. */
  def jaccardDist(a: String, b: String): Double = {
    val ta = Option(a).getOrElse("").toLowerCase.split("[^\\p{L}\\p{N}]+").filter(_.nonEmpty).toSet
    val tb = Option(b).getOrElse("").toLowerCase.split("[^\\p{L}\\p{N}]+").filter(_.nonEmpty).toSet
    if (ta.isEmpty && tb.isEmpty) 0.0
    else 1.0 - ta.intersect(tb).size.toDouble / ta.union(tb).size
  }

  private val jaccardUdf = udf((a: String, b: String) => jaccardDist(a, b))

  /** PromptEMLite's blended score: 0.5·cosDist + 0.5·jaccardDist. */
  def blendCol(dist: org.apache.spark.sql.Column, ta: org.apache.spark.sql.Column, tb: org.apache.spark.sql.Column): org.apache.spark.sql.Column =
    dist * 0.5 + jaccardUdf(ta, tb) * 0.5

  /** Best F1 threshold over (score, isMatch) examples: scans every candidate
    * cut between consecutive sorted scores.
    */
  def bestThreshold(examples: Seq[(Double, Boolean)]): Double = {
    if (examples.isEmpty) return 0.5
    val sorted = examples.sortBy(_._1)
    val nPos = sorted.count(_._2).toDouble
    if (nPos == 0) return sorted.head._1 / 2
    var tp = 0.0; var fp = 0.0
    var best = (0.0, sorted.head._1 / 2)
    sorted.zipWithIndex.foreach { case ((s, lbl), i) =>
      if (lbl) tp += 1 else fp += 1
      val p = tp / (tp + fp); val r = tp / nPos
      val f1 = if (p + r <= 0) 0.0 else 2 * p * r / (p + r)
      if (f1 > best._1) {
        val nxt = if (i + 1 < sorted.length) sorted(i + 1)._1 else s + 1e-6
        best = (f1, (s + nxt) / 2)
      }
    }
    best._2
  }

  /** Build a labeled training sample: `ratio` of ground-truth pairs as
    * positives plus `negPerPos` random non-matching pairs per positive,
    * scored with the given feature over (id, vec, text) items.
    */
  def trainExamples(
      items: DataFrame,
      gtPairs: DataFrame,
      feature: String,
      ratio: Double = 0.05,
      negPerPos: Int = 10,
      seed: Long = 13L,
  ): Seq[(Double, Boolean)] = {
    val pos = gtPairs.sample(withReplacement = false, math.min(1.0, ratio), seed).localCheckpoint()
    val nPos = pos.count()
    if (nPos == 0) return Seq.empty
    val ids = items.select(col("id")).orderBy(rand(seed)).limit((nPos * negPerPos * 2).toInt)
      .withColumn("rn", monotonically_increasing_id())
    val half = ids.count() / 2
    val neg = ids.filter(col("rn") < half).select(col("id") as "a", col("rn") as "j")
      .join(ids.filter(col("rn") >= half).select(col("id") as "b", (col("rn") - half) as "j"), Seq("j"))
      .filter(col("a") =!= col("b"))
      .select("a", "b")
    val score = scoreOf(items, feature)(_, _)
    val posScored = score(pos, true)
    val negScored = score(neg, false)
    posScored ++ negScored
  }

  private def scoreOf(items: DataFrame, feature: String)(pairs: DataFrame, label: Boolean): Seq[(Double, Boolean)] = {
    val l = items.select(col("id") as "a", col("vec") as "va", col("text") as "ta")
    val r = items.select(col("id") as "b", col("vec") as "vb", col("text") as "tb")
    val d = pairs
      .join(l, Seq("a")).join(r, Seq("b"))
      .withColumn("dist", repro.embed.VecOps.cosineDistCol(col("va"), col("vb")))
    val scored =
      if (feature == "cos") d.select(col("dist") as "score")
      else d.select(blendCol(col("dist"), col("ta"), col("tb")) as "score")
    scored.collect().map(row => (row.getDouble(0), label)).toSeq
  }
}
