package repro.baselines

import org.apache.spark.sql.DataFrame

/** ALMSER-GB proxy: a multi-source supervised matcher — the 5 % label budget
  * stands in for the active-learning queries, and the learned-threshold
  * matcher over *all* table pairs stands in for the graph-boosted model
  * (DESIGN.md substitutions). Like the original, it treats multi-table EM as
  * pairwise matching, so its tuples come from Algorithm 5 and it inherits
  * the transitive-conflict weakness the paper demonstrates.
  */
object AlmserLite {

  /** Learn the threshold from labeled examples and match all table pairs.
    *
    * @param tables  per-source item tables (id, vec, text)
    * @param items   all items unioned (for training-pair scoring)
    * @param gtPairs ground-truth matched pairs (a, b)
    * @return matched pairs (a, b)
    */
  def run(
      tables: Seq[DataFrame],
      items: DataFrame,
      gtPairs: DataFrame,
      labelRatio: Double = 0.05,
      seed: Long = 13L,
  ): DataFrame = {
    val examples = ThresholdLearner.trainExamples(items, gtPairs, "cos", labelRatio, negPerPos = 10, seed)
    val threshold = ThresholdLearner.bestThreshold(examples)
    val matcher = SupervisedMatcher("ALMSER-GB", threshold, "cos")
    Extensions.pairwise(tables, matcher)
  }
}
