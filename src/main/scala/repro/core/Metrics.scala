package repro.core

/** Quality metrics from Sec. 2.1 of the paper: approximation ratio (Def. 1),
  * average precision AP@k (Def. 2) and mean average precision MAP@k (Def. 3).
  *
  * `truth` and `answer` are *ordered* id lists: `truth(0)` is the exact
  * nearest neighbour. Distances for the ratio are passed separately so the
  * metric code stays independent of how a method computed its answers.
  */
object Metrics {

  /** Def. 1: c = (1/k) Σ d(q, o'_i) / d(q, o_i).
    *
    * `answerDists(i)` and `truthDists(i)` are the distances of the i-th
    * returned / true neighbour from q. If a true distance is 0 (query is a
    * database point) that term contributes 1 when the answer distance is
    * also 0, else it is skipped — mirrors how the released implementations
    * guard the division.
    */
  def approximationRatio(answerDists: Seq[Double], truthDists: Seq[Double]): Double = {
    require(answerDists.length == truthDists.length, "ratio needs equal-length lists")
    val k = truthDists.length
    require(k > 0, "empty answer")
    var s = 0.0
    var used = 0
    var i = 0
    while (i < k) {
      if (truthDists(i) > 0) { s += answerDists(i) / truthDists(i); used += 1 }
      else if (answerDists(i) == 0) { s += 1.0; used += 1 }
      i += 1
    }
    if (used == 0) 1.0 else s / used
  }

  /** Def. 2: AP@k = (1/k) Σ_{i=1..k} [ I(o'_i ∈ T_k) · (j/i) ] where j is the
    * number of the first i returned items that appear in the true set.
    */
  def apAtK(truth: Seq[Long], answer: Seq[Long], k: Int): Double = {
    require(k > 0, "k must be positive")
    val truthSet = truth.take(k).toSet
    var j = 0
    var s = 0.0
    var i = 0
    val a = answer.take(k)
    while (i < a.length) {
      if (truthSet.contains(a(i))) {
        j += 1
        s += j.toDouble / (i + 1)
      }
      i += 1
    }
    s / k
  }

  /** Def. 3: mean of AP@k over the query set. */
  def mapAtK(perQuery: Seq[(Seq[Long], Seq[Long])], k: Int): Double = {
    require(perQuery.nonEmpty, "no queries")
    perQuery.map { case (truth, answer) => apAtK(truth, answer, k) }.sum / perQuery.size
  }

  /** Recall@k — not a paper metric but useful in tests: |T_k ∩ A_k| / k. */
  def recallAtK(truth: Seq[Long], answer: Seq[Long], k: Int): Double =
    truth.take(k).toSet.intersect(answer.take(k).toSet).size.toDouble / k
}
