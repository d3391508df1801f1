package repro.ws

import repro.eval.Metrics

/** Algorithm 1 — Function Aggregation (Evaporate-Code+, §3.3.2).
  *
  * Steps, as in the paper:
  *  2. collect function + LLM predictions on a sampled D_eval;
  *  3. estimate `e`, the fraction of D_eval where the LLM extracts a value,
  *     to decide whether empty function outputs are *abstentions* (high e:
  *     the attribute is usually present, the function just failed) or
  *     *predictions of no value* (low e);
  *  4. score each function against the LLM labels with Text F1 — over all
  *     eval docs in the low-e regime, only over LLM-non-empty docs in the
  *     high-e regime;
  *  5. filter functions scoring ≤ 0.5 (the classic WS better-than-random
  *     assumption, restored by construction);
  *  6. collect votes on the full lake, post-processing empties per `e`;
  *  7. bucket each document's open-vocabulary votes to the top-b values and
  *     aggregate with the weak-supervision label model.
  *
  * The ablation modes reproduce Table 4's columns.
  */
object Aggregation {

  sealed trait Mode
  /** Off-the-shelf majority vote: all candidates, empties are votes. */
  case object MajorityVote extends Mode
  /** Off-the-shelf WS: label model over all candidates, empties are votes. */
  case object WsRaw extends Mode
  /** WS + filter functions scoring ≤ 0.5 against the LLM labels. */
  case object WsFilter extends Mode
  /** Full Algorithm 1: WS + filtering + e-based abstention handling. */
  case object WsFull extends Mode

  val Tau: Double         = 0.5
  val ScoreFloor: Double  = 0.5
  val TopFunctions: Int   = 10
  val VoteBuckets: Int    = 4

  /** Step 3: e = fraction of eval docs where the LLM extracted a value. */
  def estimateE(lmLabels: Seq[String]): Double =
    if (lmLabels.isEmpty) 0.0 else lmLabels.count(_.nonEmpty).toDouble / lmLabels.size

  /** Step 4: score one function's eval outputs against the LLM labels. */
  def scoreFunction(fnOut: Seq[String], lmLabels: Seq[String], e: Double): Double = {
    require(fnOut.size == lmLabels.size)
    val pairs =
      if (e > Tau) fnOut.zip(lmLabels).filter(_._2.nonEmpty)
      else fnOut.zip(lmLabels)
    if (pairs.isEmpty) 0.0
    else pairs.map { case (f, l) => Metrics.textF1(f, l) }.sum / pairs.size
  }

  /** Steps 4–5: score all candidates; return (kept indices, scores).
    *
    * For the filtering modes this keeps the top-`TopFunctions` by score and
    * then drops any scoring ≤ `ScoreFloor` (an attribute can end up with no
    * surviving functions — it is then excluded from the output table, which
    * is what keeps Code+ precision high across providers, §4.4.2).
    */
  def selectFunctions(evalOutputs: Seq[Seq[String]], lmLabels: Seq[String],
                      e: Double, mode: Mode): (Seq[Int], Seq[Double]) = {
    val scores = evalOutputs.map(out => scoreFunction(out, lmLabels, e))
    mode match {
      case MajorityVote | WsRaw =>
        (evalOutputs.indices, scores)
      case WsFilter | WsFull =>
        val top = scores.zipWithIndex.sortBy { case (s, i) => (-s, i) }.take(TopFunctions)
        (top.filter(_._1 > ScoreFloor).map(_._2).sorted, scores)
    }
  }

  /** Step 6 post-processing: interpret one raw function output.
    *
    * Under full Algorithm 1 with high `e`, empty outputs are abstentions
    * (None); with low `e` they are genuine "no value" votes (Some("")).
    * The ablation modes never abstain — empties are always votes, which is
    * precisely the off-the-shelf-WS weakness the paper identifies.
    */
  def interpretVote(raw: String, e: Double, mode: Mode): Option[String] =
    if (raw.nonEmpty) Some(raw)
    else mode match {
      case WsFull if e > Tau => None
      case _                 => Some("")
    }

  /** Step 6/7 bucketing: keep each document's top-b distinct values by vote
    * count; votes outside the top-b become abstentions.
    */
  def bucketRow(row: IndexedSeq[Option[String]], b: Int = VoteBuckets): IndexedSeq[Option[String]] = {
    val counts = row.flatten.groupBy(identity).view.mapValues(_.size).toMap
    val top = counts.toSeq.sortBy { case (v, c) => (-c, v) }.take(b).map(_._1).toSet
    row.map(_.filter(top.contains))
  }

  /** Step 7: aggregate a full vote matrix into one prediction per document.
    *
    * @param rows docId -> raw outputs of the selected functions (aligned)
    * @return docId -> final extraction ("" = no value predicted)
    */
  def aggregate(rows: Seq[(String, IndexedSeq[String])], e: Double, mode: Mode): Map[String, String] = {
    if (rows.isEmpty) return Map.empty
    val nFns = rows.head._2.length
    val interpreted: IndexedSeq[(String, IndexedSeq[Option[String]])] =
      rows.toIndexedSeq.map { case (id, raw) =>
        id -> bucketRow(raw.map(interpretVote(_, e, mode)))
      }

    val w: Array[Double] = mode match {
      case MajorityVote => Array.fill(nFns)(1.0)
      case _            => LabelModel.weights(LabelModel.fitAccuracies(interpreted.map(_._2), nFns))
    }

    interpreted.map { case (id, row) => id -> LabelModel.predict(row, w) }.toMap
  }
}
