package repro.ws

/** Weak-supervision label model (Appendix D).
  *
  * Models each candidate function as a noisy voter with a latent accuracy.
  * With conditionally independent voters, the pairwise agreement statistics
  * satisfy E[λi λj] = a_i a_j (in ±1 correlation space), so per-voter
  * accuracies are recoverable *without labels* via the closed-form triplet
  * method of Fu et al. [26]:  a_i = sqrt(|g_ij * g_ik / g_jk|).
  *
  * Votes are open-vocabulary strings (the paper's Assumption-3 gap); we use
  * string equality as the agreement signal and a single accuracy per
  * function — the paper's "class-conditional accuracies equal" constraint.
  * `None` marks an abstention and is excluded from agreement statistics
  * (the paper's Assumption-1 gap, supplied by Algorithm 1's `e`-based
  * abstention post-processing).
  */
object LabelModel {

  /** Pairwise agreement probability over documents where both functions
    * vote. Returns -1 when support < 3 (uninformative).
    */
  private def pairAgreement(vi: IndexedSeq[Option[String]],
                            vj: IndexedSeq[Option[String]]): Double = {
    var agree = 0; var both = 0
    var d = 0
    while (d < vi.length) {
      (vi(d), vj(d)) match {
        case (Some(a), Some(b)) => both += 1; if (a == b) agree += 1
        case _                  => ()
      }
      d += 1
    }
    if (both < 3) -1.0 else agree.toDouble / both
  }

  /** Estimate per-function accuracies from the vote matrix.
    *
    * In the open-vocabulary extraction setting, chance agreement between
    * two wrong voters is negligible (the value space is huge), so for
    * conditionally independent voters P(agree_ij) ≈ a_i * a_j and the
    * triplet identity becomes a_i = sqrt(p_ij * p_ik / p_jk) — a cleaner
    * fit than the ±1-correlation form used for binary classification.
    *
    * @param votes votes(doc)(fn): Some(value) or None (abstain)
    * @return accuracy in (0,1) per function
    */
  def fitAccuracies(votes: IndexedSeq[IndexedSeq[Option[String]]], nFns: Int): Array[Double] = {
    if (votes.isEmpty || nFns == 0) return Array.empty
    val byFn: IndexedSeq[IndexedSeq[Option[String]]] =
      (0 until nFns).map(j => votes.map(row => if (j < row.length) row(j) else None))

    val p = Array.fill(nFns, nFns)(-1.0)
    for (i <- 0 until nFns; j <- (i + 1) until nFns) {
      val a = pairAgreement(byFn(i), byFn(j))
      p(i)(j) = a; p(j)(i) = a
    }

    val eps = 0.05
    (0 until nFns).map { i =>
      val estimates = for {
        j <- 0 until nFns if j != i
        k <- (j + 1) until nFns if k != i
        if p(j)(k) > eps && p(i)(j) > eps && p(i)(k) > eps
      } yield math.sqrt(math.min(1.0, p(i)(j) * p(i)(k) / p(j)(k)))

      val a =
        if (estimates.nonEmpty) {
          val sorted = estimates.sorted
          sorted(sorted.size / 2) // median triplet estimate
        } else if (nFns == 2) {
          // Two voters are unidentifiable without labels: split the observed
          // agreement symmetrically.
          val agree = math.max(0.0, p(i)(1 - i))
          math.sqrt(agree)
        } else {
          // Degenerate agreement graph: fall back to agreement with the
          // per-document plurality (excluding abstentions).
          val plur = votes.map { row =>
            val cast = row.flatten
            if (cast.isEmpty) None
            else Some(cast.groupBy(identity).maxBy { case (v, g) => (g.size, v) }._1)
          }
          var agree = 0; var n = 0
          votes.indices.foreach { d =>
            (byFn(i)(d), plur(d)) match {
              case (Some(v), Some(pl)) => n += 1; if (v == pl) agree += 1
              case _                   => ()
            }
          }
          if (n == 0) 0.5 else agree.toDouble / n
        }
      // Post-filtering, voters are assumed better than random: clamp into
      // (0.5, 1) so log-odds weights are finite and non-negative.
      math.min(0.98, math.max(0.51, a))
    }.toArray
  }

  /** Log-odds voting weights from accuracies. */
  def weights(accuracies: Array[Double]): Array[Double] =
    accuracies.map(acc => math.log(acc / (1.0 - acc)))

  /** Final prediction for one document: weighted argmax over the document's
    * vote buckets. Ties break toward the lexicographically smaller value
    * for determinism. Returns "" when every function abstained.
    */
  def predict(row: IndexedSeq[Option[String]], w: Array[Double]): String = {
    val scores = scala.collection.mutable.Map.empty[String, Double]
    row.indices.foreach { j =>
      row(j).foreach { v =>
        val wj = if (j < w.length) w(j) else 0.0
        scores(v) = scores.getOrElse(v, 0.0) + wj
      }
    }
    if (scores.isEmpty) ""
    else scores.toSeq.minBy { case (v, s) => (-s, v) }._1
  }
}
