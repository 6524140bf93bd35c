package repro.core.learn

import scala.util.Random

import repro.core.db.{Database, DatasetSpec, Example}
import repro.core.logic.{Clause, Definition}
import repro.spark.SimIndex

/** Statistics of one learning run. */
final case class LearnStats(
    groundMs: Long,
    learnMs: Long,
    clauses: Int,
    literals: Int,
) {
  def totalMs: Long = groundMs + learnMs
}

/** The DLearn covering-loop learner (paper Algorithm 1 + Sec. 4), also used
  * for every baseline via [[LearnParams]] / [[DatasetSpec]] configuration:
  * Castor-NoMD (`MdMode.NoMd`), Castor-Exact (`MdMode.ExactMd` over
  * `spec.withExactMdJoins`), Castor-Clean (ExactMd over the resolved
  * database), DLearn (`MdMode.SimMd`), DLearn-CFD (`useCfdGroups = true`),
  * DLearn-Repaired (SimMd over the minimally repaired database).
  */
final class DLearn(
    db: Database,
    spec: DatasetSpec,
    simIndex: SimIndex,
    params: LearnParams,
) {
  val builder  = new BottomBuilder(db, spec, simIndex, params)
  val coverage = new Coverage(spec.cfds, db.schema, params)

  /** Learn a definition from training examples. Ground bottom-clauses may be
    * passed in pre-computed (they are fold-independent); otherwise they are
    * built here and counted in `groundMs`.
    */
  def learn(
      trainPos: Seq[Example],
      trainNeg: Seq[Example],
      preGround: Option[(Vector[GroundEx], Vector[GroundEx])] = None,
  ): (Definition, LearnStats) = {
    val t0 = System.nanoTime()
    val (posG, negG) = preGround.getOrElse(
      (coverage.groundAll(builder, trainPos), coverage.groundAll(builder, trainNeg))
    )
    val t1  = System.nanoTime()
    val rng = new Random(params.seed)

    var uncovered = posG
    val clauses   = Vector.newBuilder[Clause]
    var nClauses  = 0
    var nLits     = 0
    val trace     = sys.props.contains("repro.trace")
    def t(label: String, since: Long): Unit =
      if (trace) Console.err.println(f"[dlearn] $label ${(System.nanoTime() - since) / 1e9}%.1fs")

    while (uncovered.nonEmpty && nClauses < params.maxClauses) {
      val seed = uncovered.head
      var best = builder.build(seed.ex, variabilize = true)

      // During the generalization search, score candidates on a fixed sample
      // of the training examples (full counts decide acceptance below) — the
      // candidate clauses of early rounds are near-bottom-sized and coverage
      // tests dominate learning time (paper Sec. 4.3).
      val posEval =
        if (uncovered.length <= params.evalPosCap) uncovered
        else rng.shuffle(uncovered).take(params.evalPosCap)
      val negEval =
        if (negG.length <= params.evalNegCap) negG
        else rng.shuffle(negG).take(params.evalNegCap)

      val tSeed = System.nanoTime()
      var (bestPos, bestNeg) = coverage.counts(best, posEval, negEval)
      var bestScore = bestPos - bestNeg
      t(s"seed-counts body=${best.body.size}", tSeed)

      var improved = true
      while (improved) {
        improved = false
        val bestExp = coverage.expand(best)
        val notCovered = uncovered.filterNot(g => coverage.coversPos(bestExp, g))
        val sample     = rng.shuffle(notCovered).take(params.candidateSample)
        if (sample.nonEmpty) {
          val cands = Par.map(sample) { g =>
            val c = Generalize.armg(best, g.raw, params.maxFrontier)
            if (c.headConnected && c.body.nonEmpty) Some(c) else None
          }.flatten.distinct
          if (cands.nonEmpty) {
            val tSc = System.nanoTime()
            // Near-bottom candidates (early rounds) are by far the most
            // expensive to test; score them on a half-size sample. Scores are
            // only compared within one round, so the sample just needs to be
            // fixed across the round's candidates.
            val big  = cands.exists(_.body.size > 50)
            val pEv  = if (big) posEval.take(math.max(10, posEval.size / 2)) else posEval
            val nEv  = if (big) negEval.take(math.max(20, negEval.size / 2)) else negEval
            val scored = cands.map { c =>
              val (p, n) = coverage.counts(c, pEv, nEv)
              (c, p, n, p - n)
            }
            t(s"score ${cands.size} cands avgBody=${cands.map(_.body.size).sum / cands.size}", tSc)
            val (c, p0, n0, _) = scored.maxBy(x => (x._4, -x._1.body.length))
            // Half-sample scores are only comparable within the round; the
            // winner is re-scored on the full eval sample before being
            // compared against the incumbent.
            val (p, n) = if (big) coverage.counts(c, posEval, negEval) else (p0, n0)
            if (p - n > bestScore) {
              best = c; bestPos = p; bestNeg = n; bestScore = p - n; improved = true
            }
          }
        }
      }

      // Full-count acceptance.
      val tAcc = System.nanoTime()
      val (fullPos, fullNeg) = coverage.counts(best, uncovered, negG)
      t(s"accept-counts body=${best.body.size}", tAcc)
      bestPos = fullPos; bestNeg = fullNeg
      val precision =
        if (bestPos + bestNeg == 0) 0.0 else bestPos.toDouble / (bestPos + bestNeg)
      if (
        best.headConnected && bestPos >= params.minPosCovered &&
        precision >= params.minPrecision
      ) {
        val tRed = System.nanoTime()
        if (params.reduceClauses)
          best = reduce(best, posEval.take(20), negEval.take(50))
        t(s"reduce body=${best.body.size}", tRed)
        clauses += best
        nClauses += 1
        nLits += best.body.length
        val bExp = coverage.expand(best)
        uncovered = uncovered.filterNot(g => coverage.coversPos(bExp, g))
      } else {
        uncovered = uncovered.tail // discard the seed example (noise / unlearnable)
      }
    }

    val t2 = System.nanoTime()
    (
      Definition(clauses.result()),
      LearnStats((t1 - t0) / 1000000, (t2 - t1) / 1000000, nClauses, nLits),
    )
  }

  /** Negative-based clause reduction (ProGolem/Castor): drop body literals as
    * long as positive coverage does not shrink and negative coverage does not
    * grow — yields the paper's compact clauses and speeds up later coverage
    * tests. Dropping only generalizes, so positives can only grow; requiring
    * unchanged negatives keeps the clause's score. Decisions are made on the
    * (small) sampled example sets passed in; literals are attempted from the
    * end of the body first — BFS emits the speculative deep literals last.
    */
  private def reduce(c: Clause, pos: Vector[GroundEx], neg: Vector[GroundEx]): Clause = {
    var cur      = c
    var (p0, n0) = coverage.counts(cur, pos, neg)
    var i        = cur.body.length - 1
    while (i >= 0) {
      if (i < cur.body.length) {
        val cand = Clause(cur.head, cur.body.patch(i, Nil, 1), cur.groups).normalized.pruneGroups
        val ok   = cand.body.nonEmpty && cand.headConnected && cand.body.length < cur.body.length
        if (ok) {
          val (p, n) = coverage.counts(cand, pos, neg)
          if (p >= p0 && n <= n0) { cur = cand; p0 = p; n0 = n }
        }
      }
      i -= 1
    }
    cur
  }

  /** Does the learned definition predict `g` positive? (Def. 3.4 semantics,
    * any-clause.)
    */
  def predicts(defn: Definition, g: GroundEx): Boolean =
    defn.clauses.exists(c => coverage.coversPos(coverage.expand(c), g))
}
