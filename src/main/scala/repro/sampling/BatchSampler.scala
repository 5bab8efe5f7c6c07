package repro.sampling

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.expressions.Window
import org.apache.spark.sql.functions._
import repro.datalog._
import repro.prov.{DerivationOps, FullWhyNot, WhyProv}

/** Batch sampling of why-not (and why) provenance (paper §5).
  *
  * The sampling pipeline is compiled entirely into a Catalyst plan:
  *
  *  - `Q_X`  — per unbound variable, `n_OS` values drawn uniformly with
  *    replacement from the variable's domain, keyed by a zip id (the
  *    paper's `#_id(SAMPLE_nOS(σ_θX(D_A1 ∪ …)))`). The SAMPLE operator is
  *    realized as an equi-join between `range(n_OS)` with a deterministic
  *    hash index and the `row_number`-indexed domain, so it stays a pure
  *    relational plan and is reproducible from the seed.
  *  - `Q_bind` — natural join of the `Q_X` on the zip id + `θ_join`.
  *  - `Q_der`  — anti-join against σ_t(Q) (shared with [[FullWhyNot]]).
  *  - `Q_sample` — outer-join goal annotation + δ (shared).
  *
  * `n_OS` comes from [[OverSampling]] so that with probability `P_success`
  * at least `n_S` draws survive both `θ_join` and the missing-answer filter.
  */
object BatchSampler {

  /** Tuning knobs for one sampling run. */
  final case class Config(
      nS: Int = 1000,
      pSuccess: Double = 0.999,
      seed: Long = 42L,
      nOSCap: Long = 2_000_000L,
      /** Below `fullEnumFactor * nS` estimated derivations, skip sampling and
        * enumerate the space exactly — cheaper and exact.
        */
      fullEnumFactor: Double = 4.0,
  )

  /** The sample of one rule's provenance plus the estimates the summarizer
    * needs downstream.
    *
    * @param sample       annotated derivations (unbound-var cols + g cols), cached
    * @param sampleCount  |sample| (≤ nS; the denominator of cp estimates)
    * @param nOS          over-sampling size used (0 when FULL enumeration ran)
    * @param provEstimate estimated |Prov_r(Φ)| — used to weight rules of a
    *                     union when merging their patterns (paper §5.2
    *                     "Queries With Multiple Rules")
    * @param exact        true when the sample IS the full provenance
    */
  final case class RuleSample(
      rule: Rule,
      unified: Unify.Unified,
      sample: DataFrame,
      varCols: Seq[String],
      goalColNames: Seq[String],
      sampleCount: Long,
      nOS: Long,
      provEstimate: Double,
      exact: Boolean,
  )

  /** `#_id(SAMPLE_n(dom))`: n values drawn with replacement, zip-keyed by
    * `__sid`. Deterministic in `seed`.
    */
  def sampleWithReplacement(
      spark: SparkSession,
      dom: DataFrame,
      domCount: Long,
      n: Long,
      seed: Long,
      asName: String,
  ): DataFrame = {
    require(domCount > 0, s"empty domain for $asName")
    val indexed = dom
      .withColumn("__rid", row_number().over(Window.orderBy(dom.columns.head)))
    val picks = spark
      .range(n)
      .select(
        col("id").as("__sid"),
        (pmod(xxhash64(col("id"), lit(seed)), lit(domCount)) + 1).as("__rid"),
      )
    picks
      .join(indexed, "__rid")
      .select(col("__sid"), col(dom.columns.head).as(asName))
  }

  /** Deterministically keep at most `n` rows of an annotated-derivation
    * DataFrame (uniform given the upstream sample is uniform).
    */
  def takeN(df: DataFrame, n: Long, seed: Long): DataFrame = {
    val cols = df.columns.map(col).toSeq
    df.orderBy(xxhash64(cols :+ lit(seed): _*)).limit(n.toInt)
  }

  /** Sample the why-not provenance contributed by `rule` to question
    * `(t, Whynot)`. Returns None when the rule cannot produce derivations
    * matching `t` (head clash, violated ground comparison, empty domain,
    * or no missing answers).
    */
  def whynotSample(
      spark: SparkSession,
      program: Program,
      rule: Rule,
      catalog: Catalog,
      t: PTuple,
      cfg: Config,
  ): Option[RuleSample] = {
    val unifiedOpt = Unify.unify(rule, t)
    if (unifiedOpt.isEmpty) return None
    val u = unifiedOpt.get
    if (!DerivationOps.groundComparisonsHold(u.rule)) return None
    val m = u.rule.atoms.size

    if (u.unboundVars.isEmpty) {
      val df = DerivationOps.groundDerivation(spark, program, u.rule, catalog, t, Whynot).cache()
      val c  = df.count()
      return Some(RuleSample(rule, u, df, Nil, DerivationOps.goalCols(m), c, 0L, c.toDouble, exact = true))
    }

    // Domain sizes drive |A(Q,D,t)| and the over-sampling size.
    val domains = u.unboundVars.map { v =>
      val d = DerivationOps.varDomain(u.rule, v, catalog).cache()
      (v, d, d.count())
    }
    if (domains.exists(_._3 == 0L)) return None
    val domSize  = domains.map { case (v, _, c) => v -> c }.toMap
    val spaceSize = domains.map(_._3.toDouble).product

    // p_notProv: fraction of the space deriving an existing answer matching t
    // (paper §5.3). #derivations per existing answer = Π over existential
    // unbound vars of |D_X|, so p_notProv = nExisting / Π over head-unbound
    // vars of |D_X|.
    val headUnbound = u.rule.headArgs.collect { case v: Var => v }.distinct
    val nExisting   = DatalogEval.restrictedAnswers(program, catalog, t).count()
    val headSpace   = headUnbound.map(v => domSize(v).toDouble).product
    val pNotProv =
      if (headUnbound.isEmpty) { if (nExisting > 0) 1.0 else 0.0 }
      else math.min(1.0, nExisting / headSpace)

    // θ_join selectivity (paper §5.3 "Handling Predicates").
    val sel = u.rule.comparisons.filter(_.isVarVar).map { c =>
      val (l, r) = (c.left.asInstanceOf[Var], c.right.asInstanceOf[Var])
      OverSampling.cmpSelectivity(c.op, domSize(l), domSize(r))
    }.product

    val pDraw        = sel * (1.0 - pNotProv)
    val provEstimate = spaceSize * pDraw
    if (pDraw <= 0.0) return None

    if (spaceSize <= cfg.fullEnumFactor * cfg.nS) {
      // Small space: enumerate exactly instead of sampling. (A small
      // provenance inside a huge space must still be sampled — enumeration
      // cost is O(spaceSize), not O(provenance).)
      val full = FullWhyNot.derivations(spark, program, rule, catalog, t).get.cache()
      val c    = full.count()
      return Some(RuleSample(rule, u, full, u.unboundVars.map(_.name),
        DerivationOps.goalCols(m), c, 0L, c.toDouble, exact = true))
    }

    val nOS = OverSampling.minOverSample(cfg.nS, pDraw, cfg.pSuccess, cfg.nOSCap)

    // Q_X + Q_bind: zip the per-variable samples, apply θ_join.
    val qxs = domains.zipWithIndex.map { case ((v, d, c), i) =>
      sampleWithReplacement(spark, d, c, nOS, cfg.seed + 7919L * (i + 1), v.name)
    }
    val qbind   = qxs.reduce(_.join(_, "__sid"))
    val bound   = DerivationOps.applyJoinComparisons(qbind, u.rule).drop("__sid")
    val missing = DerivationOps.removeExisting(bound, program, catalog, t, u.rule)
    val annotated = DerivationOps.annotate(missing, u.rule, catalog).distinct()
    val sample  = takeN(annotated, cfg.nS, cfg.seed).cache()
    val c       = sample.count()
    if (c == 0) None
    else Some(RuleSample(rule, u, sample, u.unboundVars.map(_.name),
      DerivationOps.goalCols(m), c, nOS, provEstimate, exact = false))
  }

  /** Sample the why provenance contributed by `rule`: capture the successful
    * derivations exactly (PUG instrumentation, paper §4) and keep `n_S` of
    * them uniformly.
    */
  def whySample(
      spark: SparkSession,
      program: Program,
      rule: Rule,
      catalog: Catalog,
      t: PTuple,
      cfg: Config,
  ): Option[RuleSample] = {
    val unifiedOpt = Unify.unify(rule, t)
    if (unifiedOpt.isEmpty) return None
    val u = unifiedOpt.get
    if (!DerivationOps.groundComparisonsHold(u.rule)) return None
    val all = WhyProv.derivations(spark, program, rule, catalog, t).get.cache()
    val total = all.count()
    if (total == 0) return None
    val exact  = total <= cfg.nS
    val sample = if (exact) all else takeN(all, cfg.nS, cfg.seed).cache()
    val c      = if (exact) total else sample.count()
    Some(RuleSample(rule, u, sample, u.unboundVars.map(_.name),
      DerivationOps.goalCols(u.rule.atoms.size), c, 0L, total.toDouble, exact))
  }
}
