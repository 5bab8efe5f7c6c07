package repro.prov

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.functions._
import repro.datalog._

/** Why-provenance capture by query instrumentation (paper §4, following
  * PUG [22, 20]): the successful derivations of a rule are exactly the
  * satisfying valuations of its body, which [[DatalogEval.bindings]]
  * produces; all goal annotations are T for a successful derivation
  * (negated goals succeed when the tuple is absent, Def. 1).
  */
object WhyProv {

  /** Annotated why-provenance derivations of one rule for p-tuple `t`:
    * columns = unbound variables of the unified rule + `g0..g(m-1)` (all
    * true). Returns None when the rule cannot match `t`.
    */
  def derivations(
      spark: SparkSession,
      program: Program,
      rule: Rule,
      catalog: Catalog,
      t: PTuple,
  ): Option[DataFrame] =
    Unify.unify(rule, t).map { u =>
      if (u.unboundVars.isEmpty)
        DerivationOps.groundDerivation(spark, program, u.rule, catalog, t, Why)
      else {
        val b = DatalogEval.bindings(u.rule, catalog)
        val goals = u.rule.atoms.indices.map(i => lit(true).as(s"g$i"))
        b.select(u.unboundVars.map(v => col(v.name)) ++ goals: _*)
      }
    }
}

/** Exhaustive why-not enumeration — the paper's FULL baseline (§9.1) and
  * the ground truth for tests. Cross-joins the complete per-variable
  * domains instead of sampling; everything downstream (answer anti-join,
  * goal annotation) is shared with the batch sampler. Cost is
  * O(Π|D_X|) = O(|D|^n), which is the point: it is only feasible for tiny
  * domains.
  */
object FullWhyNot {

  /** All annotated derivations in Whynot(Q, D, t) contributed by `rule`.
    * Columns = unbound variables + `g0..g(m-1)`. None when the rule cannot
    * match `t` or its ground comparisons are violated.
    */
  def derivations(
      spark: SparkSession,
      program: Program,
      rule: Rule,
      catalog: Catalog,
      t: PTuple,
  ): Option[DataFrame] =
    Unify.unify(rule, t).flatMap { u =>
      if (!DerivationOps.groundComparisonsHold(u.rule)) None
      else if (u.unboundVars.isEmpty)
        Some(DerivationOps.groundDerivation(spark, program, u.rule, catalog, t, Whynot))
      else {
        val domains = u.unboundVars.map(v => DerivationOps.varDomain(u.rule, v, catalog))
        val cross   = domains.reduce(_.crossJoin(_))
        val bound   = DerivationOps.applyJoinComparisons(cross, u.rule)
        val missing = DerivationOps.removeExisting(bound, program, catalog, t, u.rule)
        Some(DerivationOps.annotate(missing, u.rule, catalog))
      }
    }
}
