package repro.summarize

import repro.SparkSpec
import repro.data.{Datasets, Queries}
import repro.datalog._

class SummarizerSpec extends SparkSpec {

  private lazy val airbnb = Datasets.airbnb(spark)
  private lazy val rex    = Datasets.runningExample(spark)

  test("airbnb why-not summary (FULL): the paper's narrative patterns emerge") {
    val res = Summarizer.summarize(spark, Queries.airbnb, airbnb, Queries.whynotAirbnb,
      Summarizer.Config(nS = 0, k = 3, full = true))
    assert(res.summary.patterns.size == 3)
    assert(math.abs(res.provEstimate - 2160.0) < 1e-9)
    // Ex 3's pattern (shared apts in Queen Anne unavailable) must be among
    // the generated candidates with exact completeness 8/2160.
    val apt = res.allPatterns.find(p =>
      p.goals == Vector(true, false) && p.args == Vector(None, None, Some("apt"), None, None))
    assert(apt.isDefined)
    assert(math.abs(apt.get.cp - 8.0 / 2160.0) < 1e-12)
    // The top-3 summary covers a nontrivial fraction with nonzero info.
    assert(res.summary.cpLow > 0.3)
    assert(res.summary.info > 0.0)
  }

  test("airbnb why-not summary via sampling approximates the FULL one") {
    val full = Summarizer.summarize(spark, Queries.airbnb, airbnb, Queries.whynotAirbnb,
      Summarizer.Config(k = 3, full = true))
    val sampled = Summarizer.summarize(spark, Queries.airbnb, airbnb, Queries.whynotAirbnb,
      Summarizer.Config(nS = 1000, k = 3, seed = 13L))
    assert(sampled.summary.patterns.size == 3)
    // Quality metrics within a loose sampling tolerance of the exact ones.
    assert(math.abs(sampled.summary.info - full.summary.info) < 0.35)
    assert(math.abs(sampled.summary.cpLow - full.summary.cpLow) < 0.25)
  }

  test("why summary on the running example") {
    val res = Summarizer.summarize(spark, Queries.rEx, rex,
      ProvQuestion(PTuple("Qex", Vector(Var("X"), Var("Y"))), Why),
      Summarizer.Config(nS = 100, k = 2))
    // 3 successful derivations: (1,3,2), (1,4,2), (5,6,5); all goals T.
    assert(math.abs(res.provEstimate - 3.0) < 1e-9)
    assert(res.summary.patterns.nonEmpty)
    res.summary.patterns.foreach(p => assert(p.goals == Vector(true, true)))
  }

  test("why-not summary on the running example (exact, tiny space)") {
    val res = Summarizer.summarize(spark, Queries.rEx, rex, Queries.whynotEx,
      Summarizer.Config(nS = 100, k = 3))
    assert(res.ruleSamples.head.exact) // 12-derivation space → full enumeration
    assert(math.abs(res.provEstimate - 6.0) < 1e-9) // X∈{1,2}: 12 bindings − 6 of (1,4)
    assert(res.summary.patterns.nonEmpty)
  }

  test("empty provenance yields an empty summary") {
    val res = Summarizer.summarize(spark, Queries.rEx, rex,
      ProvQuestion(PTuple("Qex", Vector(Const(1L), Const(4L))), Whynot),
      Summarizer.Config(nS = 10, k = 3))
    assert(res.summary.patterns.isEmpty)
    assert(res.allPatterns.isEmpty)
  }

  test("union query: summary draws patterns per rule and weights them") {
    val cat = Datasets.movies(spark, 80)
    val res = Summarizer.summarize(spark, Queries.r4, cat, Queries.whynotR4,
      Summarizer.Config(nS = 60, k = 3, seed = 3L))
    assert(res.ruleSamples.size == 3) // r4, r4', r4'' all contribute
    val ruleNames = res.allPatterns.map(_.ruleName).toSet
    assert(ruleNames.subsetOf(Set("r4", "r4p", "r4pp")) && ruleNames.nonEmpty)
    // Weights sum to 1 across rules: total cp of the all-placeholder
    // patterns (one per rule+goal-vector, covering everything) is ≤ 1.
    assert(res.allPatterns.forall(p => p.cp <= 1.0 + 1e-9))
    assert(res.summary.patterns.nonEmpty)
  }

  test("stage times are populated") {
    val res = Summarizer.summarize(spark, Queries.rEx, rex, Queries.whynotEx,
      Summarizer.Config(nS = 50, k = 2))
    assert(res.times.totalMs >= 0)
    assert(res.times.sampleMs >= 0 && res.times.lcaMs >= 0)
  }

  test("whynot on r1: sampled patterns reflect the valid-swanton structure") {
    val cat = Datasets.license(spark, 300)
    val res = Summarizer.summarize(spark, Queries.r1, cat, Queries.whynotR1,
      Summarizer.Config(nS = 200, k = 3, seed = 5L))
    assert(res.summary.patterns.nonEmpty)
    // Every swanton license is valid, so derivations grounded in a real
    // swanton class-d license fail only on ¬VALID: goal vector (T, F)
    // patterns exist, and no derivation has (T, T) (that would be an answer).
    assert(!res.allPatterns.exists(_.goals == Vector(true, true)))
  }

  test("why summary on r2 covers the witness derivation") {
    val cat = Datasets.license(spark, 300)
    val res = Summarizer.summarize(spark, Queries.r2, cat, Queries.whyR2,
      Summarizer.Config(nS = 100, k = 3))
    assert(res.provEstimate >= 1.0)
    res.summary.patterns.foreach(p => assert(p.goals.forall(identity)))
  }

  test("determinism: same seed, same summary") {
    val a = Summarizer.summarize(spark, Queries.airbnb, airbnb, Queries.whynotAirbnb,
      Summarizer.Config(nS = 300, k = 3, seed = 21L))
    val b = Summarizer.summarize(spark, Queries.airbnb, airbnb, Queries.whynotAirbnb,
      Summarizer.Config(nS = 300, k = 3, seed = 21L))
    assert(a.summary.patterns == b.summary.patterns)
  }
}
