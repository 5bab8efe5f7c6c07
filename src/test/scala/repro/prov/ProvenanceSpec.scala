package repro.prov

import org.apache.spark.sql.Row
import org.apache.spark.sql.functions._
import repro.{Oracle, SparkSpec}
import repro.data.{Datasets, Queries}
import repro.datalog._

/** Ground-truth provenance checks straight from the paper's examples:
  * Fig 1/Ex 1 (2160 why-not derivations for AL(N, shared)), the Fig 3
  * running example, and Ex 9.
  */
class ProvenanceSpec extends SparkSpec {

  private lazy val rex    = Datasets.runningExample(spark)
  private lazy val airbnb = Datasets.airbnb(spark)
  private val tEx         = PTuple("Qex", Vector(Var("X"), Const(4L)))
  private val tAirbnb     = PTuple("AL", Vector(Var("N"), Const("shared")))

  // ------------------------------------------------------------ why capture

  test("why derivations of Qex(X,4) are the successful derivations of (1,4)") {
    val df = WhyProv.derivations(spark, Queries.rEx, Queries.rEx.rules.head, rex,
      PTuple("Qex", Vector(Var("X"), Const(4L)))).get
    val got = df.collect().map(r => (r.getLong(0), r.getLong(1))).toSet
    assert(got == Set((1L, 2L))) // X=1, Z=2 — the only successful derivation
    assert(df.columns.toSeq == Seq("X", "Z", "g0", "g1"))
    assert(df.collect().forall(r => r.getBoolean(2) && r.getBoolean(3)))
  }

  test("why derivations of the airbnb query match its two answers") {
    val df = WhyProv.derivations(spark, Queries.airbnb, Queries.airbnb.rules.head,
      airbnb, PTuple("AL", Vector(Var("N"), Var("R")))).get
    // Successful: cozy homebase (2445, $45) and modern view (2332, $350).
    assert(df.count() == 2)
  }

  test("why derivations respect a constant-bound head") {
    val df = WhyProv.derivations(spark, Queries.airbnb, Queries.airbnb.rules.head,
      airbnb, PTuple("AL", Vector(Const("modern view"), Var("R")))).get
    assert(df.count() == 1)
  }

  test("why provenance of an unmatched p-tuple is empty") {
    val df = WhyProv.derivations(spark, Queries.airbnb, Queries.airbnb.rules.head,
      airbnb, tAirbnb).get
    assert(df.isEmpty) // no shared room is an answer
  }

  // ------------------------------------------------- full why-not (Fig 1)

  test("Ex 1: 2160 why-not derivations for AL(N, shared) on S-Airbnb") {
    val df = FullWhyNot.derivations(spark, Queries.airbnb, Queries.airbnb.rules.head,
      airbnb, tAirbnb).get
    assert(df.count() == 2160) // 6 names × 6 ids × 3 ptypes × 5 neighbors × 4 prices
  }

  test("Ex 3: pattern p1 (apt, goals TF) covers 8 of 2160 derivations") {
    val df = FullWhyNot.derivations(spark, Queries.airbnb, Queries.airbnb.rules.head,
      airbnb, tAirbnb).get
    // Vars of unified rule: I, N (head), T, E, P → first-occurrence order
    // is N (head) then I, T, E, P.
    val u = Unify.unify(Queries.airbnb.rules.head, tAirbnb).get
    assert(u.unboundVars.map(_.name) == Vector("N", "I", "T", "E", "P"))
    // Goal 1 (listing exists, shared apt in queen anne) T, goal 2 (availability) F:
    // listings 8403 (central place, east) and 8575 (near spaceneedle, lower),
    // each at 4 possible prices.
    val covered = df.where(col("T") === "apt" && col("g0") === true && col("g1") === false)
      .where(col("N") === col("N")) // no-op, keeps lineage simple
    val rows = covered.collect()
    val consistent = rows.filter { r =>
      val byId = Map(8403L -> ("central place", "east"), 8575L -> ("near spaceneedle", "lower"))
      byId.get(r.getLong(r.fieldIndex("I")))
        .exists { case (n, e) => r.getString(r.fieldIndex("N")) == n && r.getString(r.fieldIndex("E")) == e }
    }
    assert(consistent.length == 8)
  }

  test("Fig 3: why-not of Qex(X,4) has 12 derivations over D = {1..6}") {
    // Domains: X bound to R.A (σ_{X<4} gives {1,2}∪... ); the paper uses
    // D = {1..6} for both variables, so override the domains.
    import spark.implicits._
    val d6  = Seq(1L, 2L, 3L, 4L, 5L, 6L).toDF("v")
    val cat = rex.withDomain("R", 0, d6).withDomain("R", 1, d6)
    val df  = FullWhyNot.derivations(spark, Queries.rEx, Queries.rEx.rules.head, cat, tEx).get
    // X ∈ {1,2,3} (X < 4), Z ∈ {1..6} = 18 bindings, minus the 6 derivations
    // of the existing answer (1,4) → 12.
    assert(df.count() == 12)
    assert(df.where(col("X") === 1L).isEmpty)
  }

  test("Ex 9: derivations for X=2 carry the goal annotations from the paper") {
    import spark.implicits._
    val d6  = Seq(1L, 2L, 3L, 4L, 5L, 6L).toDF("v")
    val cat = rex.withDomain("R", 0, d6).withDomain("R", 1, d6)
    val df  = FullWhyNot.derivations(spark, Queries.rEx, Queries.rEx.rules.head, cat, tEx).get
    val got = df.where(col("X") === 2L).collect()
      .map(r => (r.getLong(r.fieldIndex("Z")),
        (r.getBoolean(r.fieldIndex("g0")), r.getBoolean(r.fieldIndex("g1"))))).toMap
    // Per Ex 6: (2,2)-(F,T) since R(2,2) is absent but R(2,4) exists.
    // (Ex 9's derivation list is hypothetical — "assume that Prov(Φex) is".)
    // R(2,3), R(2,4) exist → g0=T for Z∈{3,4}; no R(Z,4) for Z≠2 → g1=F.
    assert(got == Map(
      1L -> (false, false), 2L -> (false, true), 3L -> (true, false),
      4L -> (true, false), 5L -> (false, false), 6L -> (false, false)))
  }

  test("goal annotations agree with DuckDB outer-join flags") {
    import spark.implicits._
    val d6  = Seq(1L, 2L, 3L, 4L, 5L, 6L).toDF("v")
    val cat = rex.withDomain("R", 0, d6).withDomain("R", 1, d6)
    val df  = FullWhyNot.derivations(spark, Queries.rEx, Queries.rEx.rules.head, cat, tEx).get
      .select(col("X"), col("Z"), col("g0").cast("string").as("g0"),
        col("g1").cast("string").as("g1"))
    Oracle.assertEquivalent(df,
      """WITH dom AS (SELECT * FROM (VALUES (1),(2),(3),(4),(5),(6)) AS t(v)),
        |bind AS (SELECT dx.v AS x, dz.v AS z FROM dom dx, dom dz WHERE dx.v < 4),
        |missing AS (
        |  SELECT b.* FROM bind b WHERE NOT EXISTS (
        |    SELECT 1 FROM R r1, R r2
        |    WHERE r1.r_b = r2.r_a AND CAST(r1.r_a AS BIGINT) < CAST(r2.r_b AS BIGINT)
        |      AND CAST(r2.r_b AS BIGINT) = 4 AND CAST(r1.r_a AS BIGINT) = b.x))
        |SELECT DISTINCT m.x AS X, m.z AS Z,
        |  CASE WHEN EXISTS (SELECT 1 FROM R r WHERE CAST(r.r_a AS BIGINT) = m.x
        |                      AND CAST(r.r_b AS BIGINT) = m.z)
        |       THEN 'true' ELSE 'false' END AS g0,
        |  CASE WHEN EXISTS (SELECT 1 FROM R r WHERE CAST(r.r_a AS BIGINT) = m.z
        |                      AND CAST(r.r_b AS BIGINT) = 4)
        |       THEN 'true' ELSE 'false' END AS g1
        |FROM missing m""".stripMargin,
      "R" -> rex.relation("R"))
  }

  test("why-not excludes derivations of existing answers") {
    val df = FullWhyNot.derivations(spark, Queries.rEx, Queries.rEx.rules.head, rex, tEx).get
    val answers = DatalogEval.restrictedAnswers(Queries.rEx, rex, tEx)
      .collect().map(_.getLong(0)).toSet
    val xs = df.select("X").collect().map(_.getLong(0)).toSet
    assert(xs.intersect(answers).isEmpty)
  }

  test("negated-goal annotation is inverted (r1 on a small license set)") {
    val cat = Datasets.license(spark, 200)
    val t   = PTuple("InvalidD", Vector(Const("swanton")))
    val df  = FullWhyNot.derivations(spark, Queries.r1, Queries.r1.rules.head, cat, t).get
    // Swanton licenses all VALID: derivations grounded on a real swanton
    // class-d license have g0 = T (listing exists) and g1 = F (¬VALID fails
    // because the id IS valid).
    val valid = cat.relation("VALID").collect().map(_.getLong(0)).toSet
    df.collect().foreach { (r: Row) =>
      val i  = r.getLong(r.fieldIndex("I"))
      val g1 = r.getBoolean(r.fieldIndex("g1"))
      assert(g1 == !valid.contains(i), s"¬VALID($i) should be ${!valid.contains(i)}")
    }
  }

  test("ground derivation: fully bound why-not question") {
    val t  = PTuple("Qex", Vector(Const(2L), Const(4L)))
    val u  = Unify.unify(Queries.rEx.rules.head, t).get
    assert(u.unboundVars.map(_.name) == Vector("Z"))
    val df = FullWhyNot.derivations(spark, Queries.rEx, Queries.rEx.rules.head, rex, t).get
    // Z ranges over adom of R's columns = {1,2,3,4,5,6}; (2,4) is missing →
    // all Z bindings are why-not derivations.
    assert(df.count() == 6)
  }

  test("ground derivation helper: violated comparison yields empty") {
    val t  = PTuple("Qex", Vector(Const(5L), Const(4L))) // 5 < 4 is false
    assert(FullWhyNot.derivations(spark, Queries.rEx, Queries.rEx.rules.head, rex, t).isEmpty)
  }

  test("why-not of an existing answer is empty") {
    val t  = PTuple("Qex", Vector(Const(1L), Const(4L))) // (1,4) exists
    val df = FullWhyNot.derivations(spark, Queries.rEx, Queries.rEx.rules.head, rex, t).get
    assert(df.isEmpty)
  }

  test("varDomain unions the domains of all attributes a variable binds to") {
    val u = Unify.unify(Queries.rEx.rules.head, tEx).get
    // Z occurs at R.B (atom 0 pos 1) and R.A (atom 1 pos 0): {2,3,4,5,6} ∪ {1,2,5}.
    val z = DerivationOps.varDomain(u.rule, Var("Z"), rex).collect().map(_.getLong(0)).toSet
    assert(z == Set(1L, 2L, 3L, 4L, 5L, 6L))
    // X occurs at R.A only, and X<4 is pushed below: {1,2,5} ∩ (<4) = {1,2}.
    val x = DerivationOps.varDomain(u.rule, Var("X"), rex).collect().map(_.getLong(0)).toSet
    assert(x == Set(1L, 2L))
  }

  test("groundComparisonsHold evaluates numeric and string constants") {
    def cmp(a: Any, op: CmpOp, b: Any) =
      Rule("t", "Q", Vector(Var("X")), Vector(Atom("R", Vector(Var("X"), Var("Y")))),
        Vector(Comparison(Const(a), op, Const(b))))
    assert(DerivationOps.groundComparisonsHold(cmp(3L, CmpOp.Lt, 4L)))
    assert(!DerivationOps.groundComparisonsHold(cmp(5L, CmpOp.Lt, 4L)))
    assert(DerivationOps.groundComparisonsHold(cmp("a", CmpOp.Neq, "b")))
    assert(DerivationOps.groundComparisonsHold(cmp(4L, CmpOp.Geq, 4L)))
    assert(DerivationOps.groundComparisonsHold(cmp("2016-11-09", CmpOp.Lt, "2016-11-10")))
  }
}
