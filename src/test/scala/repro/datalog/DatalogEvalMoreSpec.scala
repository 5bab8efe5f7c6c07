package repro.datalog

import org.apache.spark.sql.functions._
import repro.{Oracle, SparkSpec}
import repro.data.{Datasets, Queries}

/** Additional oracle-checked evaluation cases: every comparison operator,
  * multiple negations, unions with overlapping answers, TPC-H r10, and the
  * synthetic chain/star queries used in Fig 9.
  */
class DatalogEvalMoreSpec extends SparkSpec {

  private lazy val rex = Datasets.runningExample(spark)

  private def q1(op: CmpOp) = Program(Rule("r", "Q", Vector(Var("X"), Var("Y")),
    Vector(Atom("R", Vector(Var("X"), Var("Y")))),
    Vector(Comparison(Var("X"), op, Const(3L)))))

  test("every comparison operator against DuckDB") {
    for (op <- CmpOp.all) {
      val df = DatalogEval.answers(q1(op), rex).select(col("c0"), col("c1"))
      Oracle.assertEquivalent(df,
        s"""SELECT DISTINCT CAST(r_a AS BIGINT) AS c0, CAST(r_b AS BIGINT) AS c1
           |FROM R WHERE CAST(r_a AS BIGINT) ${op.sql} 3""".stripMargin,
        "R" -> rex.relation("R"))
    }
  }

  test("variable-variable comparison against DuckDB") {
    val p = Program(Rule("r", "Q", Vector(Var("X"), Var("Y")),
      Vector(Atom("R", Vector(Var("X"), Var("Y")))),
      Vector(Comparison(Var("X"), CmpOp.Geq, Var("Y")))))
    Oracle.assertEquivalent(
      DatalogEval.answers(p, rex).select(col("c0"), col("c1")),
      """SELECT DISTINCT CAST(r_a AS BIGINT) AS c0, CAST(r_b AS BIGINT) AS c1
        |FROM R WHERE CAST(r_a AS BIGINT) >= CAST(r_b AS BIGINT)""".stripMargin,
      "R" -> rex.relation("R"))
  }

  test("two negated goals against DuckDB") {
    // Sources with no self-loop and no edge to 4.
    val p = Program(Rule("r", "Q", Vector(Var("X")),
      Vector(
        Atom("R", Vector(Var("X"), Var("Y"))),
        Atom("R", Vector(Var("X"), Var("X")), negated = true),
        Atom("R", Vector(Var("X"), Const(4L)), negated = true))))
    Oracle.assertEquivalent(
      DatalogEval.answers(p, rex).select(col("c0")),
      """SELECT DISTINCT CAST(r1.r_a AS BIGINT) AS c0 FROM R r1
        |WHERE NOT EXISTS (SELECT 1 FROM R r2 WHERE r2.r_a = r1.r_a AND r2.r_b = r1.r_a)
        |  AND NOT EXISTS (SELECT 1 FROM R r3 WHERE r3.r_a = r1.r_a
        |                    AND CAST(r3.r_b AS BIGINT) = 4)""".stripMargin,
      "R" -> rex.relation("R"))
  }

  test("union with overlapping answers stays a set") {
    val a = Rule("a", "Q", Vector(Var("X")), Vector(Atom("R", Vector(Var("X"), Var("Y")))))
    val b = Rule("b", "Q", Vector(Var("X")), Vector(Atom("R", Vector(Var("Y"), Var("X")))))
    val p = Program(Vector(a, b))
    Oracle.assertEquivalent(
      DatalogEval.answers(p, rex).select(col("c0")),
      """SELECT DISTINCT CAST(r_a AS BIGINT) AS c0 FROM R
        |UNION SELECT DISTINCT CAST(r_b AS BIGINT) AS c0 FROM R""".stripMargin,
      "R" -> rex.relation("R"))
  }

  test("constant head argument is projected as a literal") {
    val p = Program(Rule("r", "Q", Vector(Const("tag"), Var("X")),
      Vector(Atom("R", Vector(Var("X"), Var("Y"))))))
    val rows = DatalogEval.answers(p, rex).collect()
    assert(rows.forall(_.getString(0) == "tag"))
    assert(rows.map(_.getLong(1)).toSet == Set(1L, 2L, 5L))
  }

  test("r10 (TPC-H-lite 3-way join) against DuckDB") {
    val cat = Datasets.tpch(spark, 0.001)
    val df  = DatalogEval.answers(Queries.r10, cat).select(col("c0"), col("c1"))
    Oracle.assertEquivalent(df,
      """SELECT DISTINCT c.c_name AS c0, c.c_nationkey AS c1
        |FROM CUSTOMER c
        |JOIN ORDERS o ON o.o_custkey = c.c_custkey
        |JOIN LINEITEM l ON l.l_orderkey = o.o_orderkey""".stripMargin,
      "CUSTOMER" -> cat.relation("CUSTOMER"), "ORDERS" -> cat.relation("ORDERS"),
      "LINEITEM" -> cat.relation("LINEITEM"))
  }

  test("chain query (3 joins) against DuckDB") {
    val cat = Datasets.chainRelations(spark, 3, 300, 20, 0)
    val df  = DatalogEval.answers(Queries.chainQuery(3, 0), cat).select(col("c0"))
    Oracle.assertEquivalent(df,
      """SELECT DISTINCT CAST(c1.a AS BIGINT) AS c0
        |FROM C1 c1 JOIN C2 c2 ON c1.b = c2.a JOIN C3 c3 ON c2.b = c3.a""".stripMargin,
      "C1" -> cat.relation("C1"), "C2" -> cat.relation("C2"), "C3" -> cat.relation("C3"))
  }

  test("star query (3 dims) against DuckDB") {
    val cat = Datasets.starRelations(spark, 3, 300, 10, 0)
    val df  = DatalogEval.answers(Queries.starQuery(3, 0), cat).select(col("c0"))
    Oracle.assertEquivalent(df,
      """SELECT DISTINCT CAST(f.k1 AS BIGINT) AS c0
        |FROM F f JOIN D1 d1 ON f.k1 = d1.k JOIN D2 d2 ON f.k2 = d2.k
        |JOIN D3 d3 ON f.k3 = d3.k""".stripMargin,
      "F" -> cat.relation("F"), "D1" -> cat.relation("D1"),
      "D2" -> cat.relation("D2"), "D3" -> cat.relation("D3"))
  }

  test("crimeDesc (Artemis query) against DuckDB") {
    val cat = Datasets.crimeWitness(spark, 300)
    val df  = DatalogEval.answers(Queries.crimeDesc, cat)
      .select(col("c0"), col("c1"), col("c2"), col("c3"))
    Oracle.assertEquivalent(df,
      """SELECT DISTINCT c.cw_type AS c0, w.wt_name AS c1, s.sp_cloth AS c2, s.sp_hair AS c3
        |FROM CRIME c
        |JOIN WITNESS w ON w.wt_scene = c.cw_scene
        |JOIN SAWPERSON s ON s.sp_name = w.wt_name
        |JOIN PERSON p ON p.p_hair = s.sp_hair AND p.p_cloth = s.sp_cloth
        |WHERE CAST(c.cw_scene AS BIGINT) > 97""".stripMargin,
      "CRIME" -> cat.relation("CRIME"), "WITNESS" -> cat.relation("WITNESS"),
      "SAWPERSON" -> cat.relation("SAWPERSON"), "PERSON" -> cat.relation("PERSON"))
  }

  test("cross product when rules share no join variable") {
    val p = Program(Rule("r", "Q", Vector(Var("X"), Var("Y")),
      Vector(Atom("R", Vector(Var("X"), Var("A"))), Atom("R", Vector(Var("Y"), Var("B"))))))
    Oracle.assertEquivalent(
      DatalogEval.answers(p, rex).select(col("c0"), col("c1")),
      """SELECT DISTINCT CAST(r1.r_a AS BIGINT) AS c0, CAST(r2.r_a AS BIGINT) AS c1
        |FROM R r1, R r2""".stripMargin,
      "R" -> rex.relation("R"))
  }

  test("same relation positive and negated (r1-style self-reference)") {
    // Nodes with an outgoing edge but no incoming edge.
    val p = Program(Rule("r", "Q", Vector(Var("X")),
      Vector(
        Atom("R", Vector(Var("X"), Var("Y"))),
        Atom("R", Vector(Var("Z"), Var("X")), negated = true))))
    assert(!p.rules.head.isSafe) // Z occurs only negated — must be rejected
    assertThrows[IllegalArgumentException](DatalogEval.answers(p.rules.head, rex))
  }
}
