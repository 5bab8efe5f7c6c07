package repro.summarize

import org.apache.spark.sql.Row
import org.apache.spark.sql.types._
import repro.SparkSpec
import scala.jdk.CollectionConverters._

class LcaSpec extends SparkSpec {

  private val varCols  = Seq("X", "Z")
  private val goalCols = Seq("g0", "g1")
  private val schema = StructType(Seq(
    StructField("X", LongType), StructField("Z", LongType),
    StructField("g0", BooleanType), StructField("g1", BooleanType)))

  private def sample(rows: (Long, Long, Boolean, Boolean)*) =
    spark.createDataFrame(
      rows.map { case (x, z, a, b) => Row(x, z, a, b) }.asJava, schema)

  private def collectPatterns(df: org.apache.spark.sql.DataFrame) =
    df.collect().map(r => (Option(r.get(0)), Option(r.get(1)),
      r.getBoolean(2), r.getBoolean(3))).toSet

  test("paper Ex 8: (2,1)-(F,F) and (2,2)-(F,F) generalize to (2,_)-(F,F)") {
    val got = collectPatterns(Lca.candidates(sample((2, 1, false, false),
      (2, 2, false, false)), varCols, goalCols))
    assert(got.contains((Some(2L), None, false, false)))
    // Self-pairs keep the two all-constant patterns.
    assert(got.contains((Some(2L), Some(1L), false, false)))
    assert(got.contains((Some(2L), Some(2L), false, false)))
    assert(got.size == 3)
  }

  test("pairs with different goal annotations are never generalized") {
    val got = collectPatterns(Lca.candidates(sample((2, 1, false, false),
      (2, 1, true, false)), varCols, goalCols))
    // Only the two self-pair patterns.
    assert(got == Set((Some(2L), Some(1L), false, false), (Some(2L), Some(1L), true, false)))
  }

  test("disagreement at every position yields the all-placeholder pattern") {
    val got = collectPatterns(Lca.candidates(sample((1, 2, true, true),
      (3, 4, true, true)), varCols, goalCols))
    assert(got.contains((None, None, true, true)))
    assert(got.size == 3)
  }

  test("candidate count is at most quadratic and every candidate matches a generator") {
    val rows = for (x <- 1L to 4L; z <- 1L to 3L) yield (x, z, x % 2 == 0, true)
    val s    = sample(rows: _*)
    val out  = Lca.candidates(s, varCols, goalCols)
    val n    = rows.size
    assert(out.count() <= n.toLong * n)
    // Every candidate pattern matches at least one sample derivation.
    val derivs = rows.map { case (x, z, a, b) => (Seq[Any](x, z), Seq(a, b)) }
    collectPatterns(out).foreach { case (px, pz, g0, g1) =>
      val pat = Pattern("r", Vector(px, pz), Vector(g0, g1), 0.0)
      assert(derivs.exists { case (d, g) => pat.matches(d, g) }, s"orphan pattern $pat")
    }
  }

  test("client-side LCA reference implementation agrees with the query") {
    val rows = for (x <- 1L to 3L; z <- 1L to 3L) yield (x, z, (x + z) % 2 == 0, z % 2 == 0)
    val got  = collectPatterns(Lca.candidates(sample(rows: _*), varCols, goalCols))
    val exp  = (for {
      a <- rows; b <- rows
      if (a._3, a._4) == (b._3, b._4)
    } yield (
      if (a._1 == b._1) Some(a._1) else None,
      if (a._2 == b._2) Some(a._2) else None,
      a._3, a._4)).toSet
    assert(got == exp)
  }

  test("duplicate derivations do not produce duplicate candidates") {
    val out = Lca.candidates(sample((1, 1, true, true), (1, 1, true, true)), varCols, goalCols)
    assert(out.count() == 1)
  }

  test("ground-rule sample (no variable columns) passes through") {
    val s = sample((1, 1, true, false)).select("g0", "g1")
    val out = Lca.candidates(s, Nil, goalCols)
    assert(out.collect().map(r => (r.getBoolean(0), r.getBoolean(1))).toSeq == Seq((true, false)))
  }
}
