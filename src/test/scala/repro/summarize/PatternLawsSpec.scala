package repro.summarize

import org.scalacheck.{Gen, Prop, Test => SCTest}
import org.scalatest.funsuite.AnyFunSuite

/** ScalaCheck laws for the pattern algebra (Defs 4, 5, 7, 8 and §8.1). */
class PatternLawsSpec extends AnyFunSuite {

  private def check(prop: Prop, name: String): Unit = {
    val res = SCTest.check(SCTest.Parameters.default.withMinSuccessfulTests(200), prop)
    assert(res.passed, s"$name: $res")
  }

  private val argGen: Gen[Option[Any]] =
    Gen.oneOf(Gen.const(None), Gen.choose(0L, 3L).map(v => Some(v)))

  private def patternGen(arity: Int, goals: Int): Gen[Pattern] = for {
    args <- Gen.listOfN(arity, argGen)
    gs   <- Gen.listOfN(goals, Gen.oneOf(true, false))
    cp   <- Gen.choose(0.0, 1.0)
  } yield Pattern("r", args.toVector, gs.toVector, cp)

  private def derivGen(arity: Int, goals: Int): Gen[(Vector[Any], Vector[Boolean])] = for {
    args <- Gen.listOfN(arity, Gen.choose(0L, 3L))
    gs   <- Gen.listOfN(goals, Gen.oneOf(true, false))
  } yield (args.toVector.map(_.asInstanceOf[Any]), gs.toVector)

  test("generalization is reflexive") {
    check(Prop.forAll(patternGen(4, 2))(p => p.generalizedBy(p)), "reflexive")
  }

  test("generalization is antisymmetric up to equality") {
    check(Prop.forAll(patternGen(3, 1), patternGen(3, 1)) { (a, b) =>
      !(a.generalizedBy(b) && b.generalizedBy(a)) || a == b.copy(cp = a.cp)
    }, "antisymmetric")
  }

  test("generalization is transitive") {
    check(Prop.forAll(patternGen(3, 1), patternGen(3, 1), patternGen(3, 1)) { (a, b, c) =>
      !(a.generalizedBy(b) && b.generalizedBy(c)) || a.generalizedBy(c)
    }, "transitive")
  }

  test("disjointness is symmetric and irreflexive on self") {
    check(Prop.forAll(patternGen(3, 2), patternGen(3, 2)) { (a, b) =>
      a.disjointWith(b) == b.disjointWith(a)
    }, "symmetric")
    check(Prop.forAll(patternGen(3, 2))(p => !p.disjointWith(p)), "not self-disjoint")
  }

  test("generalization implies match-set containment") {
    check(Prop.forAll(patternGen(3, 2), patternGen(3, 2), derivGen(3, 2)) {
      case (a, b, (d, g)) =>
        !(a.generalizedBy(b) && a.matches(d, g)) || b.matches(d, g)
    }, "containment")
  }

  test("disjointness implies empty match-set intersection") {
    check(Prop.forAll(patternGen(3, 2), patternGen(3, 2), derivGen(3, 2)) {
      case (a, b, (d, g)) =>
        !a.disjointWith(b) || !(a.matches(d, g) && b.matches(d, g))
    }, "disjoint")
  }

  test("info is in [0,1] and monotone in added constants") {
    check(Prop.forAll(patternGen(5, 1)) { p =>
      p.info >= 0.0 && p.info <= 1.0
    }, "range")
    check(Prop.forAll(patternGen(5, 1), Gen.choose(0, 4)) { (p, i) =>
      val specialized = p.copy(args = p.args.updated(i, Some(9L)))
      specialized.info >= p.info
    }, "monotone")
  }

  test("an all-placeholder pattern matches every derivation with its goals") {
    check(Prop.forAll(derivGen(4, 2)) { case (d, g) =>
      Pattern("r", Vector.fill(4)(None), g, 1.0).matches(d, g)
    }, "top")
  }

  test("a fully-constant pattern matches exactly itself") {
    check(Prop.forAll(derivGen(4, 2), derivGen(4, 2)) { case ((d1, g1), (d2, _)) =>
      val p = Pattern("r", d1.map(Some(_)), g1, 1.0)
      p.matches(d2, g1) == (d1 == d2)
    }, "bottom")
  }

  test("harmonic mean bounds: min <= hm <= max for positive inputs") {
    check(Prop.forAll(Gen.choose(0.01, 1.0), Gen.choose(0.01, 1.0)) { (a, b) =>
      val h = Pattern.harmonic(a, b)
      h >= math.min(a, b) - 1e-12 && h <= math.max(a, b) + 1e-12
    }, "bounds")
  }

  test("TopK bound sandwich: greedy S_lb <= exact S_lb <= S_ub sum semantics") {
    check(Prop.forAll(Gen.choose(2, 7).flatMap(Gen.listOfN(_, patternGen(3, 1)))) { ps =>
      val lo = TopK.cpLowerBound(ps)
      val ex = TopK.cpLowerBoundExact(ps)
      val hi = TopK.cpUpperBound(ps)
      lo <= ex + 1e-12 && ex <= math.min(1.0, ps.map(_.cp).sum) + 1e-12 && hi >= 0.0
    }, "sandwich")
  }

  test("pairwise-disjoint sets: lower and upper completeness bounds coincide") {
    // Construct pairwise-disjoint patterns via distinct constants at slot 0.
    check(Prop.forAll(Gen.choose(1, 6), Gen.choose(0.0, 0.15)) { (n, cp) =>
      val ps = (0 until n).map(i =>
        Pattern("r", Vector(Some(i.toLong), None), Vector(true), cp))
      math.abs(TopK.cpLowerBoundExact(ps) - TopK.cpUpperBound(ps)) < 1e-9
    }, "disjoint-tight")
  }
}
