package repro.summarize

import org.scalatest.funsuite.AnyFunSuite
import scala.util.Random

class PatternSpec extends AnyFunSuite {

  private def p(args: Option[Any]*)(goals: Boolean*)(cp: Double = 0.1) =
    Pattern("r", args.toVector, goals.toVector, cp)

  test("informativeness counts constants over unified arity (Def 8)") {
    // Paper Ex: p1 = r1(N, shared, I, apt, E, P) for t = AL(N, shared):
    // unified space drops the bound R → args (N, I, apt, E, P) with one
    // constant → info = 1/5 = (C(p)−C(t))/(arity−C(t)) = (2−1)/(6−1).
    val p1 = p(None, None, Some("apt"), None, None)(true, false)()
    assert(math.abs(p1.info - 0.2) < 1e-12)
  }

  test("informativeness extremes") {
    assert(p(None, None)(true)().info == 0.0)
    assert(p(Some(1), Some(2))(true)().info == 1.0)
    assert(Pattern("r", Vector.empty, Vector(true), 1.0).info == 1.0) // ground rule
  }

  test("generalization: placeholders absorb constants (paper §8.1 example)") {
    // (X, Y, a) generalizes (X, b, a).
    val g = p(None, None, Some("a"))(false, false)()
    val s = p(None, Some("b"), Some("a"))(false, false)()
    assert(s.generalizedBy(g))
    assert(!g.generalizedBy(s))
    assert(g.generalizedBy(g)) // reflexive
  }

  test("generalization requires same goal annotations and rule") {
    val a = p(None, Some("b"))(true, false)()
    val b = p(None, None)(false, false)()
    assert(!a.generalizedBy(b))
    val c = Pattern("other", Vector(None, None), Vector(true, false), 0.1)
    assert(!a.generalizedBy(c))
  }

  test("generalization is transitive") {
    val p1 = p(Some(1), Some(2), Some(3))(true)()
    val p2 = p(Some(1), None, Some(3))(true)()
    val p3 = p(None, None, Some(3))(true)()
    assert(p1.generalizedBy(p2) && p2.generalizedBy(p3) && p1.generalizedBy(p3))
  }

  test("disjointness: conflicting constants (paper Ex 10)") {
    val a = p(Some(2L), None)(false, false)()
    val b = p(Some(3L), None)(false, false)()
    val c = p(Some(2L), Some(1L))(false, false)()
    assert(a.disjointWith(b))
    assert(b.disjointWith(c))
    assert(!a.disjointWith(c)) // c ⪯ a, match sets overlap
    assert(c.generalizedBy(a))
  }

  test("disjointness: different goal annotations or rules") {
    val a = p(None)(true, false)()
    val b = p(None)(false, false)()
    assert(a.disjointWith(b))
    val c = Pattern("other", Vector[Option[Any]](None), Vector(true, false), 0.1)
    assert(a.disjointWith(c))
  }

  test("matches: per-position semantics (paper Def 5)") {
    // p1 ⪯ d1 from §3.2: r1(N, shared→bound, I, apt, E, P)-(T,F) matches
    // (central place, 8403, apt, east, 130)-(T,F).
    val p1 = p(None, None, Some("apt"), None, None)(true, false)()
    assert(p1.matches(Seq("central place", 8403L, "apt", "east", 130L), Seq(true, false)))
    assert(!p1.matches(Seq("plum", 9211L, "house", "adams", 130L), Seq(true, false)))
    assert(!p1.matches(Seq("central place", 8403L, "apt", "east", 130L), Seq(true, true)))
    assert(!p1.matches(Seq("central place", 8403L), Seq(true, false))) // arity
  }

  test("property: a pattern matches everything its specialization matches") {
    val rnd = new Random(1)
    for (_ <- 1 to 200) {
      val n = 1 + rnd.nextInt(5)
      val deriv = Vector.fill(n)(rnd.nextInt(3).toLong)
      val goals = Vector.fill(1 + rnd.nextInt(3))(rnd.nextBoolean())
      val spec  = Pattern("r", deriv.map(v =>
        if (rnd.nextBoolean()) Some(v) else None), goals, 0.1)
      val gen = Pattern("r", spec.args.map(a =>
        if (rnd.nextBoolean()) None else a), goals, 0.1)
      assert(spec.generalizedBy(gen))
      if (spec.matches(deriv, goals)) assert(gen.matches(deriv, goals))
    }
  }

  test("property: disjoint patterns never match the same derivation") {
    val rnd = new Random(2)
    for (_ <- 1 to 300) {
      val n  = 1 + rnd.nextInt(4)
      def mk = Pattern("r",
        Vector.fill(n)(if (rnd.nextBoolean()) Some(rnd.nextInt(3).toLong) else None),
        Vector(rnd.nextBoolean()), 0.1)
      val (a, b) = (mk, mk)
      if (a.disjointWith(b)) {
        val deriv = Vector.fill(n)(rnd.nextInt(3).toLong)
        for (g <- Seq(Vector(true), Vector(false)))
          assert(!(a.matches(deriv, g) && b.matches(deriv, g)),
            s"$a and $b both match $deriv-$g")
      }
    }
  }

  test("harmonic mean: paper score definition") {
    assert(Pattern.harmonic(1.0, 1.0) == 1.0)
    assert(Pattern.harmonic(0.0, 1.0) == 0.0)
    assert(math.abs(Pattern.harmonic(0.5, 1.0) - 2.0 / 3.0) < 1e-12)
    assert(Pattern.harmonic(0.3, 0.7) == Pattern.harmonic(0.7, 0.3))
  }
}
