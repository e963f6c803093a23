package repro.query

import org.scalatest.funsuite.AnyFunSuite
import repro.RandomizedSpec

/** CNFEvalE (the inverted-index evaluator) must agree with direct CNF
  * evaluation on arbitrary query sets and aggregates — including the
  * zero-count case for labels absent from the input.
  */
class CnfEvalESpec extends AnyFunSuite with RandomizedSpec {

  test("paper example q2 evaluates correctly through the ≥/≤ indexes") {
    // q2 = (car>=2 ∨ person<=3) ∧ (car>=3 ∨ person>=2) ∧ (car<=5)  (§5.2)
    val q2 = CnfQuery(2, Vector(
      Vector(Condition("car", Op.Ge, 2), Condition("person", Op.Le, 3)),
      Vector(Condition("car", Op.Ge, 3), Condition("person", Op.Ge, 2)),
      Vector(Condition("car", Op.Le, 5)),
    ))
    val idx = CnfEvalE(Seq(q2))
    assert(idx.matching(Map("car" -> 3)) === Set(2))               // person=0: d1 via car>=2, d2 via car>=3, d3 via car<=5
    assert(idx.matching(Map("car" -> 3, "person" -> 1)) === Set(2))
    assert(idx.matching(Map("car" -> 6, "person" -> 2)) === Set.empty) // car<=5 fails
    assert(idx.matching(Map("car" -> 2, "person" -> 2)) === Set(2))
    assert(idx.matching(Map("person" -> 2)) === Set(2))            // car=0: d1 via person<=3, d2 via person>=2, d3 via car<=5
    assert(idx.matching(Map.empty) === Set.empty)                  // d2 unsatisfiable at all-zero
  }

  test("inverted-index evaluation ≡ direct CNF evaluation on random inputs") {
    forSeeds() { rnd =>
      val queries = CnfQuery.randomQueries(1 + rnd.nextInt(30), rnd.nextLong())
      val idx = CnfEvalE(queries)
      (0 until 20).foreach { _ =>
        val aggs = CnfQuery.classes
          .filter(_ => rnd.nextBoolean())
          .map(c => c -> rnd.nextInt(8)).toMap
        val expected = queries.filter(_.eval(aggs)).map(_.id).toSet
        assert(idx.matching(aggs) === expected, s"aggs=$aggs queries=$queries")
      }
    }
  }

  test("≥-only query generator honours n_min") {
    (1 to 9).foreach { nMin =>
      val qs = CnfQuery.geQueries(100, nMin, seed = 7)
      val ns = for (q <- qs; cl <- q.clauses; c <- cl) yield c.n
      assert(ns.min === nMin) // deterministic seed: the floor is always hit
      assert(ns.forall(n => n >= nMin && n <= nMin + 2))
      assert(qs.forall(_.geOnly))
    }
  }

  test("anyMatch mirrors non-empty matching") {
    forSeeds(0xABBA) { rnd =>
      val queries = CnfQuery.geQueries(20, 1 + rnd.nextInt(5), rnd.nextLong())
      val idx = CnfEvalE(queries)
      val aggs = CnfQuery.classes.map(c => c -> rnd.nextInt(6)).toMap
      assert(idx.anyMatch(aggs) === idx.matching(aggs).nonEmpty)
    }
  }

  test("duplicate query ids are rejected") {
    val q = CnfQuery(1, Vector(Vector(Condition("car", Op.Ge, 1))))
    assertThrows[IllegalArgumentException](CnfEvalE(Seq(q, q)))
  }

  test("degenerate CNF shapes are rejected") {
    assertThrows[IllegalArgumentException](CnfQuery(0, Vector.empty))
    assertThrows[IllegalArgumentException](CnfQuery(0, Vector(Vector.empty)))
  }
}
