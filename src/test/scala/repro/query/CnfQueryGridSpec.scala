package repro.query

import org.scalatest.funsuite.AnyFunSuite
import scala.util.Random

/** Per-operator and per-shape coverage of condition evaluation and the
  * inverted indexes: one registered test per (operator, threshold) cell plus
  * CNF shape cases.
  */
class CnfQueryGridSpec extends AnyFunSuite {

  for {
    op <- Op.all
    n <- 0 to 4
  } test(s"single condition car ${op.symbol} $n agrees with the index for all counts 0..8") {
    val q = CnfQuery(0, Vector(Vector(Condition("car", op, n))))
    val idx = CnfEvalE(Seq(q))
    (0 to 8).foreach { v =>
      val aggs = if (v == 0) Map.empty[String, Int] else Map("car" -> v)
      assert(idx.matching(aggs).contains(0) === op.eval(v, n),
        s"count=$v: index disagrees with direct evaluation")
    }
  }

  test("conjunction requires every clause") {
    val q = CnfQuery(1, Vector(
      Vector(Condition("car", Op.Ge, 1)),
      Vector(Condition("person", Op.Ge, 2))))
    val idx = CnfEvalE(Seq(q))
    assert(idx.matching(Map("car" -> 1, "person" -> 2)) === Set(1))
    assert(idx.matching(Map("car" -> 1, "person" -> 1)) === Set.empty)
    assert(idx.matching(Map("person" -> 2)) === Set.empty)
  }

  test("disjunction requires any condition") {
    val q = CnfQuery(2, Vector(Vector(
      Condition("car", Op.Ge, 3), Condition("bus", Op.Eq, 1))))
    val idx = CnfEvalE(Seq(q))
    assert(idx.matching(Map("car" -> 3)) === Set(2))
    assert(idx.matching(Map("bus" -> 1)) === Set(2))
    assert(idx.matching(Map("car" -> 2, "bus" -> 2)) === Set.empty)
  }

  test("bounded range via conjunction (paper: 3 <= person <= 5)") {
    val q = CnfQuery(3, Vector(
      Vector(Condition("person", Op.Ge, 3)),
      Vector(Condition("person", Op.Le, 5))))
    val idx = CnfEvalE(Seq(q))
    (0 to 8).foreach { v =>
      assert(idx.matching(Map("person" -> v)).contains(3) === (v >= 3 && v <= 5), s"v=$v")
    }
  }

  test("many queries over shared labels stay independent") {
    val rnd = new Random(7)
    val queries = CnfQuery.randomQueries(40, seed = 13)
    val idx = CnfEvalE(queries)
    (0 until 50).foreach { _ =>
      val aggs = CnfQuery.classes.map(c => c -> rnd.nextInt(7)).toMap
      assert(idx.matching(aggs) === queries.filter(_.eval(aggs)).map(_.id).toSet)
    }
  }

  test("geOnly recognizes mixed operators") {
    assert(CnfQuery(0, Vector(Vector(Condition("car", Op.Ge, 1)))).geOnly)
    assert(!CnfQuery(0, Vector(Vector(
      Condition("car", Op.Ge, 1), Condition("car", Op.Le, 5)))).geOnly)
    assert(!CnfQuery(0, Vector(Vector(Condition("car", Op.Eq, 1)))).geOnly)
  }

  test("labels collects every mentioned class") {
    val q = CnfQuery(9, Vector(
      Vector(Condition("car", Op.Ge, 1), Condition("bus", Op.Le, 2)),
      Vector(Condition("person", Op.Eq, 1))))
    assert(q.labels === Set("car", "bus", "person"))
  }

  test("random query workload is deterministic in its seed") {
    assert(CnfQuery.randomQueries(20, 5) === CnfQuery.randomQueries(20, 5))
    assert(CnfQuery.geQueries(20, 3, 5) === CnfQuery.geQueries(20, 3, 5))
    assert(CnfQuery.randomQueries(20, 5) !== CnfQuery.randomQueries(20, 6))
  }
}
