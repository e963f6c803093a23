package repro.query

import scala.collection.mutable

/** CNFEvalE (§5.2): the Boolean-expression inverted index of Whang et al.
  * [24] extended with inequality predicates.
  *
  * Three indexes are kept, one per operator. Keys are class labels; each key
  * holds a value-ordered list of posting lists of `(qid, disjId)` triples
  * (the `∈` predicate of the original algorithm is implicit — conditions here
  * are count comparisons). For an input aggregate `(label, v)`:
  *
  *  - the ≥ index is value-ascending and is scanned while `value <= v`,
  *  - the ≤ index is value-descending and is scanned while `value >= v`,
  *  - the = index is probed at exactly `v`.
  *
  * A label absent from the input has count 0 (an MCOS with no `person`
  * satisfies `person <= 3`), so evaluation walks the union of index labels
  * rather than input labels. A query is TRUE once every disjunction id has at
  * least one satisfied posting — counted per query exactly as the counting
  * variant of [24].
  */
final class CnfEvalE private (queries: Vector[CnfQuery]) extends Serializable {

  private type Posting = (Int, Int) // (qid, disjId)

  private val clauseCount: Map[Int, Int] = queries.map(q => q.id -> q.clauses.size).toMap

  // label -> value-sorted array of (value, postings)
  private val geIndex = mutable.HashMap.empty[String, Array[(Int, Array[Posting])]]
  private val leIndex = mutable.HashMap.empty[String, Array[(Int, Array[Posting])]]
  private val eqIndex = mutable.HashMap.empty[String, Map[Int, Array[Posting]]]

  locally {
    val ge = mutable.HashMap.empty[String, mutable.HashMap[Int, mutable.ArrayBuffer[Posting]]]
    val le = mutable.HashMap.empty[String, mutable.HashMap[Int, mutable.ArrayBuffer[Posting]]]
    val eq = mutable.HashMap.empty[String, mutable.HashMap[Int, mutable.ArrayBuffer[Posting]]]
    for (q <- queries; (clause, disjId) <- q.clauses.zipWithIndex; c <- clause) {
      val book = c.op match {
        case Op.Ge => ge
        case Op.Le => le
        case Op.Eq => eq
      }
      book.getOrElseUpdate(c.label, mutable.HashMap.empty)
        .getOrElseUpdate(c.n, mutable.ArrayBuffer.empty) += ((q.id, disjId))
    }
    ge.foreach { case (l, m) =>
      geIndex(l) = m.toArray.sortBy(_._1).map { case (v, ps) => (v, ps.toArray) }
    }
    le.foreach { case (l, m) =>
      leIndex(l) = m.toArray.sortBy(-_._1).map { case (v, ps) => (v, ps.toArray) }
    }
    eq.foreach { case (l, m) =>
      eqIndex(l) = m.view.mapValues(_.toArray).toMap
    }
  }

  /** Query ids satisfied by the given class-count aggregates. */
  def matching(aggs: Map[String, Int]): Set[Int] = {
    // per-query set of satisfied disjunction ids
    val satisfied = mutable.HashMap.empty[Int, mutable.BitSet]
    def hit(p: Posting): Unit =
      satisfied.getOrElseUpdate(p._1, mutable.BitSet.empty) += p._2

    geIndex.foreach { case (label, list) =>
      val v = aggs.getOrElse(label, 0)
      var i = 0
      while (i < list.length && list(i)._1 <= v) { list(i)._2.foreach(hit); i += 1 }
    }
    leIndex.foreach { case (label, list) =>
      val v = aggs.getOrElse(label, 0)
      var i = 0
      while (i < list.length && list(i)._1 >= v) { list(i)._2.foreach(hit); i += 1 }
    }
    eqIndex.foreach { case (label, byValue) =>
      byValue.get(aggs.getOrElse(label, 0)).foreach(_.foreach(hit))
    }

    satisfied.iterator.collect {
      case (qid, disjs) if disjs.size == clauseCount(qid) => qid
    }.toSet
  }

  /** True iff at least one query matches — the §5.3 termination test. */
  def anyMatch(aggs: Map[String, Int]): Boolean = matching(aggs).nonEmpty

  def size: Int = queries.size
}

object CnfEvalE {
  def apply(queries: Seq[CnfQuery]): CnfEvalE = {
    val qs = queries.toVector
    require(qs.map(_.id).distinct.size == qs.size, "query ids must be unique")
    new CnfEvalE(qs)
  }
}
