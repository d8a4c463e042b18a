package repro.core

/** Set-based combiners over scored table lists (paper §IV-B).
  *
  * Inputs are full rankings (descending score). All outputs are ranked
  * deterministically: descending score, ascending table id.
  */
sealed trait Combiner {
  def name: String
  def apply(inputs: Seq[Seq[Scored]]): Seq[Scored]

  protected final def ranked(xs: Iterable[Scored]): Seq[Scored] =
    xs.toSeq.sortBy(s => (-s.score, s.tableId))
}

object Combiner {

  /** Tables present in every input; scores are summed. */
  case object Intersection extends Combiner {
    override val name = "intersection"
    override def apply(inputs: Seq[Seq[Scored]]): Seq[Scored] = {
      require(inputs.size >= 2, "Intersection needs >=2 inputs")
      val maps = inputs.map(_.map(s => s.tableId -> s.score).toMap)
      val common = maps.map(_.keySet).reduce(_ intersect _)
      ranked(common.map(id => Scored(id, maps.map(_(id)).sum)))
    }
  }

  /** All tables from all inputs; scores are summed over occurrences. */
  case object Union extends Combiner {
    override val name = "union"
    override def apply(inputs: Seq[Seq[Scored]]): Seq[Scored] = {
      require(inputs.nonEmpty, "Union needs >=1 input")
      val summed = inputs.flatten.groupBy(_.tableId).map { case (id, ss) =>
        Scored(id, ss.map(_.score).sum)
      }
      ranked(summed)
    }
  }

  /** Tables of the first input that do not occur in the second (paper:
    * exactly two inputs, non-commutative).
    */
  case object Difference extends Combiner {
    override val name = "difference"
    override def apply(inputs: Seq[Seq[Scored]]): Seq[Scored] = {
      require(inputs.size == 2, "Difference takes exactly 2 inputs")
      val excluded = inputs(1).map(_.tableId).toSet
      ranked(inputs.head.filterNot(s => excluded.contains(s.tableId)))
    }
  }

  /** Counts in how many inputs each table occurs, descending; ties are
    * broken by summed score (bounded to stay below one count unit).
    */
  case object Counter extends Combiner {
    override val name = "counter"
    override def apply(inputs: Seq[Seq[Scored]]): Seq[Scored] = {
      require(inputs.nonEmpty, "Counter needs >=1 input")
      val counted = inputs.flatten.groupBy(_.tableId).map { case (id, ss) =>
        val sum = ss.map(_.score).sum
        Scored(id, ss.size.toDouble + sum / (1.0 + sum))
      }
      ranked(counted)
    }
  }
}
