package repro.core.opt

/** A physical join tree chosen by [[DPPlanner]]. `estRows` is the estimate
  * the planner used (whatever estimator it ran with); `cost` its estimated
  * cumulative cost.
  */
sealed trait Plan {
  def mask: Long
  def estRows: Double
  def cost: Double

  /** Join nodes in bottom-up order (post-order, smaller subtrees first). */
  final def joinsBottomUp: Vector[JoinPlan] = {
    val buf = Vector.newBuilder[JoinPlan]
    def walk(p: Plan): Unit = p match {
      case j: JoinPlan => walk(j.left); walk(j.right); buf += j
      case _           =>
    }
    walk(this)
    buf.result().sortBy(j => (java.lang.Long.bitCount(j.mask), j.mask))
  }

  /** Compact one-line rendering for logs/tests: ((a ⋈ b) ⋈ c). */
  final def render(g: JoinGraph): String = this match {
    case l: LeafPlan => g.rels(l.relIdx).alias
    case j: JoinPlan =>
      val op = j.phys match {
        case Physical.BroadcastHash => "⋈b"
        case Physical.ShuffleHash   => "⋈"
      }
      s"(${j.left.render(g)} $op ${j.right.render(g)})"
  }
}

final case class LeafPlan(relIdx: Int, mask: Long, estRows: Double, cost: Double) extends Plan

final case class JoinPlan(
    left: Plan,
    right: Plan,
    mask: Long,
    estRows: Double,
    cost: Double,
    phys: Physical,
    buildLeft: Boolean,
) extends Plan
