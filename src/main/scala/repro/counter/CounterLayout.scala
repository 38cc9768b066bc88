package repro.counter

import repro.bn.BayesianNetwork

/** Dense global indexing of every distributed counter the model needs.
  *
  * For each variable i the model maintains:
  *   - child counters  Aᵢ(xᵢ, u) for xᵢ ∈ dom(Xᵢ), u ∈ dom(par(Xᵢ)) — a block
  *     of Jᵢ·Kᵢ counters laid out as `childOffset(i) + u*Jᵢ + xᵢ`;
  *   - parent counters Aᵢ(u) for u ∈ dom(par(Xᵢ)) — a block of Kᵢ counters at
  *     `parentOffset(i) + u`.
  *
  * Section 4.4's independence subtlety is honored by the standard layout:
  * even when par(Xᵢ) = par(Xⱼ), variables i and j get *separate* parent
  * counter blocks so the product terms stay independent. The Naïve-Bayes
  * layout (Algorithm 4) deliberately does the opposite: all features share
  * one parent block over dom(X₀), tracked once with a tighter ε.
  */
final class CounterLayout private (
    val net: BayesianNetwork,
    val childOffset: Array[Int],
    val parentOffset: Array[Int],
    val numCounters: Int,
    val sharedParents: Boolean,
) extends Serializable {

  /** Global id of child counter Aᵢ(xᵢ, u). */
  def childCounter(i: Int, v: Int, parentCode: Int): Int =
    childOffset(i) + parentCode * net.card(i) + v

  /** Global id of parent counter Aᵢ(u). */
  def parentCounter(i: Int, parentCode: Int): Int = parentOffset(i) + parentCode

  /** Apply `f` to the (childCounterId, parentCounterId) pair of every family
    * event in the full assignment `x` — the per-event update loop.
    */
  @inline def foreachFamily(x: Array[Int])(f: (Int, Int) => Unit): Unit = {
    var i = 0
    while (i < net.n) {
      val u = net.parentCode(i, x)
      f(childCounter(i, x(i), u), parentCounter(i, u))
      i += 1
    }
  }

  // Scratch set reused across events when deduplicating shared counters.
  @transient private lazy val seen = new java.util.HashSet[Integer]()

  /** Invoke `inc` exactly once per distinct counter the event touches.
    * In the standard layout every family contributes two distinct counters;
    * in a shared layout (Naïve Bayes) the shared block is incremented once
    * per event — Algorithm 4 maintains "only one copy of the counter".
    */
  def foreachUpdate(x: Array[Int])(inc: Int => Unit): Unit =
    if (!sharedParents) foreachFamily(x)((c, p) => { inc(c); inc(p) })
    else {
      seen.clear()
      foreachFamily(x) { (c, p) =>
        if (seen.add(c)) inc(c)
        if (seen.add(p)) inc(p)
      }
    }

  /** Number of distinct counters one event increments (2n for standard). */
  def updatesPerEvent: Int =
    if (!sharedParents) 2 * net.n
    else {
      var cnt = 0
      foreachUpdate(new Array[Int](net.n))(_ => cnt += 1)
      cnt
    }
}

object CounterLayout {

  /** Standard layout: one private parent block per variable (Section 4.4). */
  def standard(net: BayesianNetwork): CounterLayout = {
    val childOffset = new Array[Int](net.n)
    val parentOffset = new Array[Int](net.n)
    var off = 0L
    for (i <- 0 until net.n) {
      childOffset(i) = off.toInt; off += net.card(i).toLong * net.parentCard(i)
      parentOffset(i) = off.toInt; off += net.parentCard(i)
      require(off <= Int.MaxValue, s"counter space overflow at variable $i")
    }
    new CounterLayout(net, childOffset, parentOffset, off.toInt, sharedParents = false)
  }

  /** Naïve-Bayes layout (Algorithm 4): a single shared block A(x₀) of size
    * J₀ serves both as the root's child counters and as every feature's
    * parent counters; the root's parent block (K₀ = 1) tracks the total
    * observation count. Each event increments the shared block once.
    */
  def naiveBayes(net: BayesianNetwork): CounterLayout = {
    require(net.n >= 2 && net.parents(0).isEmpty &&
      (1 until net.n).forall(i => net.parents(i).sameElements(Array(0))),
      s"${net.name} is not a Naïve Bayes network")
    val childOffset = new Array[Int](net.n)
    val parentOffset = new Array[Int](net.n)
    var off = 0
    for (i <- 1 until net.n) { childOffset(i) = off; off += net.card(i) * net.parentCard(i) }
    val shared = off; off += net.card(0)
    childOffset(0) = shared
    for (i <- 1 until net.n) parentOffset(i) = shared
    parentOffset(0) = off; off += 1 // total-count counter
    new CounterLayout(net, childOffset, parentOffset, off, sharedParents = true)
  }
}
