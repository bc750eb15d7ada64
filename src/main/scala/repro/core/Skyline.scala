package repro.core

/** The skyline operator over explanation candidates (paper §3.6, [13]).
  *
  * Standard (weak) Pareto dominance: x is dropped when some o is at least as
  * good in both dimensions and strictly better in one. The paper's formula
  * spells strict-in-both dominance, but its reported skylines have at most 2
  * members — impossible under strict-both, where every tied-interestingness
  * candidate of the top column survives — so the implementation clearly
  * pruned ties; we follow the implementation.
  */
object Skyline {

  def of[T](xs: Seq[T])(interest: T => Double, contrib: T => Double): Seq[T] =
    xs.filter { x =>
      !xs.exists { o =>
        interest(o) >= interest(x) && contrib(o) >= contrib(x) &&
          (interest(o) > interest(x) || contrib(o) > contrib(x))
      }
    }
}
