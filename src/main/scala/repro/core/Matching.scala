package repro.core

import scala.collection.mutable

/** Maximum-weight bipartite matching (paper §3.2).
  *
  * The paper adopts "a simple greedy heuristic, which links the pair with the
  * highest similarity at each step" — sort edges by descending weight and take
  * an edge whenever both endpoints are still free. Runs on the driver: by this
  * stage the data is one row per surviving candidate edge.
  */
object Matching {

  /** A weighted candidate edge between entity `u` (dataset E) and `v` (I). */
  final case class Edge(u: Long, v: Long, w: Double)

  /** Greedy maximum-weight matching. Deterministic: ties break on (u, v). */
  def greedy(edges: Seq[Edge]): Seq[Edge] = {
    val sorted = edges.sortBy(e => (-e.w, e.u, e.v))
    val usedU = mutable.Set.empty[Long]
    val usedV = mutable.Set.empty[Long]
    val out = mutable.ArrayBuffer.empty[Edge]
    for (e <- sorted if !usedU(e.u) && !usedV(e.v)) {
      usedU += e.u; usedV += e.v; out += e
    }
    out.toSeq
  }

  /** Exact maximum-weight matching by exhaustive search — test oracle only
    * (exponential; callers keep graphs tiny).
    */
  def exhaustive(edges: Seq[Edge]): Seq[Edge] = {
    def best(remaining: List[Edge], usedU: Set[Long], usedV: Set[Long]): (Double, List[Edge]) =
      remaining match {
        case Nil => (0.0, Nil)
        case e :: rest =>
          val (skipW, skipM) = best(rest, usedU, usedV)
          if (usedU(e.u) || usedV(e.v)) (skipW, skipM)
          else {
            val (takeW, takeM) = best(rest, usedU + e.u, usedV + e.v)
            if (takeW + e.w > skipW) (takeW + e.w, e :: takeM) else (skipW, skipM)
          }
      }
    best(edges.toList, Set.empty, Set.empty)._2
  }
}
