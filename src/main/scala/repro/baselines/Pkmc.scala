package repro.baselines

import repro.core.Metric
import repro.local.{Deadline, LocalGraph, PeelResult}

/** PKMC analogue (Luo et al., ICDE'23 "Scalable algorithms for densest
  * subgraph discovery"): a k-core-based approximation.
  *
  * Runs an unweighted core decomposition (bucket queue over integer
  * degrees, O(E)) and returns the maximum-coreness core, evaluating its
  * density under the requested metric. Fast, but density is typically
  * below what full peeling finds — matching PKMC's position in Tables 5/7
  * (cheap runtime, lowest densities).
  */
object Pkmc {

  def run(metric: Metric, g0: LocalGraph, deadline: Long = Long.MaxValue): PeelResult = {
    val g = if (metric.edgeBased) metric.prepare(g0) else g0
    val n = g.n
    // --- standard O(E) core decomposition over degrees ---
    val deg = Array.tabulate(n)(g.degree)
    val maxDeg = if (n == 0) 0 else deg.max
    val bin = new Array[Int](maxDeg + 2)
    deg.foreach(d => bin(d) += 1)
    var start = 0
    var d = 0
    while (d <= maxDeg) { val c = bin(d); bin(d) = start; start += c; d += 1 }
    val vert = new Array[Int](n)
    val pos = new Array[Int](n)
    var u = 0
    while (u < n) { pos(u) = bin(deg(u)); vert(pos(u)) = u; bin(deg(u)) += 1; u += 1 }
    d = maxDeg
    while (d >= 1) { bin(d) = bin(d - 1); d -= 1 }
    bin(0) = 0
    val core = new Array[Int](n)
    var i = 0
    while (i < n) {
      Deadline.check(deadline, "PKMC")
      val v = vert(i)
      core(v) = deg(v)
      var j = g.offsets(v)
      while (j < g.offsets(v + 1)) {
        val w = g.nbrs(j)
        if (deg(w) > deg(v)) {
          val dw = deg(w); val pw = pos(w)
          val ph = bin(dw); val h = vert(ph)
          if (h != w) {
            vert(ph) = w; vert(pw) = h; pos(w) = ph; pos(h) = pw
          }
          bin(dw) += 1
          deg(w) -= 1
        }
        j += 1
      }
      i += 1
    }
    // --- the max core, evaluated under the metric ---
    val kMax = if (n == 0) 0 else core.max
    val inSet = Array.tabulate(n)(core(_) == kMax)
    val setIds = (0 until n).filter(inSet).toArray
    val density = metricDensity(metric, g0, inSet, setIds.length)
    PeelResult(setIds, density, 1, 0, 0, Vector(density), vert.reverse)
  }

  /** g(S) of an explicit vertex subset under `metric` (exact recompute). */
  def metricDensity(metric: Metric, g0: LocalGraph, inSet: Array[Boolean], size: Int): Double = {
    if (size == 0) return 0.0
    if (metric.edgeBased) {
      val g = metric.prepare(g0)
      var f = 0.0
      var u = 0
      while (u < g.n) {
        if (inSet(u)) {
          f += g.vw(u)
          var i = g.offsets(u)
          while (i < g.offsets(u + 1)) {
            if (u < g.nbrs(i) && inSet(g.nbrs(i))) f += g.ew(i)
            i += 1
          }
        }
        u += 1
      }
      f / size
    } else {
      // clique metrics: count k-cliques fully inside S
      val st = metric.localState(g0)
      var u = 0
      while (u < g0.n) { if (!inSet(u) && st.isActive(u)) st.remove(u); u += 1 }
      st.density
    }
  }
}
