package repro.baselines

import repro.core.Metric
import repro.local.{Deadline, LocalGraph, PeelResult}
import scala.collection.mutable

/** FWA analogue: Frank-Wolfe density decomposition (Danisch, Chan, Sozio,
  * WWW'17) for the edge-sum metrics.
  *
  * Maintains a per-vertex load vector `r`. Each Frank-Wolfe iteration
  * assigns every edge's weight entirely to its lower-load endpoint (the
  * linear-minimization oracle) and moves `r` toward that assignment with
  * step `γ_t = 2/(t+2)`. After `iters` iterations the vertices are sorted
  * by decreasing load and the densest prefix (under the metric's f) is
  * returned — the standard FWA extraction step. High iteration counts make
  * this accurate but slow, matching the paper's observed FWA profile.
  */
object Fwa {

  def run(metric: Metric, g0: LocalGraph, iters: Int = 100,
          deadline: Long = Long.MaxValue): PeelResult = {
    require(metric.edgeBased, s"FWA supports edge metrics, not ${metric.name}")
    val g = metric.prepare(g0)
    val n = g.n
    val r = new Array[Double](n)
    // r starts from the "split each edge evenly" feasible point + a_i.
    var u = 0
    while (u < n) {
      var s = g.vw(u); var i = g.offsets(u)
      while (i < g.offsets(u + 1)) { s += g.ew(i) / 2.0; i += 1 }
      r(u) = s; u += 1
    }
    val b = new Array[Double](n)
    var t = 0
    while (t < iters) {
      Deadline.check(deadline, "FWA")
      java.util.Arrays.fill(b, 0.0)
      u = 0
      while (u < n) { b(u) = g.vw(u); u += 1 }
      // LMO: each undirected edge goes fully to the lower-load endpoint.
      u = 0
      while (u < n) {
        var i = g.offsets(u)
        while (i < g.offsets(u + 1)) {
          val v = g.nbrs(i)
          if (u < v) { // visit each edge once
            if (r(u) < r(v) || (r(u) == r(v) && u < v)) b(u) += g.ew(i)
            else b(v) += g.ew(i)
          }
          i += 1
        }
        u += 1
      }
      val gamma = 2.0 / (t + 2.0)
      u = 0
      while (u < n) { r(u) = (1 - gamma) * r(u) + gamma * b(u); u += 1 }
      t += 1
    }
    // Extraction: densest prefix of the vertices ordered by decreasing load.
    val order = (0 until n).sortBy(v => -r(v))
    val inPrefix = new Array[Boolean](n)
    var f = 0.0
    var best = 0.0
    var bestLen = 0
    var idx = 0
    order.foreach { v =>
      f += g.vw(v)
      var i = g.offsets(v)
      while (i < g.offsets(v + 1)) { if (inPrefix(g.nbrs(i))) f += g.ew(i); i += 1 }
      inPrefix(v) = true
      idx += 1
      val dens = f / idx
      if (dens > best) { best = dens; bestLen = idx }
    }
    val bestSet = order.take(bestLen).toArray.sorted
    PeelResult(bestSet, best, iters, 0, 0, Vector(best), order.reverse.toArray)
  }
}
