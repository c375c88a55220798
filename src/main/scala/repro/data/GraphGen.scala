package repro.data

import scala.collection.mutable
import scala.util.Random

/** Seeded synthetic graph generators.
  *
  * The paper evaluates on real graphs (Grab transactions, SNAP/NDR social
  * and web graphs, BIOMINE). Those are proprietary or too large for this
  * container, so we generate structural analogues (DESIGN.md §3): the
  * properties peeling cost depends on — degree distribution, average
  * degree, and the presence of small dense ("fraud") blocks against a
  * large sparse background — are controlled per generator.
  *
  * All generators emit canonical undirected edge triples (src, dst, weight)
  * with src < dst; duplicates are allowed (LocalGraph coalesces by summing
  * weights, so repeated transactions accumulate suspiciousness).
  */
object GraphGen {

  /** Chung-Lu style power-law graph: endpoint i is drawn with probability
    * ∝ (i+1)^(-skew); ~`m` sampled edges. `skew` in [0.3, 0.8] spans
    * social-network to hub-heavy web-graph tails.
    */
  def powerLaw(n: Int, m: Int, skew: Double, seed: Long,
               weight: Random => Double = lognormal): Vector[(Int, Int, Double)] = {
    val rnd = new Random(seed)
    val cdf = cumulative(n, skew)
    val out = Vector.newBuilder[(Int, Int, Double)]
    var i = 0
    while (i < m) {
      val a = draw(cdf, rnd); val b = draw(cdf, rnd)
      if (a != b) out += order(a, b, weight(rnd))
      i += 1
    }
    out.result()
  }

  /** Bipartite transaction graph: customers [0, nC) × merchants
    * [nC, nC+nM), merchant popularity power-law distributed; weights are
    * lognormal transaction amounts. Models the Grab gfg dataset.
    */
  def bipartite(nC: Int, nM: Int, m: Int, skew: Double, seed: Long): Vector[(Int, Int, Double)] = {
    val rnd = new Random(seed)
    val mCdf = cumulative(nM, skew)
    val out = Vector.newBuilder[(Int, Int, Double)]
    var i = 0
    while (i < m) {
      val c = rnd.nextInt(nC)
      val merchant = nC + draw(mCdf, rnd)
      out += ((c, merchant, lognormal(rnd)))
      i += 1
    }
    out.result()
  }

  /** A planted dense block over `members`: each pair connected with
    * probability `p` and weight boosted by `boost` — the fraud-community
    * structure of Fig. 2 (small, frequent, repetitive, high-weight).
    */
  def plantBlock(members: IndexedSeq[Int], p: Double, boost: Double,
                 seed: Long): Vector[(Int, Int, Double)] = {
    val rnd = new Random(seed)
    val out = Vector.newBuilder[(Int, Int, Double)]
    var i = 0
    while (i < members.length) {
      var j = i + 1
      while (j < members.length) {
        if (rnd.nextDouble() < p) out += order(members(i), members(j), boost * lognormal(rnd))
        j += 1
      }
      i += 1
    }
    out.result()
  }

  /** Planted bipartite dense block (fraud ring of customers × merchants). */
  def plantBipartiteBlock(customers: IndexedSeq[Int], merchants: IndexedSeq[Int],
                          p: Double, boost: Double, seed: Long): Vector[(Int, Int, Double)] = {
    val rnd = new Random(seed)
    val out = Vector.newBuilder[(Int, Int, Double)]
    for (c <- customers; mch <- merchants)
      if (rnd.nextDouble() < p) out += order(c, mch, boost * lognormal(rnd))
    out.result()
  }

  /** Lognormal "transaction amount" weight, mean ≈ 1.6. */
  def lognormal(rnd: Random): Double = math.exp(rnd.nextGaussian() * 0.8)

  /** Uniformly random distinct vertex sample. */
  def sample(n: Int, size: Int, seed: Long): IndexedSeq[Int] = {
    val rnd = new Random(seed)
    val seen = mutable.LinkedHashSet.empty[Int]
    while (seen.size < math.min(size, n)) seen += rnd.nextInt(n)
    seen.toIndexedSeq
  }

  private def order(a: Int, b: Int, w: Double): (Int, Int, Double) =
    if (a < b) (a, b, w) else (b, a, w)

  private def cumulative(n: Int, skew: Double): Array[Double] = {
    val cdf = new Array[Double](n)
    var s = 0.0
    var i = 0
    while (i < n) { s += math.pow(i + 1.0, -skew); cdf(i) = s; i += 1 }
    var j = 0
    while (j < n) { cdf(j) /= s; j += 1 }
    cdf
  }

  private def draw(cdf: Array[Double], rnd: Random): Int = {
    val x = rnd.nextDouble()
    val i = java.util.Arrays.binarySearch(cdf, x)
    val idx = if (i >= 0) i else -i - 1
    math.min(idx, cdf.length - 1)
  }
}
