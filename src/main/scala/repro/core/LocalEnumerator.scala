package repro.core

import scala.collection.mutable.ArrayBuffer

/** Phase P2 of the paper's two-phase algorithm (Algorithm 1): enumerate the
  * maximal flow-motif instances inside one structural match.
  *
  * Windows are anchored at each timestamp of `R(e_1)`: `T = [t_s, t_s + δ]`.
  * A window is *skipped* when it contains no `R(e_m)` element later than the
  * end of the previous non-skipped window — the paper's rule for position
  * [13,23] in Figure 7. Why this is exactly right:
  *
  *  - Every instance generated in a window contains the window's first
  *    `R(e_1)` element (prefixes start at the window start) and, because the
  *    last edge-set takes *all* remaining elements, the latest `R(e_m)`
  *    element of the window that is after `max E_{m-1}` — which is the
  *    latest `R(e_m)` element in the whole window.
  *  - If a window anchored at `t_s` were not skipped but one of its instances
  *    could be extended by an earlier `R(e_1)` element `x` (the only possible
  *    cross-window extension), then the instance's last element would be
  *    ≤ x + δ; but the last element is an `R(e_m)` element strictly later
  *    than every previously covered window end, in particular later than
  *    `x + δ` (else `x`'s own window would not have been skipped/preceding).
  *    Contradiction — so every emitted instance is maximal.
  *  - Conversely any maximal instance is found in the window anchored at its
  *    first `R(e_1)` element (that window is never skipped: the instance's
  *    own last `e_m` element is new, otherwise extending the instance into
  *    the previous window's enumeration would contradict its maximality).
  *
  * Within a window, maximality forces each `E_{i+1}` to start at the first
  * `R(e_{i+1})` element strictly after `max E_i`, and forces each edge-set to
  * be a gap-free run; the only freedom is where each of the first m-1
  * edge-sets ends. A prefix of `e_i` ending at element `x` is admissible only
  * if `e_i`'s next element is after the window end, or some `R(e_{i+1})`
  * element lies strictly between `x` and that next element (otherwise the
  * next element could be added — the paper's "no instance contains just the
  * first two elements of e_1" remark for Figure 7). The φ check on every
  * prefix prunes the search space exactly as in Algorithm 1 line 16.
  */
object LocalEnumerator {

  /** Enumerate all maximal instances of an m-edge motif over `series`, where
    * `series(i)` is the interaction series mapped to motif edge label i+1.
    */
  def enumerate(
      seriesIn: IndexedSeq[IndexedSeq[TF]],
      delta: Long,
      phi: Double
  ): Vector[LocalInstance] = {
    val out = Vector.newBuilder[LocalInstance]
    run(seriesIn, delta, phi)(inst => out += inst)
    out.result()
  }

  /** Count instances without materializing them. */
  def count(seriesIn: IndexedSeq[IndexedSeq[TF]], delta: Long, phi: Double): Long = {
    var n = 0L
    run(seriesIn, delta, phi)(_ => n += 1)
    n
  }

  /** Core driver: invoke `emit` for every maximal instance satisfying δ, φ. */
  def run(
      seriesIn: IndexedSeq[IndexedSeq[TF]],
      delta: Long,
      phi: Double
  )(emit: LocalInstance => Unit): Unit = {
    require(delta >= 0, "delta must be non-negative")
    val series = Series.normalize(seriesIn)
    val m = series.length
    if (m == 0 || series.exists(_.isEmpty)) return
    val e1 = series(0)
    val em = series(m - 1)

    val chosen = new Array[Vector[TF]](m)

    def rec(ei: Int, startIdx: Int, windowEnd: Long): Unit = {
      val s = series(ei)
      if (startIdx >= s.length || s(startIdx).t > windowEnd) return // empty edge-set
      if (ei == m - 1) {
        // Last edge: take everything up to the window end (maximal by construction).
        var j = startIdx
        var fsum = 0.0
        val buf = new ArrayBuffer[TF]()
        while (j < s.length && s(j).t <= windowEnd) { fsum += s(j).f; buf += s(j); j += 1 }
        if (fsum >= phi) {
          chosen(ei) = buf.toVector
          emit(LocalInstance(chosen.toVector))
        }
      } else {
        val next = series(ei + 1)
        var k = startIdx
        var fsum = 0.0
        val buf = new ArrayBuffer[TF]()
        while (k < s.length && s(k).t <= windowEnd) {
          fsum += s(k).f
          buf += s(k)
          val tk = s(k).t
          val nIdx = Series.upperBound(next, tk) // forced start of E_{i+1}
          val nT = if (nIdx < next.length) next(nIdx).t else Long.MaxValue
          val ownNextT = if (k + 1 < s.length) s(k + 1).t else Long.MaxValue
          // Maximal cut: e_i's next element must not be addable to this prefix.
          val maximalCut = !(ownNextT <= windowEnd && ownNextT < nT)
          if (maximalCut && fsum >= phi) { // φ prefix pruning (Algorithm 1 line 16)
            chosen(ei) = buf.toVector
            rec(ei + 1, nIdx, windowEnd)
          }
          k += 1
        }
      }
    }

    var prevEnd = Long.MinValue
    var a = 0
    while (a < e1.length) {
      val ts = e1(a).t
      val we = ts + delta
      // Skip rule: no R(e_m) element in (prevEnd, we] => only non-maximal instances.
      val lo = Series.upperBound(em, prevEnd)
      val hasNew = lo < em.length && em(lo).t <= we
      if (hasNew) {
        rec(0, a, we)
        prevEnd = we
      }
      a += 1
    }
  }
}
