package repro.diffusion

import repro.core.{ProblemInstance, Seed}
import repro.dynamics.Dynamics

/** Final state of a campaign simulation.
  *
  * @param a     expected adoption probability per (user, item)
  * @param w     per-user meta-graph weightings at the end of the campaign
  * @param steps total mean-field steps executed across all promotions
  */
final case class DiffusionResult(a: Array[Array[Double]], w: Array[Array[Double]], steps: Int)

/** Driver-local mean-field campaign simulator — the reference
  * implementation of the diffusion process of Sec. III with the dynamic
  * factors of Sec. V-A (formulas in [[repro.dynamics.Dynamics]]).
  *
  * Semantics per promotion t = 1..T:
  *  - at ζ_t = 0 the round's seeds adopt deterministically (a := 1) and
  *    perceptions update;
  *  - at each step ζ_t ≥ 1, last step's new (expected) adoptions send
  *    promotions over social arcs with the dynamic P_act, adoption deltas
  *    are (1−a)·q·P_pref, item associations add (1−a)·q·P_pref(x)·r^C·scale
  *    extra deltas, then weightings / preferences / influence update;
  *  - a promotion stops when no delta exceeds `params.eps` or after
  *    `params.maxSteps` steps.
  *
  * `mask` (if given) restricts the diffusion to the induced subgraph of the
  * masked users (used for per-target-market evaluations σ^τ in TDSI).
  */
object LocalDiffusion {

  def run(inst: ProblemInstance, seeds: Seq[Seed], mask: Option[Array[Boolean]] = None): DiffusionResult = {
    seeds.foreach { s =>
      require(s.t <= inst.T, s"seed round ${s.t} exceeds T=${inst.T}")
      require(s.user >= 0 && s.user < inst.nUsers && s.item >= 0 && s.item < inst.nItems, s"bad seed $s")
    }
    val n = inst.nUsers
    val nI = inst.nItems
    val active: Int => Boolean = mask match {
      case Some(mk) => v => mk(v)
      case None     => _ => true
    }
    val a = Array.fill(n)(new Array[Double](nI))
    val w = Array.fill(n)(Dynamics.initUserWeights(inst))
    val sumA = new Array[Double](n)
    val seedsByT = seeds.groupBy(_.t)
    var totalSteps = 0

    // last step's applied deltas, stored sparsely per user
    var lastDelta: Array[List[(Int, Double)]] = Array.fill(n)(Nil)

    def applyDeltas(raw: Array[Array[Double]]): (Array[List[(Int, Double)]], Double) = {
      val applied = Array.fill[List[(Int, Double)]](n)(Nil)
      var maxD = 0.0
      var v = 0
      while (v < n) {
        val rv = raw(v)
        if (rv != null) {
          var x = 0
          var touched = false
          while (x < nI) {
            if (rv(x) > 0.0) {
              val d = math.min(rv(x), 1.0 - a(v)(x))
              if (d > 0.0) {
                a(v)(x) += d
                sumA(v) += d
                applied(v) = (x, d) :: applied(v)
                if (d > maxD) maxD = d
                touched = true
              }
            }
            x += 1
          }
          if (touched) w(v) = {
            val nw = new Array[Double](inst.nMeta)
            Dynamics.updateUserWeights(inst, a(v), nw)
            nw
          }
        }
        v += 1
      }
      (applied, maxD)
    }

    var t = 1
    while (t <= inst.T) {
      // ζ_t = 0: seed adoptions
      val seedRaw = new Array[Array[Double]](n)
      seedsByT.getOrElse(t, Nil).foreach { s =>
        if (active(s.user)) {
          if (seedRaw(s.user) == null) seedRaw(s.user) = new Array[Double](nI)
          seedRaw(s.user)(s.item) = math.max(seedRaw(s.user)(s.item), 1.0 - a(s.user)(s.item))
        }
      }
      val (_, seedMax) = applyDeltas(seedRaw)
      // each promotion re-diffuses from every current adopter (multi-round
      // IM semantics of [5], which the paper follows): the round's frontier
      // carries the full adoption mass (seeds now included in `a`), so
      // later rounds retry the influence attempts that failed earlier
      val frontier = Array.tabulate[List[(Int, Double)]](n) { v =>
        if (!active(v)) Nil
        else {
          var l = List.empty[(Int, Double)]
          var x = 0
          while (x < nI) {
            if (a(v)(x) > 0.0) l = (x, a(v)(x)) :: l
            x += 1
          }
          l
        }
      }
      lastDelta = frontier
      var moving = seedMax > 0.0 || frontier.exists(_.nonEmpty)

      var step = 0
      while (moving && step < inst.params.maxSteps) {
        step += 1
        totalSteps += 1
        // 1 - Π(1 - Δa(u',x)·P_act(u',v)) accumulated multiplicatively
        val notProm = new Array[Array[Double]](n)
        var v = 0
        while (v < n) {
          if (active(v)) {
            val nbrs = inst.inNbr(v)
            var i = 0
            while (i < nbrs.length) {
              val u = nbrs(i)
              if (active(u) && lastDelta(u).nonEmpty) {
                val actUV =
                  Dynamics.act(inst, inst.inAct(v)(i), Dynamics.sim(a(u), a(v), sumA(u), sumA(v)))
                lastDelta(u).foreach { case (x, d) =>
                  if (notProm(v) == null) { notProm(v) = Array.fill(nI)(1.0) }
                  notProm(v)(x) *= (1.0 - d * actUV)
                }
              }
              i += 1
            }
          }
          v += 1
        }
        // adoption + extra-adoption deltas
        val raw = new Array[Array[Double]](n)
        v = 0
        while (v < n) {
          val np = notProm(v)
          if (np != null) {
            val contrib = Dynamics.prefContrib(inst, w(v), a(v))
            val rv = new Array[Double](nI)
            var x = 0
            while (x < nI) {
              if (np(x) < 1.0) {
                val q = 1.0 - np(x)
                val pPref = Dynamics.pref(inst, inst.basePref(v)(x), contrib(x))
                rv(x) += (1.0 - a(v)(x)) * q * pPref
                // item associations: P_ext = q · P_pref(x) · r^C(v,x,y) · scale,
                // with the total association mass of one promotion event
                // bounded by q · P_pref · scale (the r^C row is normalized to
                // sum <= 1 — DESIGN.md Sec. 4; keeps dense complementary
                // catalogs from exploding super-linearly under bundles)
                val base = q * pPref * inst.params.extraScale
                if (base > 0.0) {
                  var rowSum = 0.0
                  inst.cMeta.foreach { m =>
                    val wm = w(v)(m)
                    if (wm > 0.0) {
                      val nbrs = inst.metaNbrs(m)(x)
                      var j = 0
                      while (j < nbrs.length) { rowSum += wm * nbrs(j)._2; j += 1 }
                    }
                  }
                  val factor = if (rowSum > 1.0) 1.0 / rowSum else 1.0
                  inst.cMeta.foreach { m =>
                    val wm = w(v)(m)
                    if (wm > 0.0) {
                      val nbrs = inst.metaNbrs(m)(x)
                      var j = 0
                      while (j < nbrs.length) {
                        val (y, s) = nbrs(j)
                        rv(y) += (1.0 - a(v)(y)) * base * factor * wm * s
                        j += 1
                      }
                    }
                  }
                }
              }
              x += 1
            }
            raw(v) = rv
          }
          v += 1
        }
        val (applied, maxD) = applyDeltas(raw)
        lastDelta = applied
        moving = maxD > inst.params.eps
      }
      t += 1
    }
    DiffusionResult(a, w, totalSteps)
  }

  /** Importance-aware influence σ (Def. 1): Σ_x w_x Σ_v a(v,x), optionally
    * counting only users in `countMask` (σ^τ of Eq. 5).
    */
  def sigmaOf(inst: ProblemInstance, res: DiffusionResult, countMask: Option[Array[Boolean]] = None): Double = {
    var acc = 0.0
    var v = 0
    while (v < inst.nUsers) {
      if (countMask.forall(_(v))) {
        val av = res.a(v)
        var x = 0
        while (x < inst.nItems) { acc += inst.importance(x) * av(x); x += 1 }
      }
      v += 1
    }
    acc
  }

  /** Convenience: run + σ. */
  def sigma(inst: ProblemInstance, seeds: Seq[Seed], mask: Option[Array[Boolean]] = None,
            countMask: Option[Array[Boolean]] = None): Double =
    sigmaOf(inst, run(inst, seeds, mask), countMask)

  /** Future-adoption likelihood π (Eq. 7) of the end state:
    * Σ_v Σ_y (1−a(v,y)) · AIS(v,y) · P_pref(v,y), with the IC form of AIS
    * (footnote 22) evaluated mean-field.
    */
  def pi(inst: ProblemInstance, res: DiffusionResult, countMask: Option[Array[Boolean]] = None): Double = {
    val sumA = res.a.map(_.sum)
    var acc = 0.0
    var v = 0
    while (v < inst.nUsers) {
      if (countMask.forall(_(v))) {
        val contrib = Dynamics.prefContrib(inst, res.w(v), res.a(v))
        var y = 0
        while (y < inst.nItems) {
          val remain = 1.0 - res.a(v)(y)
          if (remain > 1e-12) {
            var not = 1.0
            val nbrs = inst.inNbr(v)
            var i = 0
            while (i < nbrs.length) {
              val u = nbrs(i)
              if (res.a(u)(y) > 0.0) {
                val actUV =
                  Dynamics.act(inst, inst.inAct(v)(i), Dynamics.sim(res.a(u), res.a(v), sumA(u), sumA(v)))
                not *= (1.0 - res.a(u)(y) * actUV)
              }
              i += 1
            }
            val ais = 1.0 - not
            if (ais > 0.0) acc += remain * ais * Dynamics.pref(inst, inst.basePref(v)(y), contrib(y))
          }
          y += 1
        }
      }
      v += 1
    }
    acc
  }
}
