package repro.core

import scala.collection.mutable
import repro.classifier.{HoeffdingTree, HoeffdingTreeConfig}
import repro.detector.Adwin
import repro.eval.{Probeable, ProbeResult, StreamSystem}

/** FiCSUM parameters (paper §VI-2). Window/gap defaults are the paper's
  * tuned values scaled to this reproduction's shorter segments: w=50
  * (paper 75), buffer ratio 0.25, P_C=5 (paper 3), P_S=50 (paper 25).
  */
final case class FiCSUMConfig(
    windowSize: Int = 50,
    bufferRatio: Double = 0.25,
    fingerprintGap: Int = 3,
    repoGap: Int = 50,
    adwinDelta: Double = 0.8,
    /** Floor on the ±2σ acceptance band so freshly-created concepts with
      * near-zero σ are not unmatchable (stands in for paper §IV's
      * similarity-record transform).
      */
    acceptMinBand: Double = 0.15,
    /** Larger grace period than the global default: FiCSUM's plasticity
      * reset fires on tree growth (§IV), and too-frequent splits would reset
      * the supervised fingerprint dims before ADWIN can cut on the
      * similarity dip.
      */
    treeConfig: HoeffdingTreeConfig = HoeffdingTreeConfig(gracePeriod = 100),
) extends Serializable {
  def bufferLen: Int = math.max(1, (windowSize * bufferRatio).round.toInt)
}

/** The FiCSUM framework (paper Algorithm 1): fingerprint-based concept
  * drift detection and model selection over a repository of
  * (fingerprint, classifier, normal-similarity) concept representations.
  *
  * The fingerprint layout is given by `spec`; restricting it yields the
  * paper's ER / S-MI / U-MI / single-function evaluation variants.
  */
final class FiCSUM(
    val name: String,
    numFeatures: Int,
    numClasses: Int,
    spec: FingerprintSpec,
    cfg: FiCSUMConfig = FiCSUMConfig(),
    seed: Long = 42,
) extends StreamSystem with Probeable {

  private val w = cfg.windowSize
  private val b = cfg.bufferLen

  private val buf = new mutable.ArrayDeque[Labeled]()
  private var i   = 0L

  private val normalizer = new Normalizer(spec.dim)
  private var adwin      = new Adwin(cfg.adwinDelta)

  private var nextId = 0
  private val repo   = mutable.ArrayBuffer.empty[ConceptState]

  private def newConcept(): ConceptState = {
    val c = new ConceptState(nextId, spec.dim,
      new HoeffdingTree(numFeatures, numClasses, cfg.treeConfig, seed = seed + nextId))
    nextId += 1
    repo += c
    c
  }

  private var active: ConceptState = newConcept()

  private var lastWeights: Array[Double] = Array.fill(spec.dim)(1.0)
  private var simEwma: Double = Double.NaN
  private var normEwma: Double = Double.NaN
  private var breachCount: Int = 0
  @transient private var lastComparison: (Array[Double], Array[Double]) = null
  private var pendingSecondCheck: Long = -1L
  private var newConceptFromLastDrift: Option[ConceptState] = None

  /** Number of drift detections so far (diagnostics). */
  var driftCount: Int = 0

  /** Diagnostics counters. */
  var fingerprintUpdates: Long = 0
  var detectorUpdates: Long = 0

  /** Optional hook receiving (obsIndex, simA) for each detector update —
    * used by diagnostics and the streaming-layer equivalence test.
    */
  @transient var simHook: (Long, Double) => Unit = null

  /** Repository size (diagnostics). */
  def repositorySize: Int = repo.length

  // ------------------------------------------------------------- internals

  private def window(tail: Boolean): IndexedSeq[Labeled] =
    if (tail) buf.takeRight(w).toIndexedSeq else buf.take(w).toIndexedSeq

  private def fingerprint(win: IndexedSeq[Labeled], s: ConceptState): Array[Double] =
    Fingerprinter.make(spec, win, Some(s.classifier))

  /** Fingerprint of `win` as concept `s` would see it: s's classifier
    * re-predicts the labels (paper's F_AS / F_SC construction).
    */
  private def foreignFingerprint(win: IndexedSeq[Labeled], s: ConceptState): Array[Double] = {
    val relabeled = win.map(o => o.copy(l = s.classifier.predict(o.x)))
    Fingerprinter.make(spec, relabeled, Some(s.classifier))
  }

  private def simTo(s: ConceptState, raw: Array[Double], weights: Array[Double]): Double =
    Similarity.sim(normalizer.scale(s.stats.meanVector), normalizer.scale(raw), weights)

  @transient var debugSelection: Boolean = false

  private def selectModel(
      win: IndexedSeq[Labeled],
      weights: Array[Double],
      exclude: Option[ConceptState],
  ): Option[ConceptState] = {
    // Average the tested similarity over staggered sub-windows of the
    // buffer to cut single-window sampling noise before the band test.
    val wins: Seq[IndexedSeq[Labeled]] =
      if (buf.length >= w + 2) {
        val all = buf.toIndexedSeq
        val offsets = Seq(0, (all.length - w) / 2, all.length - w).distinct
        offsets.map(o => all.slice(o, o + w))
      } else Seq(win)
    val scored = repo.iterator
      .filter(s => !exclude.contains(s))
      .filter(s => s.stats.totalCount >= 2 && s.sampleFps.nonEmpty)
      .map { s =>
        // Per-candidate weights (w_σ is the *candidate's* per-dim scale) and
        // a self-similarity band recomputed from retained sample
        // fingerprints under the current normalizer/weights (§IV).
        val ws = DynamicWeights.compute(s, repo.toIndexedSeq, normalizer)
        val sims = wins.map(wn => simTo(s, foreignFingerprint(wn, s), ws))
        val simAvg = sims.sum / sims.length
        val selfSims = s.sampleFps.map(fp => simTo(s, fp, ws))
        val selfMu = selfSims.sum / selfSims.length
        val selfSd = math.sqrt(
          selfSims.map(v => (v - selfMu) * (v - selfMu)).sum / selfSims.length)
        (s, simAvg, selfMu, selfSd)
      }
      .toSeq
    // Two-sided acceptance (paper: |Sim − μ_s| ≤ 2σ_s, with a floor), plus
    // a self-coherence floor: a concept whose own sample fingerprints do
    // not resemble its mean representation (contaminated creation) cannot
    // vouch for any window and is never re-selected.
    val candidates = scored.filter { case (_, sim, mu, sd) =>
      mu >= 0.2 && math.abs(sim - mu) <= math.max(2 * sd, cfg.acceptMinBand)
    }
    if (debugSelection) {
      val desc = scored.map { case (s, sim, mu, sd) =>
        f"c${s.id}:sim=$sim%.3f mu=$mu%.3f sd=$sd%.3f"
      }.mkString("  ")
      Console.err.println(s"[select @$i] $desc -> ${candidates.map(_._1.id).mkString(",")}")
    }
    // Paper: "recurrence of the accepted M with highest Sim_WM".
    if (candidates.isEmpty) None
    else Some(candidates.maxBy { case (_, sim, _, _) => sim }._1)
  }

  private def plasticityCheck(): Unit = {
    if (active.classifier.splitEvents > active.seenSplitEvents) {
      // The classifier changed structurally (§IV): increase the plasticity
      // of the classifier-dependent dims (soft decay keeps μ/σ but lets new
      // fingerprints move them faster) and re-open the incorporation budget
      // so the frozen representation can absorb the new behaviour.
      // Only re-open incorporation when similarity is currently normal: a
      // split while similarity is suppressed usually means the tree is
      // learning an *undetected emerging concept*, and absorbing those
      // windows would poison this concept's representation.
      val suspicious = active.simStats.count >= 2 && !simEwma.isNaN &&
        simEwma < active.simStats.mean - 2 * active.simStats.std - 0.05
      active.stats.decayDims(spec.classifierDependentDims, 0.3)
      if (!suspicious) active.grantBudget(ConceptState.SplitBudget, capped = true)
      active.seenSplitEvents = active.classifier.splitEvents
      // A split shifts classifier-dependent dims benignly for a while; give
      // the fast breach path extra patience so it does not race the
      // plasticity absorption (ADWIN still guards real drifts).
      breachCount = math.min(breachCount, -10)
    }
  }

  private def onDrift(win: IndexedSeq[Labeled], weights: Array[Double]): Unit = {
    val chosen = selectModel(win, weights, exclude = None)
    if (chosen.exists(_ eq active)) {
      // The recent window still matches the active concept's normal band:
      // a detector false alarm. Keep the representation and buffers; only
      // the detector state restarts, so false alarms are nearly free.
      adwin = new Adwin(cfg.adwinDelta)
      simEwma = Double.NaN
      breachCount = 0
      return
    }
    driftCount += 1
    chosen match {
      case Some(s) =>
        active = s
        active.markActivated()
        newConceptFromLastDrift = None
      case None =>
        active = newConcept()
        newConceptFromLastDrift = Some(active)
    }
    pendingSecondCheck = i + w
    adwin = new Adwin(cfg.adwinDelta)
    buf.clear()
    simEwma = Double.NaN
    breachCount = 0
  }

  private def secondCheck(): Unit = {
    // Re-run model selection once A is fully drawn from the emerging
    // segment; a found recurrence replaces a freshly created concept.
    newConceptFromLastDrift match {
      case Some(fresh) if (active eq fresh) && buf.length >= w =>
        val win = window(tail = true)
        selectModel(win, lastWeights, exclude = Some(fresh)) match {
          case Some(s) =>
            repo -= fresh
            active = s
          case None => ()
        }
      case _ => ()
    }
    newConceptFromLastDrift = None
    pendingSecondCheck = -1L
  }

  // ------------------------------------------------------------------ step

  def step(x: Array[Double], y: Int): (Int, Int) = {
    val l = active.classifier.predict(x)
    active.classifier.train(x, y)
    buf.append(Labeled(x, y, l))
    if (buf.length > b + w) buf.removeHead()
    i += 1

    val full = buf.length == b + w
    if (full && i % cfg.fingerprintGap == 0) {
      fingerprintUpdates += 1
      val winA = window(tail = true)
      val winB = window(tail = false)
      val fA = fingerprint(winA, active)
      val fB = fingerprint(winB, active)
      normalizer.update(fA)
      normalizer.update(fB)
      plasticityCheck()
      val weights = DynamicWeights.compute(active, repo.toIndexedSeq, normalizer)
      lastWeights = weights

      // Bounded incorporation (freeze-after-budget, DESIGN.md §4).
      if (!active.frozen) {
        active.stats.add(fB)
        active.openRemaining -= 1
        normEwma = Double.NaN
      } else if (active.simBudget > 0) {
        // Normal-similarity record (μ_c, σ_c): early frozen-phase only,
        // EWMA-smoothed to estimate the *level* of normal similarity rather
        // than single-window sampling noise.
        val normSim = simTo(active, fB, weights)
        normEwma = if (normEwma.isNaN) normSim else 0.7 * normEwma + 0.3 * normSim
        active.simStats.add(normEwma)
        if (active.simBudget % 3 == 0) active.addSample(fB)
        active.simBudget -= 1
      }

      // Detection runs only against a *frozen* reference with a complete
      // normal-similarity record: during the open phase both the classifier
      // and the concept fingerprint are still maturing, which puts a strong
      // upward trend on the similarity that would dilute ADWIN's change
      // statistics — and arming before the sample fingerprints are
      // collected would leave early (false) detections without a usable
      // recurrence band, spawning garbage concepts.
      if (active.frozen && active.stats.totalCount >= 2 && active.simStats.count >= 2) {
        detectorUpdates += 1
        val simA = simTo(active, fA, weights)
        lastComparison = (fA, weights)
        // EWMA smoothing: consecutive fingerprints overlap by w−P_C
        // observations, so raw sims carry heavy-tailed sampling noise that
        // slows ADWIN's cut; smoothing trades a little lag for a much
        // cleaner level shift.
        simEwma = if (simEwma.isNaN) simA else 0.6 * simEwma + 0.4 * simA
        if (simHook != null) simHook(i, simEwma)
        // Fast path: a deep, sustained breach of the concept's normal
        // similarity band is called immediately rather than waiting for
        // ADWIN's conservative bound to catch up — at these segment lengths
        // detection lag directly caps concept-tracking (C-F1).
        if (simEwma < active.simStats.mean - math.max(3 * active.simStats.std, 0.1))
          breachCount += 1
        else breachCount = 0
        val cut = adwin.add(simEwma)
        // Detection is armed only once the normal-similarity record and
        // sample fingerprints are complete; before that ADWIN just warms up
        // on stationary values so arming starts from a real baseline
        // instead of cutting on its first few (still-settling) values.
        val armed = active.simBudget <= 0
        if (armed && (cut || breachCount >= 5)) onDrift(winA, weights)
      }
    }

    if (buf.length == b + w && i % cfg.repoGap == 0 && repo.length > 1) {
      val winA = window(tail = true)
      for (s <- repo if !(s eq active)) {
        val fSC = foreignFingerprint(winA, s)
        normalizer.update(fSC)
        s.scStats.add(fSC)
      }
    }

    if (pendingSecondCheck >= 0 && i >= pendingSecondCheck) secondCheck()

    (l, active.id)
  }

  /** Diagnostics: per-dim (name, scaledActiveMean, scaledFA, weightedDev)
    * of the latest detector comparison, sorted by |weightedDev| descending.
    */
  def lastDeviations(): IndexedSeq[(String, Double, Double, Double)] = {
    if (lastComparison == null) return IndexedSeq.empty
    val (fA, weights) = lastComparison
    val a = normalizer.scale(active.stats.meanVector)
    val b = normalizer.scale(fA)
    spec.dimNames.indices
      .map(i => (spec.dimNames(i), a(i), b(i), weights(i) * (a(i) - b(i))))
      .sortBy { case (_, _, _, d) => -math.abs(d) }
  }

  // ----------------------------------------------------------------- probe

  def probe(): Option[ProbeResult] = {
    if (repo.length < 2 || buf.length < w) return None
    val win = window(tail = true)
    val usable = repo.filter(s => s.stats.totalCount >= 2)
    if (usable.length < 2) return None
    val sims = usable.map { s =>
      s.id -> simTo(s, foreignFingerprint(win, s), lastWeights)
    }.toMap
    val sigmas = usable.map(s => s.id -> s.simStats.std).toMap
    Some(ProbeResult(sims, sigmas))
  }
}

/** Factories for the paper's evaluation variants. */
object FiCSUM {

  def full(d: Int, k: Int, cfg: FiCSUMConfig = FiCSUMConfig(), seed: Long = 42): FiCSUM =
    new FiCSUM("FiCSUM", d, k, FingerprintSpec.full(d), cfg, seed)

  def supervised(d: Int, k: Int, cfg: FiCSUMConfig = FiCSUMConfig(), seed: Long = 42): FiCSUM =
    new FiCSUM("S-MI", d, k, FingerprintSpec.supervised(d), cfg, seed)

  def unsupervised(d: Int, k: Int, cfg: FiCSUMConfig = FiCSUMConfig(), seed: Long = 42): FiCSUM =
    new FiCSUM("U-MI", d, k, FingerprintSpec.unsupervised(d), cfg, seed)

  def errorRate(d: Int, k: Int, cfg: FiCSUMConfig = FiCSUMConfig(), seed: Long = 42): FiCSUM =
    new FiCSUM("ER", d, k, FingerprintSpec.errorRate(d), cfg, seed)

  /** Table V single-function variant ("Shapley Value" uses the per-feature
    * importance dims; every other row applies its function group to all
    * behaviour sources).
    */
  def singleFunction(label: String, d: Int, k: Int,
                     fns: IndexedSeq[repro.meta.MetaFunction],
                     cfg: FiCSUMConfig = FiCSUMConfig(), seed: Long = 42): FiCSUM = {
    val spec =
      if (fns.isEmpty) FingerprintSpec.shapleyOnly(d)
      else FingerprintSpec.singleFunction(d, fns)
    new FiCSUM(label, d, k, spec, cfg, seed)
  }
}
