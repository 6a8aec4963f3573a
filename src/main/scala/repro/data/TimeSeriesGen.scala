package repro.data

import java.util.Random
import repro.core.TimePoint

/** Seeded synthetic substitutes for the paper's datasets (DESIGN.md §2.4).
  *
  * Every generator is deterministic in its seed, produces the paper's
  * shape (length, dimensionality, dynamics), and returns clean data —
  * errors are added by [[ErrorInjector]], except the two GPS sets whose
  * consecutive multipath-style errors are embedded here together with
  * the ground truth (the paper's GPS errors are "embedded", Table 2).
  */
object TimeSeriesGen {

  /** A labelled series for the classification/clustering datasets. */
  final case class LabeledSeries(label: Int, points: Array[TimePoint])

  /** A dirty series together with its ground truth (same timestamps). */
  final case class DirtyAndTruth(dirty: Array[TimePoint], truth: Array[TimePoint])

  private def gaussian(r: Random): Double = r.nextGaussian()

  // ---------------------------------------------------------------- Stock

  /** Stock [33]: 12k x 1, bounded random-walk price series. */
  def stock(n: Int = 12000, seed: Long = 7): Array[TimePoint] = {
    val r = new Random(seed)
    var price = 100.0
    Array.tabulate(n) { i =>
      price = math.max(10.0, price + 0.5 * gaussian(r))
      TimePoint.uni(i.toDouble, price)
    }
  }

  // ----------------------------------------------------------------- ILD

  /** ILD (Intel Lab) [27]: 43k x 3 — temperature / humidity / light with
    * slow daily periodicity plus sensor noise, distinct scales.
    */
  def ild(n: Int = 43000, seed: Long = 11): Array[TimePoint] = {
    val r = new Random(seed)
    val day = 2880.0 // samples per simulated day
    Array.tabulate(n) { i =>
      val phase = 2 * math.Pi * i / day
      val temp = 22.0 + 3.0 * math.sin(phase) + 0.15 * gaussian(r)
      val hum = 45.0 + 8.0 * math.sin(phase + 1.3) + 0.4 * gaussian(r)
      val light = 300.0 + 250.0 * math.max(0, math.sin(phase - 0.4)) + 5.0 * gaussian(r)
      TimePoint(i.toDouble, Array(temp, hum, light))
    }
  }

  // ----------------------------------------------------------------- TAO

  /** TAO [3]: oceanographic 3-D (paper 568k; benches use fewer points) —
    * smooth drifting oscillations per channel.
    */
  def tao(n: Int = 100000, seed: Long = 13): Array[TimePoint] = {
    val r = new Random(seed)
    var drift = 0.0
    Array.tabulate(n) { i =>
      drift += 0.0005 * gaussian(r)
      val sst = 28.0 + 1.5 * math.sin(2 * math.Pi * i / 9000.0) + drift + 0.05 * gaussian(r)
      val air = 26.5 + 1.2 * math.sin(2 * math.Pi * i / 9000.0 + 0.8) + 0.05 * gaussian(r)
      val hum = 78.0 + 4.0 * math.sin(2 * math.Pi * i / 15000.0) + 0.1 * gaussian(r)
      TimePoint(i.toDouble, Array(sst, air, hum))
    }
  }

  // ----------------------------------------------------------------- ECG

  /** ECG [37]: 94k x 32 (paper) — quasi-periodic multichannel signal;
    * channel count configurable for the Figure-13 dimension sweep.
    */
  def ecg(n: Int = 94000, dims: Int = 32, seed: Long = 17): Array[TimePoint] = {
    val r = new Random(seed)
    val phases = Array.fill(dims)(r.nextDouble() * 2 * math.Pi)
    val amps = Array.fill(dims)(0.5 + r.nextDouble())
    Array.tabulate(n) { i =>
      val beat = 2 * math.Pi * i / 180.0
      val v = Array.tabulate(dims) { d =>
        amps(d) * (math.sin(beat + phases(d)) + 0.35 * math.sin(3 * beat + 2 * phases(d))) +
          0.03 * gaussian(r)
      }
      TimePoint(i.toDouble, v)
    }
  }

  // ----------------------------------------------------------------- GPS

  /** GPS(Walk): 11k x 2 metres, walking trajectory (~1.3 m/s) with
    * embedded *consecutive* multipath error segments (run lengths 3–17,
    * ≈2% of points, offsets of several metres) — the error process the
    * paper describes for walking past buildings.
    */
  def gpsWalk(n: Int = 11000, seed: Long = 19): DirtyAndTruth = {
    val truth = trajectory(n, Array.fill(n)(1.3), seed)
    embedSegmentErrors(truth, nSegments = math.max(1, n / 440), maxRun = 17, offsetScale = 9.0, seed + 1)
  }

  /** GPS(Mixed): 8k x 2 metres with transportation-mode changes — walk
    * (1.4 m/s) → run (3.0 m/s) → cycle (5.0 m/s) in long segments with
    * acceleration ramps between modes (a person speeds up over a couple
    * of minutes; the ramp is also what lets MTCSC-A's KL monitor detect
    * the change while it happens) — plus embedded error segments.
    */
  def gpsMixed(n: Int = 8000, seed: Long = 23): DirtyAndTruth = {
    val modes = Array(1.4, 3.0, 5.0)
    val ramp = math.min(150, n / 10)
    val phase = n / 3
    val speeds = Array.tabulate(n) { i =>
      val m = math.min(2, i / phase)
      val intoPhase = i - m * phase
      if (m > 0 && intoPhase < ramp) {
        val alpha = intoPhase.toDouble / ramp
        modes(m - 1) + alpha * (modes(m) - modes(m - 1))
      } else modes(m)
    }
    val truth = trajectory(n, speeds, seed)
    embedSegmentErrors(truth, nSegments = math.max(1, n / 500), maxRun = 12, offsetScale = 12.0, seed + 1)
  }

  /** Smooth 2-D trajectory with per-step target speeds (1 Hz sampling):
    * heading is a slow random walk with a small constant turn (so the
    * walk loops in a bounded area, like a real recorded outing), and the
    * realised speed sits well below the nominal mode speed — real GPS
    * walking traces average ~70-80% of the constraint cap, which is what
    * lets online repairs re-attach after an error excursion.
    */
  private def trajectory(n: Int, speeds: Array[Double], seed: Long): Array[TimePoint] = {
    val r = new Random(seed)
    var x = 0.0; var y = 0.0
    var heading = r.nextDouble() * 2 * math.Pi
    Array.tabulate(n) { i =>
      heading += 0.012 + 0.08 * gaussian(r)
      val sp = math.max(0.1, speeds(i) * (0.68 + 0.08 * gaussian(r).abs))
      x += sp * math.cos(heading)
      y += sp * math.sin(heading)
      TimePoint(i.toDouble, Array(x, y))
    }
  }

  /** Embed consecutive error segments: each segment shifts both
    * coordinates by a fixed offset (multipath bias) plus small jitter.
    */
  private def embedSegmentErrors(truth: Array[TimePoint], nSegments: Int, maxRun: Int,
                                 offsetScale: Double, seed: Long): DirtyAndTruth = {
    val r = new Random(seed)
    val dirty = TimePoint.copyOf(truth)
    val n = truth.length
    var s = 0
    while (s < nSegments) {
      val start = 2 + r.nextInt(math.max(1, n - maxRun - 4))
      val run = 3 + r.nextInt(maxRun - 2)
      val ang = r.nextDouble() * 2 * math.Pi
      val mag = offsetScale * (0.6 + 0.8 * r.nextDouble())
      val ox = mag * math.cos(ang)
      val oy = mag * math.sin(ang)
      var i = start
      while (i < math.min(n, start + run)) {
        dirty(i).v(0) = truth(i).v(0) + ox + 0.5 * gaussian(r)
        dirty(i).v(1) = truth(i).v(1) + oy + 0.5 * gaussian(r)
        i += 1
      }
      s += 1
    }
    DirtyAndTruth(dirty, truth)
  }

  // --------------------------------------------- classification datasets

  /** ArrowHead [9]: 211 series x 251 x 1, 3 classes (shape families). */
  def arrowHead(seed: Long = 29): Seq[LabeledSeries] =
    labeled(nSeries = 211, len = 251, dims = 1, classes = 3, seed)

  /** AtrialFib [4]: 30 series x 640 x 2, 3 classes. */
  def atrialFib(seed: Long = 31): Seq[LabeledSeries] =
    labeled(nSeries = 30, len = 640, dims = 2, classes = 3, seed)

  /** DSR (DistalPhalanxSmallReach-like) [9]: 16 series x 345 x 1, 2 classes. */
  def dsr(seed: Long = 37): Seq[LabeledSeries] =
    labeled(nSeries = 16, len = 345, dims = 1, classes = 2, seed)

  /** SWJ (StandWalkJump) [4]: 27 series x 2500 x 4, 3 classes. */
  def swj(seed: Long = 41): Seq[LabeledSeries] =
    labeled(nSeries = 27, len = 2500, dims = 4, classes = 3, seed)

  /** Class-dependent smooth signal families. Each class has a smooth
    * multi-harmonic prototype; instances mix in a random fraction of
    * another class's prototype plus noise, so part of every class sits
    * near a decision boundary — with fully separated prototypes, even
    * heavily corrupted training data still classifies perfectly and the
    * cleaning experiment (Figure 16) would have nothing to show.
    */
  private def labeled(nSeries: Int, len: Int, dims: Int, classes: Int, seed: Long): Seq[LabeledSeries] = {
    val r = new Random(seed)
    val harmonics = 6
    // prototype(c)(d)(t): smooth random curve per class and dimension
    val protos = Array.tabulate(classes, dims) { (_, _) =>
      val amp = Array.fill(harmonics)(0.45 * (0.7 + 0.6 * r.nextDouble()))
      val freq = Array.fill(harmonics)(1 + r.nextInt(7))
      val phi = Array.fill(harmonics)(r.nextDouble() * 2 * math.Pi)
      Array.tabulate(len) { t =>
        var acc = 0.0
        var h = 0
        while (h < harmonics) {
          acc += amp(h) * math.sin(2 * math.Pi * freq(h) * t / len + phi(h)); h += 1
        }
        acc
      }
    }
    (0 until nSeries).map { s =>
      val label = s % classes
      val other = (label + 1 + r.nextInt(math.max(1, classes - 1))) % classes
      // Mixes reaching past the class midpoint create genuine overlap:
      // the boundary region is contested, so corruption (and cleaning)
      // actually moves the classifier — as on the paper's real UCR sets.
      val mix = 0.55 * r.nextDouble()
      // Low instance noise: the class margin must be small enough that
      // injected errors (not the noise floor) decide neighbour ordering.
      val pts = Array.tabulate(len) { i =>
        val v = Array.tabulate(dims) { d =>
          val p = protos(label)(d)(i)
          val q = protos(other)(d)(i)
          p + mix * (q - p) + 0.06 * gaussian(r)
        }
        TimePoint(i.toDouble, v)
      }
      LabeledSeries(label, pts)
    }
  }
}
