package repro.bench

import repro.data.GroundTruth

/** Timing, qps-recall sweeps and table formatting shared by every bench. */
object BenchUtil {

  /** One point of a qps-recall curve (Figure 2's axes). */
  final case class CurvePoint(beam: Int, recall: Double, qps: Double)

  /** Measure wall-clock of `body` in seconds. */
  def seconds[A](body: => A): (A, Double) = {
    val t0 = System.nanoTime()
    val a = body
    (a, (System.nanoTime() - t0) / 1e9)
  }

  private val threadMx = java.lang.management.ManagementFactory.getThreadMXBean

  /** Measure the calling thread's CPU seconds for `body`. The bench host is
    * a microVM with visible CPU steal (multi-second random stalls), so
    * wall-clock distorts single-threaded measurements by up to 40x between
    * runs; thread CPU time is immune. Use for all single-threaded builds
    * and query loops (the paper measures single-threaded too); wall-clock
    * remains for the multi-threaded Spark build.
    */
  def cpuSeconds[A](body: => A): (A, Double) = {
    val t0 = threadMx.getCurrentThreadCpuTime
    val a = body
    (a, (threadMx.getCurrentThreadCpuTime - t0) / 1e9)
  }

  /** Run one method over a workload at one beam size; returns the curve
    * point (single-threaded query loop, matching the paper's measurement).
    * Two timed passes, best taken — a single GC pause otherwise distorts
    * the qps of a sub-second loop.
    */
  def measure(
      search: (Int, Int) => Array[Int], // (qid, beam) => result ids
      nQueries: Int,
      beam: Int,
      gt: Array[Array[Int]],
  ): CurvePoint = {
    val results = new Array[Array[Int]](nQueries)
    var best = Double.MaxValue
    var pass = 0
    while (pass < 2) {
      val t0 = threadMx.getCurrentThreadCpuTime
      var qid = 0
      while (qid < nQueries) {
        results(qid) = search(qid, beam)
        qid += 1
      }
      best = math.min(best, (threadMx.getCurrentThreadCpuTime - t0) / 1e9)
      pass += 1
    }
    CurvePoint(beam, GroundTruth.meanRecall(gt, results), nQueries / best)
  }

  val defaultBeams: Seq[Int] = Seq(10, 20, 40, 80, 160, 320, 640)

  /** Full sweep with one warm-up pass at the smallest beam (JIT). Stops
    * early once recall exceeds `stopRecall` (the curve is flat after that).
    */
  def sweep(
      search: (Int, Int) => Array[Int],
      nQueries: Int,
      gt: Array[Array[Int]],
      beams: Seq[Int] = defaultBeams,
      stopRecall: Double = 0.995,
  ): Seq[CurvePoint] = {
    var q = 0
    while (q < nQueries) { search(q, beams.head); q += 1 } // warm-up
    val out = Seq.newBuilder[CurvePoint]
    var done = false
    for (b <- beams if !done) {
      val p = measure(search, nQueries, b, gt)
      out += p
      if (p.recall >= stopRecall) done = true
    }
    out.result()
  }

  /** qps at the target recall, log-interpolated between the two bracketing
    * curve points; None when the method never reaches the target (the
    * paper's "curve missing / fails to achieve 0.8 recall" case).
    */
  def qpsAtRecall(curve: Seq[CurvePoint], target: Double): Option[Double] = {
    val sorted = curve.sortBy(_.beam)
    sorted.find(_.recall >= target) match {
      case None => None
      case Some(hit) =>
        val idx = sorted.indexOf(hit)
        if (idx == 0 || sorted(idx - 1).recall >= target) Some(hit.qps)
        else {
          val lo = sorted(idx - 1)
          val w = (target - lo.recall) / (hit.recall - lo.recall)
          Some(math.exp(math.log(lo.qps) * (1 - w) + math.log(hit.qps) * w))
        }
    }
  }

  def maxRecall(curve: Seq[CurvePoint]): Double =
    if (curve.isEmpty) 0.0 else curve.map(_.recall).max

  /** Fixed-width table printer; rows land in bench_output.txt via tee. */
  def formatTable(title: String, header: Seq[String], rows: Seq[Seq[String]]): String = {
    val all = header +: rows
    val widths = header.indices.map(i => all.map(r => r(i).length).max)
    def line(r: Seq[String]): String =
      r.zip(widths).map { case (c, w) => c.padTo(w, ' ') }.mkString("| ", " | ", " |")
    val sep = widths.map("-" * _).mkString("|-", "-|-", "-|")
    (s"== $title ==" +: line(header) +: sep +: rows.map(line)).mkString("\n")
  }

  def fmtQps(v: Option[Double]): String = v.map(q => f"$q%.0f").getOrElse("fail")
  def fmtMB(bytes: Long): String = f"${bytes / 1024.0 / 1024.0}%.2f"
}
