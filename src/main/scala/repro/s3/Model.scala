package repro.s3

/** Calibrated simulation parameters + the paper's §II-B cost model.
  *
  * The *counts* (bytes scanned/returned, requests, rows) are measured from
  * real execution over real data; only their conversion to seconds/dollars is
  * modeled here. Rates are calibrated so the paper's anchor ratios hold (see
  * DESIGN.md §5): S3-side filter ≈10x faster / ≈24% dearer than server-side,
  * filtered group-by ≈1.6x over server-side, indexing degrades past 1e-4
  * selectivity, Bloom FPR sweet spot at 0.01, top-K optimal S ≈ sqrt(KN/α).
  */
object Model {

  // ---- throughputs (bytes/second) -------------------------------------
  /** Effective S3→EC2 network bandwidth (10 GigE minus protocol overhead). */
  val NetBandwidth = 1.0e9
  /** Aggregate S3 Select scan rate across parallel object scans. */
  val S3ScanRate = 3.5e9
  /** Server-side CSV→dataframe parse rate (Pandas on r4.8xlarge). */
  val ServerParseRate = 0.35e9

  // ---- server-side per-row costs (seconds/row) ------------------------
  /** Hash work: group-by aggregation, join build/probe. */
  val RowHash = 0.25e-6
  /** Vectorized scan work: threshold compare, unique() over a column. */
  val RowLight = 0.02e-6
  /** Sort/heap work per row·log2(rows). */
  val RowSortPerLog = 0.01e-6

  // ---- request handling -----------------------------------------------
  /** Server CPU per byte-range GET (HTTP request + response handling). */
  val GetRequestCpu = 2.0e-3
  /** Request-level parallelism (32 cores / processes, §III). */
  val RequestParallelism = 32
  /** Latency per wave of S3 Select round-trips. */
  val SelectLatency = 0.05

  // ---- S3-side expression slowdowns (consumed in SelectEngine) --------
  /** Fractional scan slowdown per CASE term (S3-side group-by, §VI). */
  val CaseCostPerTerm = 0.06
  /** Fractional scan slowdown per Bloom SUBSTRING probe (§V). */
  val BloomHashCost = 0.3

  // ---- pricing (paper §II-B, US East) ---------------------------------
  val ScanDollarsPerGB    = 0.002
  val ReturnDollarsPerGB  = 0.0007
  val GetDollarsPer1000   = 0.0004
  val Ec2DollarsPerHour   = 2.128 // r4.8xlarge

  val GB = 1e9
}

/** The paper's four cost bars: compute, S3 request, S3 data scan, transfer. */
final case class CostBreakdown(compute: Double, scan: Double, transfer: Double, request: Double) {
  def total: Double = compute + scan + transfer + request
  def +(o: CostBreakdown): CostBreakdown =
    CostBreakdown(compute + o.compute, scan + o.scan, transfer + o.transfer, request + o.request)
}

object CostBreakdown {
  val zero: CostBreakdown = CostBreakdown(0, 0, 0, 0)
}

object RuntimeModel {
  import Model._

  /** Simulated seconds for one phase, with metrics scaled by `scale`
    * (= paper scale factor / bench scale factor; see DESIGN.md §2).
    *
    * Stages within a phase are pipelined (max); request handling adds on top.
    * GET-request count scales with data size (one per selected row); the
    * handful of S3 Select requests (one per shard) does not.
    */
  def phaseSeconds(p: PhaseView, scale: Double = 1.0): Double = {
    val tScan   = p.scannedBytes * scale / S3ScanRate * p.exprFactor
    val tNet    = p.returnedBytes * scale / NetBandwidth
    val tServer = p.localParsedBytes * scale / ServerParseRate + p.localSeconds * scale
    val tReq =
      math.ceil(p.selectRequests.toDouble / RequestParallelism) * SelectLatency +
        p.getRequests * scale * GetRequestCpu / RequestParallelism
    math.max(tScan, math.max(tNet, tServer)) + tReq
  }

  /** Dollar cost given total (unscaled) phase metrics and simulated runtime. */
  def cost(phases: Seq[PhaseView], runtimeSeconds: Double, scale: Double = 1.0): CostBreakdown = {
    val scanned  = phases.map(_.scannedBytes).sum * scale
    val returned = phases.map(_.returnedBytes).sum * scale
    // Only S3 Select scans incur scan/return charges; range GETs pay the
    // request fee and free in-region transfer. We charge returned bytes of
    // select phases at the return rate (conservative: GET bytes are free).
    val selReturned = phases.filter(_.selectRequests > 0).map(_.returnedBytes).sum * scale
    val gets     = phases.map(_.getRequests).sum * scale
    val selects  = phases.map(_.selectRequests).sum // per-query, does not scale
    CostBreakdown(
      compute  = runtimeSeconds / 3600.0 * Ec2DollarsPerHour,
      scan     = scanned / GB * ScanDollarsPerGB,
      transfer = selReturned / GB * ReturnDollarsPerGB,
      request  = (gets + selects) / 1000.0 * GetDollarsPer1000,
    )
  }
}
