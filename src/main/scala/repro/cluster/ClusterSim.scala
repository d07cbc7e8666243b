package repro.cluster

/** Analytic throughput model of the ingestion framework on an N-node
  * cluster — the substitute for the paper's 24-node Opteron testbed
  * (DESIGN.md §4 records the substitution argument).
  *
  * The model follows the paper's pipeline structure:
  *
  *  - **intake capacity**: `intakeNodes × intakeRate` raw records/s (the
  *    adapter only moves bytes in the new framework);
  *  - **coupled parsing** (current/static framework): parsing runs on the
  *    intake node(s), capping static ingestion at
  *    `intakeNodes × parseRate`;
  *  - **decoupled parsing** (new/dynamic framework): parsing happens inside
  *    the computing job across all nodes;
  *  - **computing-job cycle** (dynamic only): one job at a time (the AFM
  *    invokes the next when the previous finishes):
  *    `cycle = overhead(nodes) + invokePerRecord·batch + parse(batch)/nodes
  *             + udfSeconds(batch, nodes, refScale)`;
  *    throughput = `batch / max(cycle, batch/intakeCapacity)`;
  *  - **storage capacity**: `nodes × storageRate` (rarely binding).
  *
  * Defaults are calibrated against the paper's published anchors: 24-node,
  * no-UDF refresh rates of 68 / 27 / 10 jobs/s at 420 / 1680 / 6720
  * records/batch (§7.1) — the fitted per-record invocation cost plus a
  * per-node overhead slope reproduce 68 / 27 / ~8 — and against per-core
  * arithmetic rates plausible for the 2.0 GHz dual-core Opterons.
  */
final case class SimParams(
    intakeRate: Double = 70000,        // rec/s per intake node, raw receive
    parseRate: Double = 14000,         // rec/s per node, ~450-byte JSON parse
    storageRate: Double = 40000,       // rec/s per node, LSM append
    overheadBase: Double = 0.002,      // s, per computing-job invocation
    overheadPerNode: Double = 0.00022, // s per node per invocation
    invokePerRecord: Double = 1.47e-5, // s per record, invocation transport
    refScanRate: Double = 2.0e5,       // ref rows/s per node (scan + build)
    probeRate: Double = 1.0e5,         // rec/s per node, hash probe + emit
    pairRate: Double = 2.0e6,          // candidate pairs/s per node (edit distance)
    distCheckRate: Double = 2.0e7,     // distance checks/s per node (brute spatial)
    idxProbePerRecord: Double = 6.0e-4,// s per record, spatial index probe
    broadcastPerRecordPerNode: Double = 1.2e-6, // s, tweet broadcast for index join
    memRowsPerNode: Double = 1.2e6,    // ref-join rows fitting in memory per node
    spillPenalty: Double = 2.4,        // slowdown when the ref join spills
    staticUdfRate: Double = 25000)     // rec/s per node, preloaded per-record UDF

object SimParams { val default: SimParams = SimParams() }

/** Per-UDF cost models: seconds of computing-job time for one batch, and
  * the per-record rate of the same UDF evaluated statically (preloaded
  * state, current-framework baseline).
  */
sealed trait UdfModel {
  def name: String
  /** UDF-evaluation seconds for one batch inside a computing job. */
  def batchSeconds(batch: Long, nodes: Int, refScale: Double, p: SimParams): Double
  /** Static (stale-state) per-record capacity in rec/s across the cluster. */
  def staticRate(nodes: Int, refScale: Double, p: SimParams): Double
}

/** Equi-join against a reference dataset rescanned each batch; `opFactor`
  * covers extra group-by / order-by passes over the scanned data.
  */
final case class HashJoinUdf(name: String, refRows: Long, opFactor: Double = 1.0) extends UdfModel {
  def batchSeconds(batch: Long, nodes: Int, refScale: Double, p: SimParams): Double =
    refRows * refScale * opFactor / (p.refScanRate * nodes) + batch / (p.probeRate * nodes)
  def staticRate(nodes: Int, refScale: Double, p: SimParams): Double =
    p.staticUdfRate * nodes
}

/** Similarity join: every record compared against every reference name.
  * `serdeFactor` models the SQL++-invokes-Java serialization overhead.
  */
final case class PairJoinUdf(name: String, refRows: Long, serdeFactor: Double = 1.0) extends UdfModel {
  def batchSeconds(batch: Long, nodes: Int, refScale: Double, p: SimParams): Double =
    serdeFactor * batch * refRows * refScale / (p.pairRate * nodes)
  def staticRate(nodes: Int, refScale: Double, p: SimParams): Double =
    p.pairRate * nodes / refRows / refScale
}

/** Index nested-loop spatial join: per-record index probes, but the batch
  * must be broadcast to every node that holds index partitions — the cost
  * that caps its speed-up (§7.4.2).
  */
final case class IndexJoinUdf(name: String, refRows: Long) extends UdfModel {
  def batchSeconds(batch: Long, nodes: Int, refScale: Double, p: SimParams): Double =
    batch * p.broadcastPerRecordPerNode * nodes + batch * p.idxProbePerRecord / nodes
  def staticRate(nodes: Int, refScale: Double, p: SimParams): Double =
    // Static Java path scans the monument array per record — no index.
    p.distCheckRate * nodes / (refRows * refScale)
}

/** Brute-force spatial join (the hint-forced naive variant): all pairs get
  * a distance check, reference data partitioned across nodes.
  */
final case class BruteSpatialUdf(name: String, refRows: Long) extends UdfModel {
  def batchSeconds(batch: Long, nodes: Int, refScale: Double, p: SimParams): Double =
    batch * refRows * refScale / (p.distCheckRate * nodes)
  def staticRate(nodes: Int, refScale: Double, p: SimParams): Double =
    p.distCheckRate * nodes / (refRows * refScale)
}

/** Complex multi-join UDF whose dominant term is reference×reference join
  * work re-done each batch (Tweet Context): `refJoinRows` of join work that
  * spills when a node's share exceeds memory — the source of the paper's
  * super-linear speed-up — plus per-record probe work.
  */
final case class ComplexJoinUdf(
    name: String,
    refJoinRows: Long,
    perRecordSeconds: Double) extends UdfModel {
  def batchSeconds(batch: Long, nodes: Int, refScale: Double, p: SimParams): Double = {
    val rows = refJoinRows * refScale
    val spill = if (rows / nodes > p.memRowsPerNode) p.spillPenalty else 1.0
    rows * spill / (p.refScanRate * nodes) + batch * perRecordSeconds / nodes
  }
  def staticRate(nodes: Int, refScale: Double, p: SimParams): Double =
    nodes / perRecordSeconds
}

/** The seven evaluation UDFs (paper cardinalities) plus the naive-monument
  * hint variant.
  */
object UdfModels {
  val safetyRating        = HashJoinUdf("safety_rating", 500000)
  val religiousPopulation = HashJoinUdf("religious_population", 500000, opFactor = 1.2)
  val largestReligions    = HashJoinUdf("largest_religions", 500000, opFactor = 1.5)
  val fuzzySuspects       = PairJoinUdf("fuzzy_suspects", 5000, serdeFactor = 1.25)
  val nearbyMonuments     = IndexJoinUdf("nearby_monuments", 500000)
  val naiveNearbyMonuments = BruteSpatialUdf("naive_nearby_monuments", 500000)
  val suspiciousNames     = ComplexJoinUdf("suspicious_names", 1100000, perRecordSeconds = 2.4e-3)
  val tweetContext        = ComplexJoinUdf("tweet_context", 8000000, perRecordSeconds = 8.0e-4)
  val worrisomeTweets     = ComplexJoinUdf("worrisome_tweets", 900000, perRecordSeconds = 3.0e-3)

  val all: Seq[UdfModel] = Seq(
    safetyRating, religiousPopulation, largestReligions, fuzzySuspects,
    nearbyMonuments, naiveNearbyMonuments, suspiciousNames, tweetContext,
    worrisomeTweets)

  def byName(name: String): UdfModel =
    all.find(_.name == name).getOrElse(
      throw new IllegalArgumentException(s"no UDF cost model named '$name'"))
}

/** Closed-form throughput for the four Figure-24 configurations and for
  * UDF-enriched dynamic/static ingestion.
  */
object ClusterSim {

  /** Computing-job cycle time for one batch (dynamic framework). */
  def cycleSeconds(batch: Long, nodes: Int, udf: Option[UdfModel],
                   refScale: Double = 1.0, p: SimParams = SimParams.default): Double = {
    require(nodes >= 1 && batch >= 1)
    val overhead = p.overheadBase + p.overheadPerNode * nodes
    val invoke = p.invokePerRecord * batch
    val parse = batch / (p.parseRate * nodes)
    val udfT = udf.map(_.batchSeconds(batch, nodes, refScale, p)).getOrElse(0.0)
    overhead + invoke + parse + udfT
  }

  /** Dynamic (new-framework) ingestion throughput, records/s. */
  def dynamicThroughput(nodes: Int, intakeNodes: Int, batch: Long,
                        udf: Option[UdfModel] = None, refScale: Double = 1.0,
                        p: SimParams = SimParams.default): Double = {
    require(intakeNodes >= 1 && intakeNodes <= nodes)
    val cycle = cycleSeconds(batch, nodes, udf, refScale, p)
    val intakeCap = intakeNodes * p.intakeRate
    val storageCap = nodes * p.storageRate
    math.min(batch / math.max(cycle, batch / intakeCap), storageCap)
  }

  /** Static (current-framework) ingestion throughput: parsing coupled to
    * the intake node(s); UDF state loaded once.
    */
  def staticThroughput(nodes: Int, intakeNodes: Int,
                       udf: Option[UdfModel] = None, refScale: Double = 1.0,
                       p: SimParams = SimParams.default): Double = {
    require(intakeNodes >= 1 && intakeNodes <= nodes)
    val parseCap = intakeNodes * p.parseRate
    val storageCap = nodes * p.storageRate
    val udfCap = udf.map(_.staticRate(nodes, refScale, p)).getOrElse(Double.MaxValue)
    math.min(math.min(parseCap, storageCap), udfCap)
  }

  /** Refresh rate = computing jobs per second (paper §7.1 anchors). */
  def refreshRate(nodes: Int, intakeNodes: Int, batch: Long,
                  udf: Option[UdfModel] = None, refScale: Double = 1.0,
                  p: SimParams = SimParams.default): Double =
    dynamicThroughput(nodes, intakeNodes, batch, udf, refScale, p) / batch
}
