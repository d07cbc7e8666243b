package repro.cluster

/** Qualitative-shape assertions for the cluster cost model — each test pins
  * one of the paper's observed behaviors (§7.1, §7.4) that the simulator
  * must reproduce, plus the published 24-node refresh-rate anchors.
  */
class ClusterSimSpec extends org.scalatest.funsuite.AnyFunSuite {

  private val B1X = 420L
  private val B4X = 1680L
  private val B16X = 6720L

  // --- anchors from §7.1 (24 nodes, no UDF) -------------------------------

  test("anchor: 24-node refresh rate at 1X is ~68 jobs/s") {
    val r = ClusterSim.refreshRate(24, 1, B1X)
    assert(math.abs(r - 68.0) / 68.0 < 0.15, s"got $r")
  }

  test("anchor: 24-node refresh rate at 4X is ~27 jobs/s") {
    val r = ClusterSim.refreshRate(24, 1, B4X)
    assert(math.abs(r - 27.0) / 27.0 < 0.15, s"got $r")
  }

  test("anchor: 24-node refresh rate at 16X is ~10 jobs/s") {
    val r = ClusterSim.refreshRate(24, 1, B16X)
    assert(math.abs(r - 10.0) / 10.0 < 0.30, s"got $r")
  }

  // --- Figure 24 shapes ---------------------------------------------------

  test("static ingestion is flat across cluster sizes (single-intake parse bound)") {
    val t = (1 to 24).map(n => ClusterSim.staticThroughput(n, 1))
    assert(t.distinct.size == 1)
  }

  test("balanced static ingestion scales with cluster size") {
    val t6 = ClusterSim.staticThroughput(6, 6)
    val t24 = ClusterSim.staticThroughput(24, 24)
    assert(t24 / t6 > 3.5, s"$t6 -> $t24")
  }

  test("dynamic ingestion improves with nodes at small cluster sizes") {
    val t1 = ClusterSim.dynamicThroughput(1, 1, B1X)
    val t6 = ClusterSim.dynamicThroughput(6, 1, B1X)
    assert(t6 > t1 * 1.5, s"$t1 -> $t6")
  }

  test("dynamic throughput grows with batch size") {
    val ts = Seq(B1X, B4X, B16X).map(b => ClusterSim.dynamicThroughput(24, 1, b))
    assert(ts == ts.sorted, s"throughputs not monotone in batch size: $ts")
    assert(ts.last > ts.head * 1.5)
  }

  test("dynamic throughput never exceeds intake capacity") {
    for (n <- Seq(1, 6, 12, 24); b <- Seq(B1X, B4X, B16X)) {
      assert(ClusterSim.dynamicThroughput(n, 1, b) <= SimParams.default.intakeRate + 1e-9)
    }
  }

  test("balanced dynamic trails balanced static, and the gap widens with cluster size") {
    val ratio6 = ClusterSim.dynamicThroughput(6, 6, B16X) / ClusterSim.staticThroughput(6, 6)
    val ratio24 = ClusterSim.dynamicThroughput(24, 24, B16X) / ClusterSim.staticThroughput(24, 24)
    assert(ratio6 < 1.0 && ratio24 < ratio6, s"ratio6=$ratio6 ratio24=$ratio24")
  }

  // --- Figure 25 shapes (6 nodes, enrichment) -----------------------------

  test("static enrichment beats dynamic for the hash-join UDF (stale-state advantage)") {
    val s = ClusterSim.staticThroughput(6, 1, Some(UdfModels.safetyRating))
    val d = ClusterSim.dynamicThroughput(6, 1, B16X, Some(UdfModels.safetyRating))
    assert(s > d, s"static=$s dynamic=$d")
  }

  test("dynamic hash-join throughput approaches static as batch size grows") {
    val s = ClusterSim.staticThroughput(6, 1, Some(UdfModels.safetyRating))
    val d1 = ClusterSim.dynamicThroughput(6, 1, B1X, Some(UdfModels.safetyRating))
    val d16 = ClusterSim.dynamicThroughput(6, 1, B16X, Some(UdfModels.safetyRating))
    assert(d16 > d1 * 4, "batching should amortize the per-batch reference rescan")
    assert(d16 / s > 0.5 && d1 / s < 0.2)
  }

  test("pair-join (Fuzzy Suspects) barely benefits from batch size") {
    val d1 = ClusterSim.dynamicThroughput(6, 1, B1X, Some(UdfModels.fuzzySuspects))
    val d16 = ClusterSim.dynamicThroughput(6, 1, B16X, Some(UdfModels.fuzzySuspects))
    assert(d16 / d1 < 1.3, s"$d1 -> $d16")
  }

  test("indexed spatial join beats the Java full-scan monument lookup") {
    val sql = ClusterSim.dynamicThroughput(6, 1, B16X, Some(UdfModels.nearbyMonuments))
    val javaStatic = ClusterSim.staticThroughput(6, 1, Some(UdfModels.nearbyMonuments))
    assert(sql > javaStatic, s"sql=$sql javaScan=$javaStatic")
  }

  // --- Figure 26 ----------------------------------------------------------

  test("refresh period grows with batch size for every UDF") {
    for (u <- UdfModels.all) {
      val c = Seq(B1X, B4X, B16X).map(b => ClusterSim.cycleSeconds(b, 6, Some(u)))
      assert(c == c.sorted && c.last > c.head, s"${u.name}: $c")
    }
  }

  // --- Figure 28: reference-data scale-out --------------------------------

  test("throughput holds (mild drop) when reference size and cluster grow together") {
    val base = ClusterSim.dynamicThroughput(6, 1, B16X, Some(UdfModels.safetyRating), refScale = 1.0)
    for ((scale, nodes) <- Seq((2.0, 12), (3.0, 18), (4.0, 24))) {
      val t = ClusterSim.dynamicThroughput(nodes, 1, B16X, Some(UdfModels.safetyRating), refScale = scale)
      assert(t <= base * 1.15 && t >= base * 0.6,
        s"scale=$scale should stay near base ($t vs $base)")
    }
  }

  // --- Figures 30/31: speed-up shapes -------------------------------------

  private def speedup(u: UdfModel, batch: Long = B16X): Double =
    ClusterSim.dynamicThroughput(24, 1, batch, Some(u)) /
      ClusterSim.dynamicThroughput(6, 1, batch, Some(u))

  test("simple hash-join UDFs speed up worse than compute-heavy ones") {
    assert(speedup(UdfModels.safetyRating) < 3.0, s"got ${speedup(UdfModels.safetyRating)}")
    assert(speedup(UdfModels.safetyRating) < speedup(UdfModels.fuzzySuspects))
  }

  test("compute-heavy UDFs speed up well") {
    assert(speedup(UdfModels.fuzzySuspects) > 2.5)
    assert(speedup(UdfModels.suspiciousNames) > 2.5)
    assert(speedup(UdfModels.worrisomeTweets) > 2.5)
  }

  test("Tweet Context achieves super-linear speed-up (spill relief)") {
    assert(speedup(UdfModels.tweetContext) > 4.0, s"got ${speedup(UdfModels.tweetContext)}")
  }

  test("index-join speed-up is capped below compute-heavy UDFs (broadcast cost)") {
    assert(speedup(UdfModels.nearbyMonuments) < speedup(UdfModels.fuzzySuspects))
  }

  test("naive monuments starts far below indexed but scales with nodes") {
    val naive6 = ClusterSim.dynamicThroughput(6, 1, B16X, Some(UdfModels.naiveNearbyMonuments))
    val idx6 = ClusterSim.dynamicThroughput(6, 1, B16X, Some(UdfModels.nearbyMonuments))
    val naive24 = ClusterSim.dynamicThroughput(24, 1, B16X, Some(UdfModels.naiveNearbyMonuments))
    assert(naive6 < idx6 / 5, s"naive=$naive6 idx=$idx6")
    assert(naive24 / naive6 > 2.5)
  }

  test("throughput increases monotonically from 6 to 24 nodes for complex UDFs") {
    for (u <- Seq(UdfModels.suspiciousNames, UdfModels.tweetContext, UdfModels.worrisomeTweets)) {
      val ts = Seq(6, 12, 18, 24).map(n => ClusterSim.dynamicThroughput(n, 1, B16X, Some(u)))
      assert(ts == ts.sorted, s"${u.name}: $ts")
    }
  }

  // --- model mechanics ----------------------------------------------------

  test("cycle time decreases with nodes for compute-bound UDFs") {
    val c = Seq(6, 12, 24).map(n => ClusterSim.cycleSeconds(B16X, n, Some(UdfModels.fuzzySuspects)))
    assert(c == c.sorted.reverse, s"$c")
  }

  test("cycle time is monotone in batch size") {
    val c = Seq(B1X, B4X, B16X).map(b => ClusterSim.cycleSeconds(b, 6, None))
    assert(c == c.sorted && c.last > c.head)
  }

  test("UdfModels.byName resolves every model and rejects unknowns") {
    UdfModels.all.foreach(u => assert(UdfModels.byName(u.name) eq u))
    intercept[IllegalArgumentException] { UdfModels.byName("nope") }
  }

  test("invalid arguments are rejected") {
    intercept[IllegalArgumentException] { ClusterSim.dynamicThroughput(0, 1, B1X) }
    intercept[IllegalArgumentException] { ClusterSim.dynamicThroughput(6, 7, B1X) }
    intercept[IllegalArgumentException] { ClusterSim.staticThroughput(6, 7) }
  }

  test("refresh rate equals throughput over batch size") {
    val t = ClusterSim.dynamicThroughput(12, 1, B4X)
    assert(math.abs(ClusterSim.refreshRate(12, 1, B4X) - t / B4X) < 1e-9)
  }
}
