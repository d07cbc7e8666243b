package repro.cluster

import org.scalatest.funsuite.AnyFunSuite

/** Exhaustive invariant sweep over the simulator's parameter grid — every
  * (nodes, batch) cell must satisfy the structural invariants of the
  * pipeline model, for every UDF cost model.
  */
class ClusterSimSweepSpec extends AnyFunSuite {

  private val nodeGrid = Seq(1, 2, 3, 6, 12, 24)
  private val batchGrid = Seq(420L, 1680L, 6720L)

  for (n <- nodeGrid; b <- batchGrid) {
    test(s"invariants hold at nodes=$n batch=$b (no UDF)") {
      val cycle = ClusterSim.cycleSeconds(b, n, None)
      val thr = ClusterSim.dynamicThroughput(n, 1, b)
      assert(cycle > 0)
      assert(thr > 0 && thr <= SimParams.default.intakeRate)
      // Throughput can never exceed the pure cycle bound.
      assert(thr <= b / cycle + 1e-9)
      // Refresh rate consistency.
      assert(math.abs(ClusterSim.refreshRate(n, 1, b) * b - thr) < 1e-6)
    }
  }

  for (u <- UdfModels.all) {
    test(s"UDF '${u.name}': batch time positive and monotone in batch size at 6 nodes") {
      val t = batchGrid.map(b => u.batchSeconds(b, 6, 1.0, SimParams.default))
      assert(t.forall(_ > 0))
      assert(t == t.sorted)
    }

    test(s"UDF '${u.name}': larger reference scale never speeds up a batch") {
      val t1 = u.batchSeconds(6720, 6, 1.0, SimParams.default)
      val t4 = u.batchSeconds(6720, 6, 4.0, SimParams.default)
      assert(t4 >= t1 - 1e-12)
    }

    test(s"UDF '${u.name}': static rate positive and grows with nodes") {
      val r6 = u.staticRate(6, 1.0, SimParams.default)
      val r24 = u.staticRate(24, 1.0, SimParams.default)
      assert(r6 > 0 && r24 >= r6)
    }

    test(s"UDF '${u.name}': dynamic throughput positive on the whole node grid") {
      nodeGrid.foreach { n =>
        assert(ClusterSim.dynamicThroughput(n, 1, 6720, Some(u)) > 0)
      }
    }
  }

  test("adding intake nodes never hurts dynamic throughput") {
    for (b <- batchGrid) {
      val one = ClusterSim.dynamicThroughput(24, 1, b)
      val all = ClusterSim.dynamicThroughput(24, 24, b)
      assert(all >= one - 1e-9)
    }
  }

  test("static throughput is bounded by storage capacity") {
    val p = SimParams.default.copy(parseRate = 1e9)
    assert(ClusterSim.staticThroughput(2, 2, p = p) <= 2 * p.storageRate)
  }
}
