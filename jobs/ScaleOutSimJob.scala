package repro.jobs

import repro.cluster._

/** Entrypoint printing the cluster-simulation tables behind Figures 24, 28,
  * 30, and 31 (no Spark session needed — the simulator is analytic).
  *
  * Usage: ScaleOutSimJob [fig24|fig28|fig30|fig31|all]
  */
object ScaleOutSimJob {
  private val batches = Seq(420L, 1680L, 6720L)

  def fig24(): Unit = {
    println("== Fig 24 (sim): basic ingestion throughput (rec/s) vs cluster size ==")
    println("nodes | static | balStatic | dyn1X | dyn4X | dyn16X | balDyn16X")
    for (n <- Seq(1, 2, 4, 6, 9, 12, 18, 24)) {
      val s = ClusterSim.staticThroughput(n, 1)
      val bs = ClusterSim.staticThroughput(n, n)
      val d = batches.map(b => ClusterSim.dynamicThroughput(n, 1, b))
      val bd = ClusterSim.dynamicThroughput(n, n, 6720)
      println(f"$n%5d | $s%6.0f | $bs%9.0f | ${d(0)}%5.0f | ${d(1)}%5.0f | ${d(2)}%6.0f | $bd%9.0f")
    }
    println(f"24-node refresh rates (jobs/s): " +
      batches.map(b => f"${b / 420}X=${ClusterSim.refreshRate(24, 1, b)}%.1f").mkString(" "))
  }

  def fig28(): Unit = {
    println("== Fig 28 (sim): reference scale-out, batch 6720 ==")
    println("refScale | nodes | " + UdfModels.all.take(5).map(_.name).mkString(" | "))
    for ((sc, n) <- Seq((1.0, 6), (2.0, 12), (3.0, 18), (4.0, 24))) {
      val ts = Seq(UdfModels.safetyRating, UdfModels.religiousPopulation,
        UdfModels.largestReligions, UdfModels.fuzzySuspects, UdfModels.nearbyMonuments)
        .map(u => f"${ClusterSim.dynamicThroughput(n, 1, 6720, Some(u), refScale = sc)}%.0f")
      println(f"$sc%8.1f | $n%5d | ${ts.mkString(" | ")}")
    }
  }

  def fig30(): Unit = {
    println("== Fig 30 (sim): speed-up 24 vs 6 nodes by batch size ==")
    println("udf | 1X | 4X | 16X")
    for (u <- UdfModels.all if u.name != "naive_nearby_monuments") {
      val sp = batches.map { b =>
        ClusterSim.dynamicThroughput(24, 1, b, Some(u)) /
          ClusterSim.dynamicThroughput(6, 1, b, Some(u))
      }
      println(f"${u.name}%-22s | ${sp(0)}%.2f | ${sp(1)}%.2f | ${sp(2)}%.2f")
    }
  }

  def fig31(): Unit = {
    println("== Fig 31 (sim): throughput (rec/s) vs cluster size, batch 6720 ==")
    val udfs = Seq(UdfModels.nearbyMonuments, UdfModels.naiveNearbyMonuments,
      UdfModels.suspiciousNames, UdfModels.tweetContext, UdfModels.worrisomeTweets)
    println("nodes | " + udfs.map(_.name).mkString(" | "))
    for (n <- Seq(6, 9, 12, 15, 18, 21, 24)) {
      val ts = udfs.map(u => f"${ClusterSim.dynamicThroughput(n, 1, 6720, Some(u))}%.0f")
      println(f"$n%5d | ${ts.mkString(" | ")}")
    }
  }

  def main(args: Array[String]): Unit = args.headOption.getOrElse("all") match {
    case "fig24" => fig24()
    case "fig28" => fig28()
    case "fig30" => fig30()
    case "fig31" => fig31()
    case _ => fig24(); fig28(); fig30(); fig31()
  }
}
