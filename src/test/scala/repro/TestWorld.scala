package repro

import repro.geo.{LatLng, RoadNetwork, RoutePlanner}
import repro.nn.{Node2Vec, Tensor}
import repro.traj.{GenConfig, Traj, TrajGen}

/** Shared small-world fixture: one compact city, a trajectory corpus, its
  * Node2Vec embeddings and a fitted route planner — built once per JVM and
  * reused across suites to keep the test run fast.
  */
object TestWorld {
  val net: RoadNetwork = RoadNetwork.generate(
    RoadNetwork.CityConfig("tw", LatLng(41.15, -8.6), gridW = 10, gridH = 9, spacingM = 190, seed = 33))

  val cfg: GenConfig = GenConfig(epsilon = 15, gamma = 0.1, avgPoints = 36)

  lazy val trajs: IndexedSeq[Traj] = TrajGen.generateLocal(net, cfg, 260, seed = 2)
  lazy val trainSet: IndexedSeq[Traj] = trajs.slice(0, 160)
  lazy val testSet: IndexedSeq[Traj] = trajs.slice(200, 260)

  lazy val node2vec: Tensor = Node2Vec.train(net, dim = 32, epochs = 2, walksPerSeg = 4)

  lazy val planner: RoutePlanner = RoutePlanner.fit(net, trainSet.map(_.route.toSeq))
}
