package repro.core

import org.apache.spark.sql.functions._
import repro.SparkSpec
import repro.graphs.{GraphGen, GraphOps}

/** Distributed GD: balance, quality, and agreement with the in-core
  * reference. Kept to small graphs + modest iteration counts — each GD
  * iteration is a Spark job sequence.
  */
class DistGDSpec extends SparkSpec {

  private val cfg = GDConfig(eps = 0.05, iterations = 30, seed = 5)

  test("planted bisection: balanced and far better than hash") {
    val g = GraphGen.plantedBisection(150, 0.12, 0.01, seed = 41)
    val edges = GraphGen.toDF(spark, g).persist()
    val res = DistGD.bipartition(spark, edges, Seq(Weights.Unit, Weights.Degree), cfg)
    assert(res.imbalances.max <= 0.05 + 0.05, s"imbalances ${res.imbalances.toSeq}")
    assert(res.locality > 0.7, s"locality ${res.locality}")
    val hash = repro.baselines.HashPartition.partition(g.n, 2)
    assert(res.locality > g.edgeLocality(hash) + 0.2)
    edges.unpersist()
  }

  test("assignment covers every edge-incident vertex with parts {0,1}") {
    val g = GraphGen.rmatLocal(8, 4, seed = 42)
    val edges = GraphGen.toDF(spark, g).persist()
    val res = DistGD.bipartition(spark, edges, Seq(Weights.Unit), cfg)
    val nVerts = GraphOps.vertexIds(edges).count()
    assert(res.assign.count() == nVerts)
    val parts = res.assign.select("part").distinct().collect().map(_.getInt(0)).toSet
    assert(parts.subsetOf(Set(0, 1)))
    edges.unpersist()
  }

  test("locality is comparable to the in-core reference on the same graph") {
    val g = GraphGen.plantedBisection(100, 0.15, 0.02, seed = 43)
    val edges = GraphGen.toDF(spark, g).persist()
    val dist = DistGD.bipartition(spark, edges, Seq(Weights.Unit, Weights.Degree), cfg)
    val local = LocalGD.bipartition(g, Weights.localAll(g, Seq(Weights.Unit, Weights.Degree)),
      cfg.copy(iterations = 100))
    assert(dist.locality > local.locality - 0.15,
      s"dist ${dist.locality} vs local ${local.locality}")
    edges.unpersist()
  }

  test("rejects non-default projection methods") {
    val edges = GraphGen.toDF(spark, GraphGen.path(10))
    intercept[IllegalArgumentException] {
      DistGD.bipartition(spark, edges, Seq(Weights.Unit),
        cfg.copy(projection = ProjectionMethod.Exact))
    }
  }

  test("reported imbalance matches a recomputation from the assignment") {
    val g = GraphGen.rmatLocal(8, 5, seed = 44)
    val edges = GraphGen.toDF(spark, g).persist()
    val res = DistGD.bipartition(spark, edges, Seq(Weights.Unit), cfg)
    val w = Weights.weightsDF(spark, edges, Seq(Weights.Unit))
    val imb = GraphOps.imbalance(res.assign, w.select(col("id"), col("w0") as "w"), "w", 2)
    assert(math.abs(imb - res.imbalances(0)) < 1e-6)
    edges.unpersist()
  }

  test("partitionK k=4 on planted communities: balanced, good locality") {
    val g = GraphGen.plantedKCommunities(4, 40, 0.25, 0.01, seed = 45)
    val edges = GraphGen.toDF(spark, g).persist()
    val assign = DistGD.partitionK(spark, edges, Seq(Weights.Unit), 4,
      cfg.copy(iterations = 25))
    val parts = assign.select("part").distinct().count()
    assert(parts == 4)
    val loc = GraphOps.edgeLocality(edges, assign)
    assert(loc > 0.5, s"k=4 locality $loc")
    val w = Weights.weightsDF(spark, edges, Seq(Weights.Unit))
    val imb = GraphOps.imbalance(assign, w.select(col("id"), col("w0") as "w"), "w", 4)
    assert(imb <= 0.3, s"k=4 imbalance $imb")
    edges.unpersist()
  }

  test("partitionK rejects non-power-of-two k") {
    val edges = GraphGen.toDF(spark, GraphGen.path(10))
    intercept[IllegalArgumentException] {
      DistGD.partitionK(spark, edges, Seq(Weights.Unit), 3, cfg)
    }
  }
}
