package repro.core

import org.apache.spark.sql.{Column, DataFrame, Row, SparkSession}
import org.apache.spark.sql.functions._
import repro.graphs.GraphOps

/** Distributed implementation of the paper's GD algorithm on the
  * DataFrame/Catalyst API.
  *
  * The gradient step `A·z` is a join of the symmetrized edge list with the
  * vertex state followed by `groupBy(dst).sum` — the `O(|E|/m)` mat-vec of
  * Theorem 1.1. The "one-shot alternating" projection (the paper's default
  * for distributed runs, §3.1) needs only the plane coefficients
  * `α_1..α_d`; these are solved on the driver from one aggregation pass that
  * computes `S_j = ⟨w_j, z⟩`, `T_j = ⟨w_j, grad⟩`, the Gram matrix
  * `G_{jl} = ⟨w_j, w_l⟩` over free vertices, and the fixed contribution
  * `F_j`, so each GD iteration costs two aggregations plus one
  * local-checkpoint materialization.
  *
  * Noise and rounding draws are deterministic functions of `(seed, id)` so
  * runs are reproducible across partitionings of the data.
  */
object DistGD {

  /** Result of a distributed run.
    *
    * @param assign      (id, part) assignment, part ∈ {0, 1}
    * @param locality    fraction of uncut edges
    * @param imbalances  per-dimension |Σ w_j s| / W_j of the rounded solution
    * @param iterations  GD iterations actually executed
    */
  final case class Result(assign: DataFrame, locality: Double,
                          imbalances: Array[Double], iterations: Int)

  private def mix(seed: Long, i: Long): Long = {
    var z = seed + i * 0x9E3779B97F4A7C15L
    z = (z ^ (z >>> 30)) * 0xBF58476D1CE4E5B9L
    z = (z ^ (z >>> 27)) * 0x94D049BB133111EBL
    z ^ (z >>> 31)
  }

  /** Deterministic standard normal from (seed, id). */
  private def gauss(seed: Long, id: Long): Double =
    new java.util.Random(mix(seed, id)).nextGaussian()

  /** Deterministic uniform [0,1) from (seed, id). */
  private def unif(seed: Long, id: Long): Double =
    new java.util.Random(mix(seed, id)).nextDouble()

  private def clipCol(c: Column): Column = least(lit(1.0), greatest(lit(-1.0), c))

  /** Balanced 2-partition of the canonical edge list under the named weight
    * specs (see [[Weights]]). Only the one-shot alternating projection is
    * supported distributed — matching the paper's large-scale configuration;
    * the other projection methods are evaluated in-core by [[LocalGD]].
    */
  def bipartition(spark: SparkSession, edges: DataFrame, specs: Seq[String],
                  cfg: GDConfig): Result = {
    require(cfg.projection == ProjectionMethod.OneShot,
      "DistGD implements the paper's distributed default (one-shot alternating)")
    val d = specs.length
    val sym = GraphOps.symmetrize(edges).persist()
    val weights = Weights.weightsDF(spark, edges, specs).persist()
    val wCols = (0 until d).map(j => s"w$j")

    val totRow = weights.agg(
      count(lit(1)).cast("long") as "n",
      wCols.map(c => sum(col(c)) as s"W$c"): _*
    ).collect()(0)
    val n = totRow.getLong(0)
    val W = Array.tabulate(d)(j => totRow.getDouble(j + 1))

    val gaussUdf = udf((id: Long) => gauss(cfg.seed, id))
    val roundUdf = udf((id: Long) => unif(cfg.seed * 31 + 7, id))

    val targetLen = cfg.stepFactor * math.sqrt(n.toDouble) / cfg.iterations
    val sigma = targetLen / math.sqrt(n.toDouble)
    var gamma = -1.0

    var cur = weights
      .withColumn("x", lit(0.0))
      .withColumn("fixed", lit(false))
      .localCheckpoint(true)

    var t = 0
    var freeCount = n
    while (t < cfg.iterations && freeCount > 0) {
      val zDf = cur.withColumn("z",
        if (t == 0) col("x") + lit(sigma) * gaussUdf(col("id")) else col("x"))

      val grad = sym
        .join(zDf.select(col("id") as "vid", col("z") as "zv"), col("src") === col("vid"))
        .groupBy(col("dst"))
        .agg(sum("zv") as "grad")
        .withColumnRenamed("dst", "id")
      val st = zDf.join(grad, Seq("id"), "left").na.fill(0.0, Seq("grad"))
        .localCheckpoint(true)

      // One pass: gradient norm, S_j = <w_j, z>, T_j = <w_j, grad>, Gram,
      // fixed contribution F_j — all over the appropriate vertex subsets.
      val free = !col("fixed")
      val aggExprs: Seq[Column] =
        Seq(coalesce(sum(when(free, col("grad") * col("grad"))), lit(0.0)) as "gn2") ++
        (0 until d).map(j => coalesce(sum(when(free, col(s"w$j") * col("z"))), lit(0.0)) as s"S$j") ++
        (0 until d).map(j => coalesce(sum(when(free, col(s"w$j") * col("grad"))), lit(0.0)) as s"T$j") ++
        (for (j <- 0 until d; l <- j until d)
          yield coalesce(sum(when(free, col(s"w$j") * col(s"w$l"))), lit(0.0)) as s"G${j}_$l") ++
        (0 until d).map(j => coalesce(sum(when(!free, col(s"w$j") * col("x"))), lit(0.0)) as s"F$j")
      val row = st.agg(aggExprs.head, aggExprs.tail: _*).collect()(0)
      var idx = 0
      def next(): Double = { val v = row.getDouble(idx); idx += 1; v }
      val gn = math.sqrt(next())
      val s = Array.fill(d)(next())
      val tt = Array.fill(d)(next())
      val gram = Array.ofDim[Double](d, d)
      for (j <- 0 until d; l <- j until d) { val v = next(); gram(j)(l) = v; gram(l)(j) = v }
      val f = Array.fill(d)(next())

      if (gamma <= 0) gamma = targetLen / math.max(gn, 1e-12)

      // Sequential plane projections in closed form: y = z + γ·grad, then
      // y ← y − α_j·w_j for each plane ⟨w_j, y⟩ = −F_j in turn.
      val sy = Array.tabulate(d)(j => s(j) + gamma * tt(j))
      val alpha = new Array[Double](d)
      for (j <- 0 until d) {
        alpha(j) = if (gram(j)(j) > 0) (sy(j) + f(j)) / gram(j)(j) else 0.0
        for (l <- j + 1 until d) sy(l) -= alpha(j) * gram(j)(l)
      }

      val shift = (0 until d).map(j => lit(alpha(j)) * col(s"w$j"))
        .reduceOption(_ + _).getOrElse(lit(0.0))
      val upd = st
        .withColumn("xn0",
          when(col("fixed"), col("x"))
            .otherwise(clipCol(col("z") + lit(gamma) * col("grad") - shift)))
        .withColumn("fixedN",
          if (cfg.vertexFixing)
            col("fixed") || (abs(col("xn0")) >= lit(cfg.fixThreshold))
          else col("fixed"))
        .withColumn("xn",
          when(col("fixedN"), when(col("xn0") >= 0, lit(1.0)).otherwise(lit(-1.0)))
            .otherwise(col("xn0")))

      val nextDf = upd.select(
        (Seq(col("id")) ++ wCols.map(col) ++ Seq(
          col("xn") as "x", col("fixedN") as "fixed",
          col("x") as "xprev", col("fixed") as "fixedprev")): _*
      ).localCheckpoint(true)

      val pRow = nextDf.agg(
        coalesce(sum(when(!col("fixedprev"),
          (col("x") - col("xprev")) * (col("x") - col("xprev")))), lit(0.0)) as "prog2",
        sum(when(!col("fixed"), 1L).otherwise(0L)) as "free",
      ).collect()(0)
      val actual = math.sqrt(pRow.getDouble(0))
      freeCount = pRow.getLong(1)
      if (cfg.adaptiveStep && actual > 1e-12)
        gamma *= math.min(2.0, math.max(0.5, targetLen / actual))

      cur = nextDf.drop("xprev", "fixedprev")
      t += 1
    }

    // Final until-convergence alternating projection on the free vertices.
    var pass = 0
    var feasible = false
    while (pass < 60 && !feasible) {
      val free = !col("fixed")
      val exprs: Seq[Column] =
        (0 until d).map(j => coalesce(sum(col(s"w$j") * col("x")), lit(0.0)) as s"tot$j") ++
        (0 until d).map(j => coalesce(sum(when(free, col(s"w$j") * col("x"))), lit(0.0)) as s"S$j") ++
        (for (j <- 0 until d; l <- j until d)
          yield coalesce(sum(when(free, col(s"w$j") * col(s"w$l"))), lit(0.0)) as s"G${j}_$l")
      val row = cur.agg(exprs.head, exprs.tail: _*).collect()(0)
      var idx = 0
      def next(): Double = { val v = row.getDouble(idx); idx += 1; v }
      val tot = Array.fill(d)(next())
      val s = Array.fill(d)(next())
      val gram = Array.ofDim[Double](d, d)
      for (j <- 0 until d; l <- j until d) { val v = next(); gram(j)(l) = v; gram(l)(j) = v }
      feasible = (0 until d).forall(j => math.abs(tot(j)) <= cfg.eps * W(j) + 1e-9 * (1 + W(j)))
      if (!feasible) {
        val f = Array.tabulate(d)(j => tot(j) - s(j))
        val sy = s.clone()
        val alpha = new Array[Double](d)
        for (j <- 0 until d) {
          alpha(j) = if (gram(j)(j) > 0) (sy(j) + f(j)) / gram(j)(j) else 0.0
          for (l <- j + 1 until d) sy(l) -= alpha(j) * gram(j)(l)
        }
        val shift = (0 until d).map(j => lit(alpha(j)) * col(s"w$j"))
          .reduceOption(_ + _).getOrElse(lit(0.0))
        cur = cur.withColumn("x",
          when(col("fixed"), col("x")).otherwise(clipCol(col("x") - shift)))
          .localCheckpoint(true)
      }
      pass += 1
    }

    // Randomized rounding (deterministic per (seed, id)) + driver-side repair.
    var sided = cur.withColumn("part",
      when(col("fixed") || (abs(col("x")) >= lit(1.0 - 1e-12)),
           when(col("x") >= 0, 1).otherwise(0))
        .otherwise(when(roundUdf(col("id")) < (col("x") + 1.0) / 2.0, 1).otherwise(0)))
      .localCheckpoint(true)

    sided = repair(sided, d, W, cfg.eps)

    val assign = sided.select(col("id"), col("part")).persist()
    assign.count()
    val locality = GraphOps.edgeLocality(edges, assign)
    val sRow = sided.agg(
      (0 until d).map(j => coalesce(sum(col(s"w$j") * (col("part") * 2 - 1)), lit(0.0)) as s"s$j").head,
      (0 until d).map(j => coalesce(sum(col(s"w$j") * (col("part") * 2 - 1)), lit(0.0)) as s"s$j").tail: _*
    ).collect()(0)
    val imb = Array.tabulate(d)(j => if (W(j) > 0) math.abs(sRow.getDouble(j)) / W(j) else 0.0)
    sym.unpersist()
    weights.unpersist()
    Result(assign, locality, imb, t)
  }

  /** Bounded driver-side balance repair: if a dimension is outside ε, pull
    * the least-confident vertices of the heavy side to the driver and flip
    * greedily (mirror of [[Rounding.repair]]); applied as a broadcast set.
    */
  private def repair(sided: DataFrame, d: Int, W: Array[Double], eps: Double): DataFrame = {
    val sRow = sided.agg(
      (0 until d).map(j => coalesce(sum(col(s"w$j") * (col("part") * 2 - 1)), lit(0.0)) as s"s$j").head,
      (0 until d).map(j => coalesce(sum(col(s"w$j") * (col("part") * 2 - 1)), lit(0.0)) as s"s$j").tail: _*
    ).collect()(0)
    val s = Array.tabulate(d)(j => sRow.getDouble(j))
    def violated = (0 until d).exists(j => math.abs(s(j)) > eps * W(j))
    if (!violated) return sided

    val jWorst = (0 until d).maxBy(j => if (W(j) > 0) math.abs(s(j)) / W(j) - eps else 0.0)
    val heavy = if (s(jWorst) > 0) 1 else 0
    val cand: Array[Row] = sided
      .where(col("part") === heavy)
      .orderBy(abs(col("x")))
      .select((Seq(col("id")) ++ (0 until d).map(j => col(s"w$j"))): _*)
      .limit(50000)
      .collect()
    val flips = scala.collection.mutable.ArrayBuffer.empty[Long]
    val sign = 2 * heavy - 1
    var i = 0
    while (i < cand.length && violated) {
      val r = cand(i)
      val ws = Array.tabulate(d)(j => r.getDouble(j + 1))
      var before = 0.0; var after = 0.0
      for (j <- 0 until d) {
        before = math.max(before, math.abs(s(j)) - eps * W(j))
        after = math.max(after, math.abs(s(j) - 2.0 * sign * ws(j)) - eps * W(j))
      }
      if (after < before) {
        for (j <- 0 until d) s(j) -= 2.0 * sign * ws(j)
        flips += r.getLong(0)
      }
      i += 1
    }
    if (flips.isEmpty) sided
    else sided.withColumn("part",
      when(col("id").isInCollection(flips), lit(1) - col("part")).otherwise(col("part")))
      .localCheckpoint(true)
  }

  /** Recursive k-way distributed partitioning (k a power of two): filter the
    * edge list per part and bipartition each side. Intended for modest k —
    * used by the integration tests; the quality sweeps use the in-core path.
    */
  def partitionK(spark: SparkSession, edges: DataFrame, specs: Seq[String],
                 k: Int, cfg: GDConfig): DataFrame = {
    require(k >= 1 && (k & (k - 1)) == 0, s"k must be a power of two, got $k")
    var assign = GraphOps.vertexIds(edges).withColumn("part", lit(0)).persist()
    assign.count()
    var parts = 1
    var level = 0
    while (parts < k) {
      val pieces = (0 until parts).map { p =>
        val ids = assign.where(col("part") === p).select(col("id") as "pid")
        val subEdges = edges
          .join(ids, col("src") === col("pid")).drop("pid")
          .join(ids.select(col("pid") as "pid2"), col("dst") === col("pid2")).drop("pid2")
        val subIds = ids.select(col("pid") as "id")
        if (subEdges.isEmpty) {
          subIds.withColumn("part", lit(2 * p))
        } else {
          val res = bipartition(spark, subEdges, specs, cfg.copy(seed = cfg.seed + 97 * level + p))
          // Vertices isolated inside the piece carry no weight; send to side 0.
          subIds.join(res.assign.select(col("id"), col("part") as "side"), Seq("id"), "left")
            .na.fill(0, Seq("side"))
            .select(col("id"), (lit(2 * p) + col("side")) as "part")
        }
      }
      val merged = pieces.reduce(_ unionByName _).persist()
      merged.count()
      assign.unpersist()
      assign = merged
      parts *= 2
      level += 1
    }
    assign
  }
}
