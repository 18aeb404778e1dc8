package repro.tables

import org.apache.spark.sql.SparkSession
import repro.competitors._
import repro.core.{BallTree, DaskMeans, KMeans}
import repro.estimator._
import repro.spatial.SpatialData

/** Table VIII: impact of the polynomial degree β and the interaction
  * features on runtime-prediction error (MSE/MAE/WMAPE/sMAPE). The same
  * generated sample set also feeds the Fig. 11 comparison against the SOTA
  * estimators (XGBoost, DisNet, AutoML and their S- per-iteration
  * variants) and the Fig. 14 GP-adjustment ablation (NoGP), reported here
  * as table rows.
  */
object TableVIII {

  final case class MetricsRow(
      label: String,
      mse: Double,
      mae: Double,
      wmape: Double,
      smape: Double,
      trainMs: Double,
      predictMs: Double,
  )

  /** Generate a sample set of measured k-means tasks: random (n, k, f,
    * dataset) draws, each actually run with Dask-means to record
    * per-iteration runtimes (the paper generates 2000 tasks at up to 10^8
    * points; we scale to the session budget).
    */
  def generateSamples(
      spark: SparkSession,
      count: Int,
      q: Int,
      maxN: Int = 60_000,
      seed: Long = 11L,
  ): Array[TaskSample] = {
    val rnd = new scala.util.Random(seed)
    val pools = Seq("T-drive", "Argo-PC", "3D-RD").map(nm =>
      SpatialData.collectPoints(SpatialData.dataset(spark, nm, maxN.toLong)))
    val fChoices = Array(10, 30, 60, 100, 150, 200)
    AlgoSuite.warmUp()
    Array.tabulate(count) { i =>
      val pool = pools(i % pools.length)
      val n = math.exp(math.log(8000) + rnd.nextDouble() * (math.log(maxN) - math.log(8000))).toInt
      val data = pool.take(n)
      val k = math.max(2, math.exp(math.log(10) + rnd.nextDouble() * (math.log(400) - math.log(10))).toInt)
      val f = fChoices(rnd.nextInt(fChoices.length))
      val tree = BallTree.build(data, f)
      val features = TaskFeatures.fromIndex(tree, n.toLong, k, data(0).length)
      val init = KMeans.initCentroids(data, math.min(k, n), rnd.nextLong())
      val dm = new DaskMeans(leafCapacity = f, prebuilt = Some(tree))
      dm.run(data, math.min(k, n), q, init) // cold run: JIT/caches warm up
      tree.root.resetAssignment()
      val r = dm.run(data, math.min(k, n), q, init) // warm run is the sample
      TaskSample(features, r.iterMs)
    }
  }

  private def evaluate(label: String, actual: Array[Double], predicted: Array[Double], trainMs: Double, predictMs: Double): MetricsRow =
    MetricsRow(label, Metrics.mse(actual, predicted), Metrics.mae(actual, predicted),
      Metrics.wmape(actual, predicted), Metrics.smape(actual, predicted), trainMs, predictMs)

  private def timed[A](body: => A): (A, Double) = {
    val t0 = System.nanoTime()
    val a = body
    (a, (System.nanoTime() - t0) / 1e6)
  }

  /** The β × {basic, interaction} sweep of Table VIII proper. */
  def betaSweep(train: Array[TaskSample], test: Array[TaskSample], q: Int): Seq[MetricsRow] = {
    val actual = test.map(_.totalMs)
    for {
      interactions <- Seq(false, true)
      beta <- 1 to 6
    } yield {
      val (est, trainMs) = timed(new CostEstimator(q, degree = beta, interactions = interactions).fit(train))
      val (preds, predMs) = timed(test.map(s => est.predictTotalMs(s.features)))
      evaluate(s"beta=$beta ${if (interactions) "interaction" else "basic"}", actual, preds, trainMs, predMs / test.length)
    }
  }

  /** Fig. 11 as rows: our estimator vs the SOTA models and S- variants. */
  def competitorComparison(train: Array[TaskSample], test: Array[TaskSample], q: Int): Seq[MetricsRow] = {
    val actual = test.map(_.totalMs)
    val totals = Seq[RuntimeModel](new XgBoostLite, new DisNet, new RidgeRegressor).map { m =>
      val (_, trainMs) = timed(m.fitTotals(train))
      val (preds, predMs) = timed(test.map(s => m.predictTotal(s.features)))
      evaluate(m.name, actual, preds, trainMs, predMs / test.length)
    }
    val perIter = Seq[RuntimeModel](new XgBoostLite, new DisNet, new RidgeRegressor).map { base =>
      val m = new PerIteration(base, q)
      val (_, trainMs) = timed(m.fit(train))
      val (preds, predMs) = timed(test.map(s => m.predictTotal(s.features)))
      evaluate(m.name, actual, preds, trainMs, predMs / test.length)
    }
    val ours = {
      val (est, trainMs) = timed(new CostEstimator(q).fit(train))
      val (preds, predMs) = timed(test.map(s => est.predictTotalMs(s.features)))
      evaluate("Dask-means", actual, preds, trainMs, predMs / test.length)
    }
    totals ++ perIter :+ ours
  }

  /** Fig. 14 as rows: remaining-runtime estimates after observing the
    * first `observe` iterations — GP-adjusted vs NoGP, plus the paper's
    * badly-chosen σ=2 lesson.
    */
  def gpAdjustment(train: Array[TaskSample], test: Array[TaskSample], q: Int, observe: Int = 3): Seq[MetricsRow] = {
    val est = new CostEstimator(q).fit(train)
    val eligible = test.filter(_.iterations > observe)
    val actualRemaining = eligible.map(s => s.iterRuntimesMs.drop(observe).sum)
    def remaining(sigma: Option[Double]): Array[Double] = eligible.map { s =>
      val predicted = est.predictIterRuntimes(s.features)
      sigma match {
        case None => predicted.drop(observe).sum // NoGP
        case Some(sg) =>
          val gp = new GpAdjuster(sg)
          if (predicted.length <= observe) 0.0
          else gp.adjust(predicted, s.iterRuntimesMs.take(observe)).drop(observe).sum
      }
    }
    Seq(
      evaluate("NoGP", actualRemaining, remaining(None), 0, 0),
      evaluate("GP sigma=50", actualRemaining, remaining(Some(50.0)), 0, 0),
      evaluate("GP sigma=2", actualRemaining, remaining(Some(2.0)), 0, 0),
    )
  }

  final case class Result(beta: Seq[MetricsRow], competitors: Seq[MetricsRow], gp: Seq[MetricsRow])

  def run(spark: SparkSession, sampleCount: Int = 200, q: Int = 10): Result = {
    val samples = generateSamples(spark, sampleCount, q)
    // 80/20 split (the paper's 10% validation fold is folded into test to
    // stabilise the metrics at our smaller sample count)
    val nTrain = (sampleCount * 0.8).toInt
    val train = samples.take(nTrain)
    val test = samples.drop(nTrain)
    Result(betaSweep(train, test, q), competitorComparison(train, test, q), gpAdjustment(train, test, q))
  }

  def render(rows: Seq[MetricsRow]): String = {
    val sb = new StringBuilder
    sb ++= f"${"model"}%-24s ${"MSE"}%12s ${"MAE"}%9s ${"WMAPE"}%7s ${"sMAPE"}%8s ${"train(ms)"}%10s ${"pred(ms)"}%9s" += '\n'
    rows.foreach { r =>
      sb ++= f"${r.label}%-24s ${r.mse}%12.2f ${r.mae}%9.2f ${r.wmape}%7.3f ${r.smape}%8.2f ${r.trainMs}%10.1f ${r.predictMs}%9.3f" += '\n'
    }
    sb.result()
  }
}
