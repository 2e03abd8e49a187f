package repro.models

import repro.SparkSpec
import repro.lakebench.TusSantos

/** End-to-end smoke: featurize + train + evaluate every Table 2 model on a
  * small TUS-SANTOS instance. Domain-distinct headers make the task easy,
  * so every *trainable* model should be strong here while the frozen
  * encoders lag — the qualitative Table 2 pattern.
  */
class RunnerSpec extends SparkSpec {

  private lazy val bench = TusSantos.generate(seed = 9, perSeed = 10, nPairs = 700)

  test("TabSketchFM solves small TUS-SANTOS") {
    val (f1, _) = Runner.run(spark, Baselines.tabSketchFm, bench, seeds = Seq(0L))
    assert(f1 > 0.9, s"f1 $f1")
  }

  test("header-only Vanilla BERT solves small TUS-SANTOS") {
    val (f1, _) = Runner.run(spark, Baselines.vanillaBert, bench, seeds = Seq(0L))
    assert(f1 > 0.9, s"f1 $f1")
  }

  test("frozen TAPAS underperforms trainable models on TUS-SANTOS") {
    val (frozen, _)    = Runner.run(spark, Baselines.tapas, bench, seeds = Seq(0L))
    val (trainable, _) = Runner.run(spark, Baselines.tabert, bench, seeds = Seq(0L))
    assert(trainable > frozen, s"trainable $trainable vs frozen $frozen")
    assert(trainable > 0.9, s"TaBERT analogue $trainable")
  }

  test("run aggregates over seeds with a finite stdev") {
    val (mean, std) = Runner.run(spark, Baselines.vanillaBert, bench, seeds = Seq(0L, 1L))
    assert(mean > 0.5 && std >= 0.0 && std < 0.5)
  }

  test("featurize produces consistent shapes across splits") {
    val fs = Runner.featurize(spark, Baselines.tabSketchFm, bench)
    assert(fs.xTrain.length == bench.train.size)
    assert(fs.xValid.length == bench.valid.size)
    assert(fs.xTest.length == bench.test.size)
    val dim = fs.xTrain.head.length
    assert(fs.xTest.forall(_.length == dim))
    assert(fs.yTrain.forall(_.length == 1))
  }

  test("metricName reflects the task") {
    import repro.lakebench._
    assert(Runner.metricName(BinaryTask) == "F1")
    assert(Runner.metricName(RegressionTask) == "R2")
    assert(Runner.metricName(MultiLabelTask(Seq("a"))) == "F1")
  }
}
