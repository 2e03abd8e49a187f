package repro.nn

import org.scalatest.funsuite.AnyFunSuite

class MetricsSpec extends AnyFunSuite {

  test("weightedF1 perfect predictions give 1") {
    assert(Metrics.weightedF1(Seq(0, 1, 1, 0), Seq(0, 1, 1, 0)) == 1.0)
  }

  test("weightedF1 of a majority predictor on balanced labels is ~1/3") {
    val yTrue = Seq.fill(50)(1) ++ Seq.fill(50)(0)
    val yPred = Seq.fill(100)(1)
    val f1 = Metrics.weightedF1(yTrue, yPred)
    assert(math.abs(f1 - 1.0 / 3) < 0.01, s"f1 $f1") // paper's 0.33/0.43-style floors
  }

  test("weightedF1 matches a hand-computed example") {
    // true: [1,1,0,0], pred: [1,0,0,0] -> class1: P=1, R=.5, F1=2/3; class0: P=2/3, R=1, F1=0.8
    val f1 = Metrics.weightedF1(Seq(1, 1, 0, 0), Seq(1, 0, 0, 0))
    assert(math.abs(f1 - (0.5 * 2.0 / 3 + 0.5 * 0.8)) < 1e-9)
  }

  test("weightedF1 handles skew via support weighting") {
    val yTrue = Seq.fill(90)(0) ++ Seq.fill(10)(1)
    val allZero = Metrics.weightedF1(yTrue, Seq.fill(100)(0))
    assert(allZero > 0.8 && allZero < 0.9) // 0.9 * F1(class0)=0.9*0.947
  }

  test("weightedF1 rejects mismatched lengths") {
    assertThrows[IllegalArgumentException](Metrics.weightedF1(Seq(1), Seq(1, 0)))
  }

  test("multiLabelWeightedF1 perfect is 1, weights by positive support") {
    val t = Seq(Array(1, 0), Array(1, 1), Array(0, 1))
    assert(Metrics.multiLabelWeightedF1(t, t) == 1.0)
    // Only label 0 predicted right; label 1 all wrong.
    val p = Seq(Array(1, 1), Array(1, 0), Array(0, 0))
    val f1 = Metrics.multiLabelWeightedF1(t, p)
    assert(f1 < 1.0 && f1 > 0.0)
  }

  test("multiLabelWeightedF1 with no positives anywhere is 0") {
    assert(Metrics.multiLabelWeightedF1(Seq(Array(0, 0)), Seq(Array(0, 0))) == 0.0)
  }

  test("r2 of perfect predictions is 1; of mean predictor is 0") {
    val y = Seq(1.0, 2.0, 3.0, 4.0)
    assert(Metrics.r2(y, y) == 1.0)
    assert(math.abs(Metrics.r2(y, Seq.fill(4)(2.5))) < 1e-9)
  }

  test("r2 can be negative for bad predictors") {
    assert(Metrics.r2(Seq(1.0, 2.0, 3.0), Seq(3.0, 3.0, 0.0)) < 0.0)
  }

  test("r2 of constant truth is 1 iff predictions equal it") {
    assert(Metrics.r2(Seq(2.0, 2.0), Seq(2.0, 2.0)) == 1.0)
    assert(Metrics.r2(Seq(2.0, 2.0), Seq(1.0, 3.0)) == 0.0)
  }

  test("f1AtK computes precision/recall at k") {
    val retrieved = Seq("a", "b", "c", "d")
    val relevant  = Set("a", "c", "x")
    val f1 = Metrics.f1AtK(retrieved, relevant, 2)
    // top2 = a,b -> hits 1; P=0.5, R=1/min(3,2)=0.5 -> F1=0.5
    assert(math.abs(f1 - 0.5) < 1e-9)
  }

  test("f1AtK of empty inputs is 0") {
    assert(Metrics.f1AtK(Seq.empty, Set("a"), 3) == 0.0)
    assert(Metrics.f1AtK(Seq("a"), Set.empty, 3) == 0.0)
  }

  test("f1AtK perfect retrieval is 1") {
    assert(Metrics.f1AtK(Seq("a", "b"), Set("a", "b"), 2) == 1.0)
  }

  test("mean and stdev") {
    assert(Metrics.mean(Seq(1.0, 2.0, 3.0)) == 2.0)
    assert(Metrics.mean(Seq.empty) == 0.0)
    assert(math.abs(Metrics.stdev(Seq(2.0, 4.0)) - math.sqrt(2.0)) < 1e-9)
    assert(Metrics.stdev(Seq(1.0)) == 0.0)
  }
}
