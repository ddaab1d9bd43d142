package repro.core

import org.scalatest.funsuite.AnyFunSuite
import repro.core.Types._

class TypesSpec extends AnyFunSuite {

  test("DatasetConfig rejects non-positive cardinalities") {
    intercept[IllegalArgumentException](
      DatasetConfig("x", n = 0, nQueries = 1, m = 1, dim = 2, dLat = 2, nClusters = 1, tau = 0.1, seed = 1))
    intercept[IllegalArgumentException](
      DatasetConfig("x", n = 1, nQueries = 0, m = 1, dim = 2, dLat = 2, nClusters = 1, tau = 0.1, seed = 1))
    intercept[IllegalArgumentException](
      DatasetConfig("x", n = 1, nQueries = 1, m = 1, dim = 2, dLat = 2, nClusters = 0, tau = 0.1, seed = 1))
  }

  test("EncoderConfig: noiseFor maps modalities to the right noise") {
    val e = EncoderConfig("e", targetNoise = 0.3, auxNoises = Seq(0.5, 0.7))
    assert(e.noiseFor(0) == 0.3)
    assert(e.noiseFor(1) == 0.5)
    assert(e.noiseFor(2) == 0.7)
  }

  test("EncoderConfig: composition target reports compNoise for slot 0") {
    val e = EncoderConfig("e", targetNoise = 0.3, auxNoises = Seq(0.5),
      compNoise = 0.9, targetIsComposition = true)
    assert(e.noiseFor(0) == 0.9)
    assert(e.hasComposition)
  }

  test("EncoderConfig: hasComposition false when compNoise is NaN") {
    assert(!EncoderConfig("e", 0.3, Seq(0.5)).hasComposition)
  }

  test("IndexConfig validates gamma and epsilon") {
    intercept[IllegalArgumentException](IndexConfig(gamma = 0))
    intercept[IllegalArgumentException](IndexConfig(epsilon = -1))
    assert(IndexConfig().gamma == 16)
  }

  test("SearchConfig requires l >= k >= 1") {
    intercept[IllegalArgumentException](SearchConfig(k = 10, l = 5))
    intercept[IllegalArgumentException](SearchConfig(k = 0, l = 5))
    assert(SearchConfig(k = 10, l = 10).l == 10)
  }
}
