package repro.mmdata

import org.scalatest.funsuite.AnyFunSuite

/** Sanity of the per-table analog configurations (DESIGN.md §3). */
class DatasetsSpec extends AnyFunSuite {

  private val accuracySets =
    Seq(Datasets.mitStates, Datasets.celebA, Datasets.shoppingTshirt,
      Datasets.shoppingBottoms, Datasets.msCoco, Datasets.celebAPlus)

  test("all dataset analogs use distinct seeds") {
    val seeds = (accuracySets ++ Seq(Datasets.imageText(1000), Datasets.audioText(1000),
      Datasets.videoText(1000))).map(_.seed)
    assert(seeds.toSet.size == seeds.size)
  }

  test("modal arity matches the paper's Table II") {
    assert(Datasets.mitStates.m == 2)
    assert(Datasets.celebA.m == 2)
    assert(Datasets.shoppingTshirt.m == 2)
    assert(Datasets.msCoco.m == 3)
    assert(Datasets.celebAPlus.m == 4)
    assert(Datasets.imageText(100).m == 2)
  }

  test("encoder row names match the paper's table rows") {
    assert(Datasets.mitStatesEncoders.map(_.name) == Seq(
      "ResNet17+LSTM", "ResNet50+LSTM", "ResNet17+Transformer", "ResNet50+Transformer",
      "TIRG+LSTM", "TIRG+Transformer", "CLIP+LSTM", "CLIP+Transformer"))
    assert(Datasets.celebAEncoders.map(_.name) == Seq(
      "ResNet17+Encoding", "ResNet50+Encoding", "TIRG+Encoding", "CLIP+Encoding"))
    assert(Datasets.shoppingEncoders.map(_.name) == Seq("ResNet17+Encoding", "TIRG+Encoding"))
    assert(Datasets.msCocoEncoders.map(_.name) == Seq("MPC+GRU+ResNet50", "ResNet50+GRU+ResNet50"))
  }

  test("aux noise vectors have m-1 entries everywhere") {
    Datasets.mitStatesEncoders.foreach(e => assert(e.auxNoises.size == 1))
    Datasets.msCocoEncoders.foreach(e => assert(e.auxNoises.size == 2))
    assert(Datasets.celebAPlusEncoder.auxNoises.size == 3)
  }

  test("encoder ordering encodes the paper's quality ordering") {
    val byName = Datasets.mitStatesEncoders.map(e => e.name -> e).toMap
    // ResNet50 (better) has lower noise than ResNet17.
    assert(byName("ResNet50+LSTM").targetNoise < byName("ResNet17+LSTM").targetNoise)
    // CLIP composition beats TIRG composition.
    assert(byName("CLIP+LSTM").compNoise < byName("TIRG+LSTM").compNoise)
    // LSTM beats Transformer on MIT-States (paper Table III).
    assert(byName("ResNet50+LSTM").auxNoises.head < byName("ResNet50+Transformer").auxNoises.head)
  }

  test("composition rows put the composition in the target slot") {
    (Datasets.mitStatesJeEncoders ++ Datasets.celebAJeEncoders ++ Datasets.shoppingJeEncoders)
      .foreach(e => assert(e.targetIsComposition && e.hasComposition, e.name))
  }

  test("scale analog generator scales clusters with n") {
    assert(Datasets.imageText(48000).nClusters > Datasets.imageText(3000).nClusters)
  }

  test("Shopping image modality is the noisiest target (the MR-collapse driver)") {
    val shopping = Datasets.shoppingEncoders.find(_.name == "ResNet17+Encoding").get
    val others = (Datasets.mitStatesEncoders ++ Datasets.celebAEncoders).map(_.targetNoise)
    assert(shopping.targetNoise > others.max)
  }
}
