package repro.mmdata

import repro.core.Types._

/** Scaled-down analogs of the paper's nine datasets (Table II) and the
  * simulated encoder rows of Tables III–VI.
  *
  * Noise levels are ordered to match the paper's relative encoder quality
  * on each dataset (e.g. LSTM ≪ Transformer on MIT-States; the image
  * modality is nearly uninformative on Shopping, which is what makes the
  * paper's MR collapse there). Absolute recall values are not expected to
  * match the paper — the *ordering and gaps* between frameworks and
  * encoders are (EXPERIMENTS.md diffs both).
  */
object Datasets {

  /** Default object-set scale for accuracy tables (paper: 20k–190k). */
  val AccuracyN = 2400L
  val AccuracyQ = 300

  // ---- dataset analogs -------------------------------------------------

  val mitStates: DatasetConfig =
    DatasetConfig("MIT-States", AccuracyN, AccuracyQ, m = 2, dim = 24, dLat = 16,
      nClusters = 120, tau = 0.35, seed = 41L)

  val celebA: DatasetConfig =
    DatasetConfig("CelebA", AccuracyN, AccuracyQ, m = 2, dim = 24, dLat = 16,
      nClusters = 120, tau = 0.35, seed = 42L)

  val shoppingTshirt: DatasetConfig =
    DatasetConfig("Shopping-Tshirt", AccuracyN, AccuracyQ, m = 2, dim = 24, dLat = 16,
      nClusters = 120, tau = 0.35, seed = 43L)

  val shoppingBottoms: DatasetConfig =
    DatasetConfig("Shopping-Bottoms", AccuracyN, AccuracyQ, m = 2, dim = 24, dLat = 16,
      nClusters = 120, tau = 0.35, seed = 44L)

  /** MS-COCO analog: three modalities (image target, text aux, image aux),
    * deliberately the hardest setting (paper Recall@10 ≈ 0.02–0.09). */
  val msCoco: DatasetConfig =
    DatasetConfig("MS-COCO", 2000L, 250, m = 3, dim = 24, dLat = 16,
      nClusters = 100, tau = 0.35, seed = 45L)

  /** CelebA+ analog: four modalities for the modality-count sweep (Table VIII). */
  val celebAPlus: DatasetConfig =
    DatasetConfig("CelebA+", AccuracyN, AccuracyQ, m = 4, dim = 24, dLat = 16,
      nClusters = 120, tau = 0.35, seed = 46L)

  /** ImageText analog base (Tables VII, XI, XII, XVIII; n is scaled per bench). */
  def imageText(n: Long, nQueries: Int = 200): DatasetConfig =
    DatasetConfig("ImageText", n, nQueries, m = 2, dim = 24, dLat = 16,
      nClusters = math.max(40, (n / 24).toInt), tau = 0.35, seed = 47L)

  def audioText(n: Long, nQueries: Int = 200): DatasetConfig =
    DatasetConfig("AudioText", n, nQueries, m = 2, dim = 24, dLat = 16,
      nClusters = math.max(40, (n / 24).toInt), tau = 0.35, seed = 48L)

  def videoText(n: Long, nQueries: Int = 200): DatasetConfig =
    DatasetConfig("VideoText", n, nQueries, m = 2, dim = 24, dLat = 16,
      nClusters = math.max(40, (n / 24).toInt), tau = 0.35, seed = 49L)

  // ---- simulated encoder rows -----------------------------------------
  // Query-side noise levels; smaller = better encoder. Composition heads
  // (TIRG/CLIP/MPC) carry compNoise and put Φ in the target slot for
  // MR/MUST (paper Option 2); JE rows use the composition vector alone.

  /** MIT-States rows (Table III). LSTM ≪ Transformer here (paper). */
  val mitStatesEncoders: Seq[EncoderConfig] = Seq(
    EncoderConfig("ResNet17+LSTM",        targetNoise = 0.95, auxNoises = Seq(0.60)),
    EncoderConfig("ResNet50+LSTM",        targetNoise = 0.80, auxNoises = Seq(0.60)),
    EncoderConfig("ResNet17+Transformer", targetNoise = 0.95, auxNoises = Seq(1.05)),
    EncoderConfig("ResNet50+Transformer", targetNoise = 0.80, auxNoises = Seq(1.05)),
    EncoderConfig("TIRG+LSTM",            targetNoise = 0.95, auxNoises = Seq(0.60),
      compNoise = 1.00, targetIsComposition = true),
    EncoderConfig("TIRG+Transformer",     targetNoise = 0.95, auxNoises = Seq(1.05),
      compNoise = 1.00, targetIsComposition = true),
    EncoderConfig("CLIP+LSTM",            targetNoise = 0.95, auxNoises = Seq(0.60),
      compNoise = 0.85, targetIsComposition = true),
    EncoderConfig("CLIP+Transformer",     targetNoise = 0.95, auxNoises = Seq(1.05),
      compNoise = 0.85, targetIsComposition = true),
  )

  /** JE rows use the composition vector only. */
  val mitStatesJeEncoders: Seq[EncoderConfig] = Seq(
    EncoderConfig("TIRG", targetNoise = 0.95, auxNoises = Seq(0.60),
      compNoise = 1.00, targetIsComposition = true),
    EncoderConfig("CLIP", targetNoise = 0.95, auxNoises = Seq(0.60),
      compNoise = 0.85, targetIsComposition = true),
  )

  /** CelebA rows (Table IV): text (Encoding) is the informative modality
    * (paper's learned ω₁² ≫ ω₀²); ResNet17 slightly beats ResNet50. */
  val celebAEncoders: Seq[EncoderConfig] = Seq(
    EncoderConfig("ResNet17+Encoding", targetNoise = 1.00, auxNoises = Seq(0.55)),
    EncoderConfig("ResNet50+Encoding", targetNoise = 1.10, auxNoises = Seq(0.55)),
    EncoderConfig("TIRG+Encoding",     targetNoise = 1.00, auxNoises = Seq(0.55),
      compNoise = 0.95, targetIsComposition = true),
    EncoderConfig("CLIP+Encoding",     targetNoise = 1.00, auxNoises = Seq(0.55),
      compNoise = 0.65, targetIsComposition = true),
  )

  val celebAJeEncoders: Seq[EncoderConfig] = Seq(
    EncoderConfig("TIRG", targetNoise = 1.00, auxNoises = Seq(0.55),
      compNoise = 0.95, targetIsComposition = true),
    EncoderConfig("CLIP", targetNoise = 1.00, auxNoises = Seq(0.55),
      compNoise = 0.65, targetIsComposition = true),
  )

  /** Shopping rows (Tables V, XXI): the image modality is nearly
    * uninformative (paper MR ResNet17+Encoding Recall@1 = 0.0027), so its
    * candidate lists almost never contain the ground truth and MR's
    * intersection collapses. */
  val shoppingEncoders: Seq[EncoderConfig] = Seq(
    EncoderConfig("ResNet17+Encoding", targetNoise = 3.20, auxNoises = Seq(0.50)),
    EncoderConfig("TIRG+Encoding",     targetNoise = 3.20, auxNoises = Seq(0.50),
      compNoise = 1.35, targetIsComposition = true),
  )

  val shoppingJeEncoders: Seq[EncoderConfig] = Seq(
    EncoderConfig("TIRG", targetNoise = 3.20, auxNoises = Seq(0.50),
      compNoise = 1.35, targetIsComposition = true),
  )

  /** MS-COCO rows (Table VI): m = 3, everything very noisy — the paper's
    * hardest dataset (best Recall@10 below 0.1). */
  val msCocoEncoders: Seq[EncoderConfig] = Seq(
    EncoderConfig("MPC+GRU+ResNet50",      targetNoise = 2.80, auxNoises = Seq(2.40, 2.60),
      compNoise = 2.90, targetIsComposition = true),
    EncoderConfig("ResNet50+GRU+ResNet50", targetNoise = 2.70, auxNoises = Seq(2.40, 2.60)),
  )

  val msCocoJeEncoders: Seq[EncoderConfig] = Seq(
    EncoderConfig("MPC", targetNoise = 2.80, auxNoises = Seq(2.40, 2.60),
      compNoise = 2.90, targetIsComposition = true),
  )

  /** CelebA+ row (Tables VIII, XVII): CLIP composition target + three aux.
    * The added modalities carry real signal so recall grows with m (the
    * paper's Table VIII trend for MUST). */
  val celebAPlusEncoder: EncoderConfig =
    EncoderConfig("CLIP+Encoding+ResNet17+ResNet50",
      targetNoise = 1.00, auxNoises = Seq(0.55, 0.80, 0.90),
      compNoise = 0.80, targetIsComposition = true)

  /** Semi-synthetic million-scale analogs (Table XVIII): noise ratios chosen
    * so the learned weight split matches the paper's per-dataset pattern
    * (Audio: aux-dominant; Video: balanced; Image: text-leaning). */
  val imageTextEncoder: EncoderConfig =
    EncoderConfig("default", targetNoise = 0.90, auxNoises = Seq(0.60))
  val audioTextEncoder: EncoderConfig =
    EncoderConfig("default", targetNoise = 1.20, auxNoises = Seq(0.50))
  val videoTextEncoder: EncoderConfig =
    EncoderConfig("default", targetNoise = 0.75, auxNoises = Seq(0.70))
}
