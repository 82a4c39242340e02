package repro.data

import SyntheticTabular.Spec

/** The paper's dataset inventory, rebuilt synthetically (DESIGN.md §2).
  *
  * `targets` mirrors Table III: 26 classification + 10 regression datasets
  * with the paper's sample\feature counts, capped for the local substrate
  * (samples ≤ 1200, features ≤ 64 — the harness further pre-selects to ≤16
  * features by RF importance, exactly as the paper does before training).
  *
  * `publicPretrain` stands in for the 239 OpenML datasets used to pre-train
  * the FPE model.
  */
object DatasetRegistry {

  final case class Entry(
      name: String,
      classification: Boolean,
      paperSamples: Int,
      paperFeatures: Int,
  ) {
    val samples: Int  = math.min(paperSamples, 1200)
    val features: Int = math.min(paperFeatures, 64)
    def seed: Long    = name.hashCode.toLong & 0xffffffL
    def spec: Spec =
      Spec(name, samples, features, classification, seed, noise = 0.2 + (seed % 5) * 0.08)
  }

  /** Table III rows, in paper order. */
  val targets: Seq[Entry] = Seq(
    Entry("Higgs Boson", true, 50000, 28),
    Entry("A. Employee", true, 32769, 9),
    Entry("PimaIndian", true, 768, 8),
    Entry("SpectF", true, 267, 44),
    Entry("SVMGuide3", true, 1243, 21),
    Entry("German Credit", true, 1001, 24),
    Entry("Bikeshare DC", false, 10886, 11),
    Entry("Housing Boston", false, 506, 13),
    Entry("Airfoil", false, 1503, 5),
    Entry("AP. ovary", true, 275, 10936),
    Entry("Lymphography", true, 148, 18),
    Entry("Ionosphere", true, 351, 34),
    Entry("Openml 618", false, 1000, 50),
    Entry("Openml 589", false, 1000, 25),
    Entry("Openml 616", false, 500, 50),
    Entry("Openml 607", false, 1000, 50),
    Entry("Openml 620", false, 1000, 25),
    Entry("Openml 637", false, 500, 50),
    Entry("Openml 586", false, 1000, 25),
    Entry("Credit Default", true, 30000, 25),
    Entry("Messidor features", true, 1150, 19),
    Entry("Wine Q. Red", true, 999, 12),
    Entry("Wine Q. White", true, 4900, 12),
    Entry("SpamBase", true, 4601, 57),
    Entry("AP. lung", true, 203, 10936),
    Entry("credit-a", true, 690, 6),
    Entry("diabetes", true, 768, 8),
    Entry("fertility", true, 100, 9),
    Entry("gisette", true, 2100, 5000),
    Entry("hepatitis", true, 155, 6),
    Entry("labor", true, 57, 8),
    Entry("lymph", true, 138, 10936),
    Entry("madelon", true, 780, 500),
    Entry("megawatt1", true, 253, 37),
    Entry("secom", true, 470, 590),
    Entry("sonar", true, 208, 60),
  )

  def byName(name: String): Entry =
    targets.find(_.name == name).getOrElse(sys.error(s"unknown dataset: $name"))

  def load(name: String): TabularData = SyntheticTabular.generate(byName(name).spec)

  /** Synthetic stand-ins for the paper's 239 public pre-training datasets. */
  def publicPretrain(n: Int = 24): Seq[TabularData] =
    (0 until n).map { i =>
      val classification = i % 2 == 0
      SyntheticTabular.generate(
        Spec(
          name = s"public-$i",
          nSamples = 120 + (i * 37) % 480,
          nFeatures = 6 + (i * 5) % 11,
          classification = classification,
          seed = 9000L + i * 101,
          noise = 0.15 + (i % 4) * 0.1,
        )
      )
    }
}
