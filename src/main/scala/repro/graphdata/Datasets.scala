package repro.graphdata

import repro.core.CsrGraph

/** Registry of dataset stand-ins (DESIGN.md §4).
  *
  * The paper evaluates on 10 KONECT / NetworkRepository graphs that are
  * not available in this offline container; each gets a deterministic
  * synthetic stand-in: planted-community graphs for the social networks
  * (same n/m where tractable, scaled down for the web-scale ones) and
  * exact-(n,m) Erdős–Rényi graphs for the tiny Table IV animals.
  */
object Datasets {

  final case class Spec(
      name: String,
      paperN: Long,
      paperM: Long,
      gen: () => EdgeList,
      note: String,
  ) {
    lazy val edges: EdgeList = gen()
    lazy val csr: CsrGraph = edges.toCsr
  }

  /** The ten evaluation graphs of Tables I–III, VII, VIII. */
  val standins: Seq[Spec] = Seq(
    Spec("FTB", 115, 613,
      () => GraphGen.community(115, 613, 8, 0.85, seed = 101),
      "Football — full scale"),
    Spec("HST", 1860, 12500,
      () => GraphGen.community(1860, 12500, 10, 0.8, seed = 102),
      "Hamsterster — full scale"),
    Spec("FB", 4000, 88000,
      () => GraphGen.community(4000, 88000, 40, 0.9, seed = 103),
      "Facebook — full scale, dense communities (τ explodes with k)"),
    Spec("FBP", 28000, 206000,
      () => GraphGen.community(28000, 206000, 10, 0.8, seed = 104),
      "FBPages — full scale"),
    Spec("FBW", 63700, 500000,
      () => GraphGen.community(63700, 500000, 12, 0.8, seed = 105),
      "FBWosn — m scaled 817K→500K"),
    Spec("DS", 130000, 1000000,
      () => GraphGen.community(130000, 1000000, 10, 0.8, seed = 106),
      "Dogster — scaled 260K/2.15M → 130K/1M"),
    Spec("SK", 100000, 600000,
      () => GraphGen.community(100000, 600000, 9, 0.8, seed = 107),
      "Skitter — scaled 1.7M/11M → 100K/600K"),
    Spec("FL", 100000, 900000,
      () => GraphGen.community(100000, 900000, 24, 0.85, seed = 108),
      "Flickr — scaled 1.7M/15.6M → 100K/900K, dense"),
    Spec("LJ", 150000, 1200000,
      () => GraphGen.community(150000, 1200000, 18, 0.85, seed = 109),
      "LiveJournal — scaled 5.2M/48.7M → 150K/1.2M"),
    Spec("OR", 100000, 1500000,
      () => GraphGen.community(100000, 1500000, 20, 0.9, seed = 110),
      "Orkut — scaled 3M/117M → 100K/1.5M, dense"),
  )

  /** The six small graphs of Table IV (LP vs exact OPT). */
  val small: Seq[Spec] = Seq(
    Spec("Swallow", 17, 53,
      () => GraphGen.erdosRenyiExactM(17, 53, seed = 201), "ER exact-m"),
    Spec("Tortoise", 35, 104,
      () => GraphGen.erdosRenyiExactM(35, 104, seed = 202), "ER exact-m"),
    Spec("Lizard", 60, 318,
      () => GraphGen.erdosRenyiExactM(60, 318, seed = 203), "ER exact-m"),
    Spec("Football", 115, 613,
      () => GraphGen.community(115, 613, 8, 0.85, seed = 101), "same as FTB"),
    Spec("Voles", 181, 515,
      () => GraphGen.erdosRenyiExactM(181, 515, seed = 204), "ER exact-m"),
    Spec("Hamsterster", 1860, 12500,
      () => GraphGen.community(1860, 12500, 10, 0.8, seed = 102), "same as HST"),
  )

  def byName(name: String): Spec =
    (standins ++ small).find(_.name == name)
      .getOrElse(throw new NoSuchElementException(s"unknown dataset $name"))
}
