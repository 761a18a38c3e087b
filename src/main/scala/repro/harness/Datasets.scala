package repro.harness

import repro.data.TimeSeriesGen
import repro.data.TimeSeriesGen.Dataset

/** Registry of synthetic stand-ins for the paper's UCR datasets
  * (Table II), at reduced scale for the 16-core container. `paperN` /
  * `paperL` / `paperClasses` record the original rows so bench T0 can
  * print both side by side.
  */
object Datasets {

  final case class Spec(id: Int, name: String, paperName: String,
                        n: Int, len: Int, classes: Int, noise: Double,
                        paperN: Int, paperL: Int, paperClasses: Int, seed: Long) {
    def generate(): Dataset = TimeSeriesGen.make(name, n, len, classes, noise, seed)
  }

  /** The bench registry: ids match the paper's Table II ids. */
  val specs: IndexedSeq[Spec] = IndexedSeq(
    Spec(1,  "mallat-like",      "Mallat",                     600, 256,  8, 1.2, 2400, 1024,  8, 101),
    Spec(2,  "uwave-all-like",   "UWaveGestureLibraryAll",     700, 236,  8, 1.4, 4478,  945,  8, 102),
    Spec(6,  "ecg5000-like",     "ECG5000",                   1000, 140,  5, 1.3, 5000,  140,  5, 106),
    Spec(8,  "starlight-like",   "StarLightCurves",           1200,  84,  2, 1.5, 9236,   84,  2, 108),
    Spec(9,  "handout-like",     "HandOutlines",               400, 512,  2, 1.8, 1370, 2709,  2, 109),
    Spec(11, "cbf-like",         "CBF",                        300, 128,  3, 1.5,  930,  128,  3, 111),
    Spec(14, "shapesall-like",   "ShapesAll",                  480, 256, 40, 1.0, 1200,  512, 60, 114),
    Spec(15, "sony2-like",       "SonyAIBORobotSurface2",      320,  65,  2, 1.6,  980,   65,  2, 115),
    Spec(17, "crop-like",        "Crop",                      1900,  46, 24, 1.1, 19412,  46, 24, 117),
    Spec(18, "electric-like",    "ElectricDevices",           1600,  96,  7, 1.4, 16160,  96,  7, 118),
  )

  def byId(id: Int): Spec = specs.find(_.id == id).getOrElse(
    sys.error(s"no dataset with id $id"))

  /** Datasets small enough for the quadratic PMFG baseline (the paper's
    * PMFG also timed out on its largest datasets).
    */
  val pmfgMaxN = 450

  /** Datasets small enough for the quadratic SEQ-TDBHT bubble path. */
  val seqMaxN = 1300
}
