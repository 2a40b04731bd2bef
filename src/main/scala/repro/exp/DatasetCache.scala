package repro.exp

import java.io._
import repro.kge.KgeDataset

/** Optional on-disk cache of collected KGE datasets, keyed by name.
  * Enabled with REPRO_CACHE=1 — used to iterate on model hyperparameters
  * without re-running the KG construction pipeline each time. Off by
  * default so jobs and benches always exercise the full dataflow.
  */
object DatasetCache {
  private def dir = new File(sys.env.getOrElse("REPRO_CACHE_DIR", "/tmp/repro-cache"))

  def getOrBuild(key: String)(build: => KgeDataset): KgeDataset = {
    if (!sys.env.contains("REPRO_CACHE")) return build
    dir.mkdirs()
    val f = new File(dir, s"$key.bin")
    if (f.exists()) {
      val in = new ObjectInputStream(new BufferedInputStream(new FileInputStream(f)))
      try in.readObject().asInstanceOf[KgeDataset] finally in.close()
    } else {
      val d = build
      val out = new ObjectOutputStream(new BufferedOutputStream(new FileOutputStream(f)))
      try { out.writeObject(d) } finally out.close()
      d
    }
  }
}
