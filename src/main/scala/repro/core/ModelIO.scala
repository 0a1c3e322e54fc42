package repro.core

import java.io.{DataInputStream, DataOutputStream, FileInputStream, FileOutputStream}
import repro.nn.{ModelSpec, TrainedModel}

/** (De)serialization of trained models — the artifact GraphTrainer's
  * parameter server hands to GraphInfer jobs.
  */
object ModelIO {

  def save(tm: TrainedModel, path: String): Unit = {
    val out = new DataOutputStream(new FileOutputStream(path))
    try {
      out.writeUTF(tm.spec.kind)
      out.writeInt(tm.spec.layers)
      out.writeInt(tm.spec.inDim)
      out.writeInt(tm.spec.hidden)
      out.writeInt(tm.spec.embDim)
      out.writeInt(tm.spec.numClasses)
      out.writeUTF(tm.spec.task)
      out.writeInt(tm.params.length)
      tm.params.foreach { p =>
        out.writeInt(p.length)
        p.foreach(out.writeDouble)
      }
    } finally out.close()
  }

  def load(path: String): TrainedModel = {
    val in = new DataInputStream(new FileInputStream(path))
    try {
      val spec = ModelSpec(
        kind = in.readUTF(),
        layers = in.readInt(),
        inDim = in.readInt(),
        hidden = in.readInt(),
        embDim = in.readInt(),
        numClasses = in.readInt(),
        task = in.readUTF()
      )
      val n = in.readInt()
      val params = Array.fill(n)(Array.fill(in.readInt())(in.readDouble()))
      TrainedModel(spec, params)
    } finally in.close()
  }
}
