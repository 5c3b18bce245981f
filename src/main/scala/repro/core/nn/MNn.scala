package repro.core.nn

import org.apache.spark.sql.DataFrame
import repro.data.Store

/** Algorithm M-NN: join S and R, **materialize** T on disk, train reading T
  * back every epoch. Materialization cost is part of training.
  */
object MNn {

  def train(store: Store, s: DataFrame, r: DataFrame, init: NnModel, epochs: Int,
            lr: Double, tableName: String = "T_mnn"): NnFit = {
    val t = store.write(tableName, DenormNn.joined(s, r))
    DenormNn.train(t, init, epochs, lr)
  }

  def trainMulti(store: Store, s: DataFrame, rs: Seq[DataFrame], init: NnModel, epochs: Int,
                 lr: Double, tableName: String = "T_mnn_multi"): NnFit = {
    val t = store.write(tableName, SNn.joinedMulti(s, rs))
    DenormNn.train(t, init, epochs, lr)
  }
}
