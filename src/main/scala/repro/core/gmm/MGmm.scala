package repro.core.gmm

import org.apache.spark.sql.DataFrame
import repro.data.Store

/** Algorithm M-GMM (paper Alg. 1): join S and R, **materialize** T in the
  * database (here: Parquet via [[Store]]), then run EM reading T back from
  * disk every iteration. The materialization cost is part of training.
  */
object MGmm {

  def train(store: Store, s: DataFrame, r: DataFrame, init: GmmModel, iters: Int,
            tableName: String = "T_mgmm"): GmmFit = {
    val t = store.write(tableName, DenormGmm.joined(s, r))
    DenormGmm.train(t, init, iters)
  }

  /** Multi-way variant: materialize S ⋈ R1 ⋈ … ⋈ Rq. */
  def trainMulti(store: Store, s: DataFrame, rs: Seq[DataFrame], init: GmmModel, iters: Int,
                 tableName: String = "T_mgmm_multi"): GmmFit = {
    val t = store.write(tableName, SGmm.joinedMulti(s, rs))
    DenormGmm.train(t, init, iters)
  }
}
