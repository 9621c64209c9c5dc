package repro.relational

import java.sql.{Connection, DriverManager}
import repro.storage.{CooMat, Coo3}

/** The real DuckDB baseline of Sec. 6, via the in-process JDBC driver:
  * tensors loaded as COO relations, kernels run as aggregate-join SQL.
  * Loading is excluded from timing, matching the paper's methodology. */
object DuckKernels {

  final class Db private[DuckKernels] (val conn: Connection) extends AutoCloseable {
    def loadMatrix(name: String, m: CooMat): Unit = {
      val st = conn.createStatement()
      st.execute(s"CREATE TABLE $name (i BIGINT, j BIGINT, v DOUBLE)")
      st.close()
      val ps = conn.prepareStatement(s"INSERT INTO $name VALUES (?, ?, ?)")
      var c = 0
      m.entries.foreach { case (i, j, v) =>
        ps.setLong(1, i.toLong); ps.setLong(2, j.toLong); ps.setDouble(3, v)
        ps.addBatch(); c += 1
        if (c % 10000 == 0) ps.executeBatch()
      }
      ps.executeBatch(); ps.close()
    }

    def loadTensor(name: String, t: Coo3): Unit = {
      val st = conn.createStatement()
      st.execute(s"CREATE TABLE $name (i BIGINT, j BIGINT, k BIGINT, v DOUBLE)")
      st.close()
      val ps = conn.prepareStatement(s"INSERT INTO $name VALUES (?, ?, ?, ?)")
      var c = 0
      t.entries.foreach { case (i, j, k, v) =>
        ps.setLong(1, i.toLong); ps.setLong(2, j.toLong)
        ps.setLong(3, k.toLong); ps.setDouble(4, v)
        ps.addBatch(); c += 1
        if (c % 10000 == 0) ps.executeBatch()
      }
      ps.executeBatch(); ps.close()
    }

    def loadVector(name: String, x: Array[Double]): Unit = {
      val st = conn.createStatement()
      st.execute(s"CREATE TABLE $name (i BIGINT, v DOUBLE)")
      st.close()
      val ps = conn.prepareStatement(s"INSERT INTO $name VALUES (?, ?)")
      x.zipWithIndex.foreach { case (v, i) =>
        ps.setLong(1, i.toLong); ps.setDouble(2, v); ps.addBatch()
      }
      ps.executeBatch(); ps.close()
    }

    /** Run `sql`, returning (checksum over all numeric columns of the
      * result, wall-clock ms of execution+fetch). */
    def timeQuery(sql: String): (Double, Double) = {
      val t0 = System.nanoTime()
      val st = conn.createStatement()
      val rs = st.executeQuery(sql)
      val nCols = rs.getMetaData.getColumnCount
      var sum = 0.0
      while (rs.next()) {
        var c = 1
        while (c <= nCols) { sum += rs.getDouble(c); c += 1 }
      }
      rs.close(); st.close()
      (sum, (System.nanoTime() - t0) / 1e6)
    }

    def close(): Unit = conn.close()
  }

  def open(): Db = {
    Class.forName("org.duckdb.DuckDBDriver")
    new Db(DriverManager.getConnection("jdbc:duckdb:"))
  }
}
