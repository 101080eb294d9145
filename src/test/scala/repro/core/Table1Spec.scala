package repro.core

import org.scalatest.funsuite.AnyFunSuite
import repro.checkpoint._

/** Table I of the paper, reproduced from the protocol implementations'
  * declared features.
  */
class Table1Spec extends AnyFunSuite {
  private val coor = new Coordinated().features
  private val unc = new Uncoordinated().features
  private val cic = new Hmnr().features

  test("COOR: blocking markers + straggler stalls, nothing else") {
    assert(coor == ProtocolFeatures(
      blockingMarkers = true, inFlightLogging = false, deduplicationRequired = false,
      messageOverhead = false, independentCheckpoints = false, stragglerStalls = true,
      unusedCheckpoints = false, forcedCheckpoints = false))
  }

  test("UNC: logging + dedup + independent checkpoints + unused checkpoints") {
    assert(unc == ProtocolFeatures(
      blockingMarkers = false, inFlightLogging = true, deduplicationRequired = true,
      messageOverhead = false, independentCheckpoints = true, stragglerStalls = false,
      unusedCheckpoints = true, forcedCheckpoints = false))
  }

  test("CIC: UNC's features plus message overhead plus forced checkpoints") {
    assert(cic == ProtocolFeatures(
      blockingMarkers = false, inFlightLogging = true, deduplicationRequired = true,
      messageOverhead = true, independentCheckpoints = true, stragglerStalls = false,
      unusedCheckpoints = true, forcedCheckpoints = true))
  }

  test("rendered Table I includes every protocol column") {
    val t = Tables.renderTable1()
    assert(t.contains("COOR") && t.contains("UNC") && t.contains("CIC"))
    assert(t.linesIterator.size >= 9)
  }

  test("cycle support: only the logged protocols handle cyclic graphs") {
    assert(!new Coordinated().supportsCycles)
    assert(new Uncoordinated().supportsCycles)
    assert(new Hmnr().supportsCycles)
  }
}
