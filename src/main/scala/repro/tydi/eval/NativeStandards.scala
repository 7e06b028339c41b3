package repro.tydi.eval

/** Signal lists of the native AMBA interface standards the paper compares
  * against in Table 1 (§8.3). These are spec facts from the AMBA documents
  * cited by the paper ([4] AXI4-Stream, [5] AXI4); clock and reset
  * (ACLK/ARESETn) are excluded, matching how the Tydi equivalents exclude
  * their clock domain signals from the count.
  */
object NativeStandards {

  /** AMBA AXI4-Stream: 9 signals. */
  val axi4StreamSignals: Vector[String] = Vector(
    "TVALID", "TREADY", "TDATA", "TSTRB", "TKEEP", "TLAST", "TID", "TDEST", "TUSER")

  /** AMBA AXI4 (full): 44 signals across the five channels. */
  val axi4Signals: Vector[String] = Vector(
    // Write address channel
    "AWID", "AWADDR", "AWLEN", "AWSIZE", "AWBURST", "AWLOCK", "AWCACHE",
    "AWPROT", "AWQOS", "AWREGION", "AWUSER", "AWVALID", "AWREADY",
    // Write data channel
    "WDATA", "WSTRB", "WLAST", "WUSER", "WVALID", "WREADY",
    // Write response channel
    "BID", "BRESP", "BUSER", "BVALID", "BREADY",
    // Read address channel
    "ARID", "ARADDR", "ARLEN", "ARSIZE", "ARBURST", "ARLOCK", "ARCACHE",
    "ARPROT", "ARQOS", "ARREGION", "ARUSER", "ARVALID", "ARREADY",
    // Read data channel
    "RID", "RDATA", "RRESP", "RLAST", "RUSER", "RVALID", "RREADY",
  )
}
