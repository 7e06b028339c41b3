package repro.tydi.eval

/** TIL sources for the evaluation of paper §8.3 (Table 1): Tydi equivalents
  * of the AXI4-Stream and AXI4 interface standards. The paper's artifact is
  * behind an anonymized URL, so these are authored here in the paper's style;
  * the AXI4-Stream declaration follows Listing 3 verbatim. Lines-of-code
  * numbers for Table 1 are *measured from these sources*, not hardcoded.
  */
object TilSamples {

  /** Listing 3: an AXI4-Stream-equivalent interface in TIL. The Union of
    * data and Null is the TSTRB equivalent (position-only bytes), throughput
    * 128 is the data-bus width in bytes, dimensionality 1 is TLAST, and
    * Tydi's strobe at complexity 7 is the TKEEP equivalent.
    */
  val axi4Stream: String =
    """namespace repro::axi {
      |type axi4stream = Stream (
      |    data: Union (
      |        data: Bits(8),
      |        null: Null, // Equivalent to TSTRB
      |    ),
      |    throughput: 128.0, // Data bus width
      |    dimensionality: 1, // Equivalent to TLAST
      |    synchronicity: Sync,
      |    complexity: 7, // Tydi's strobe is equivalent to TKEEP
      |    user: Group (
      |        TID: Bits(8),
      |        TDEST: Bits(4),
      |        TUSER: Bits(1),
      |    ),
      |);
      |streamlet example = (
      |    axi4stream: in axi4stream,
      |);
      |}
      |""".stripMargin

  /** AXI4 equivalent: one Stream per channel (Address Write, Write Data,
    * Write Response, Address Read, Read Data), sharing Group declarations
    * between the two address channels. Write Data and Read Data carry
    * bursts, so they have dimensionality 1 (WLAST/RLAST).
    */
  val axi4: String =
    """namespace repro::axi {
      |type axi4_addr = Group (
      |    ID: Bits(8),
      |    ADDR: Bits(32),
      |    LEN: Bits(8),
      |    SIZE: Bits(3),
      |    BURST: Bits(2),
      |    LOCK: Bits(1),
      |    CACHE: Bits(4),
      |    PROT: Bits(3),
      |    QOS: Bits(4),
      |    REGION: Bits(4),
      |);
      |type axi4_wdata = Group (
      |    DATA: Bits(32),
      |    STRB: Bits(4),
      |);
      |type axi4_rdata = Group (
      |    ID: Bits(8),
      |    DATA: Bits(32),
      |    RESP: Bits(2),
      |);
      |type axi4_bresp = Group (
      |    ID: Bits(8),
      |    RESP: Bits(2),
      |);
      |type axi4_aw = Stream (
      |    data: axi4_addr,
      |    complexity: 7,
      |    user: Bits(4), // AWUSER
      |);
      |type axi4_w = Stream (
      |    data: axi4_wdata,
      |    dimensionality: 1, // WLAST
      |    complexity: 7,
      |    user: Bits(4), // WUSER
      |);
      |type axi4_b = Stream (
      |    data: axi4_bresp,
      |    complexity: 7,
      |    user: Bits(4), // BUSER
      |);
      |type axi4_ar = Stream (
      |    data: axi4_addr,
      |    complexity: 7,
      |    user: Bits(4), // ARUSER
      |);
      |type axi4_r = Stream (
      |    data: axi4_rdata,
      |    dimensionality: 1, // RLAST
      |    complexity: 7,
      |    user: Bits(4), // RUSER
      |);
      |streamlet manager = (
      |    aw: out axi4_aw,
      |    w: out axi4_w,
      |    b: in axi4_b,
      |    ar: out axi4_ar,
      |    r: in axi4_r,
      |);
      |}
      |""".stripMargin

  /** AXI4 equivalent, single-Group variant: the five channels combined into
    * one Group with Reverse Streams for the Read Data and Write Response
    * channels (paper §8.3) — one port, identical physical streams.
    */
  val axi4Group: String =
    """namespace repro::axi {
      |type axi4_addr = Group (
      |    ID: Bits(8),
      |    ADDR: Bits(32),
      |    LEN: Bits(8),
      |    SIZE: Bits(3),
      |    BURST: Bits(2),
      |    LOCK: Bits(1),
      |    CACHE: Bits(4),
      |    PROT: Bits(3),
      |    QOS: Bits(4),
      |    REGION: Bits(4),
      |);
      |type axi4_wdata = Group (
      |    DATA: Bits(32),
      |    STRB: Bits(4),
      |);
      |type axi4_rdata = Group (
      |    ID: Bits(8),
      |    DATA: Bits(32),
      |    RESP: Bits(2),
      |);
      |type axi4_bresp = Group (
      |    ID: Bits(8),
      |    RESP: Bits(2),
      |);
      |type axi4_aw = Stream (
      |    data: axi4_addr,
      |    complexity: 7,
      |    user: Bits(4), // AWUSER
      |);
      |type axi4_w = Stream (
      |    data: axi4_wdata,
      |    dimensionality: 1, // WLAST
      |    complexity: 7,
      |    user: Bits(4), // WUSER
      |);
      |type axi4_b = Stream (
      |    data: axi4_bresp,
      |    complexity: 7,
      |    direction: Reverse, // response flows back
      |    user: Bits(4), // BUSER
      |);
      |type axi4_ar = Stream (
      |    data: axi4_addr,
      |    complexity: 7,
      |    user: Bits(4), // ARUSER
      |);
      |type axi4_r = Stream (
      |    data: axi4_rdata,
      |    dimensionality: 1, // RLAST
      |    complexity: 7,
      |    direction: Reverse, // response flows back
      |    user: Bits(4), // RUSER
      |);
      |type axi4_bundle = Stream (
      |    data: Group (
      |        aw: axi4_aw,
      |        w: axi4_w,
      |        b: axi4_b,
      |        ar: axi4_ar,
      |        r: axi4_r,
      |    ),
      |);
      |streamlet manager = (
      |    axi4: out axi4_bundle,
      |);
      |}
      |""".stripMargin

  /** Listing 1: the documentation example (with Listing 2 as its expected
    * VHDL rendering, up to the 54-bit stream payload).
    */
  val paperExample: String =
    """namespace my::example::space {
      |type stream = Stream (
      |    data: Bits(54),
      |);
      |type stream2 = Stream (
      |    data: Bits(54),
      |);
      |#documentation (optional)#
      |streamlet comp1 = (
      |    // This is a comment
      |    a: in stream,
      |    b: out stream,
      |    #this is port
      |documentation#
      |    c: in stream2,
      |    d: out stream2,
      |);
      |}
      |""".stripMargin
}
