"""NebulaMEOS — the paper's contribution.

The integration layer: MEOS kernels registered into the stream engine
as runtime operators (``udfs``), the eight demonstration queries as
composable DataFrame transforms (``queries``), Structured-Streaming
wrappers (``streaming``), and the ingestion-rate/throughput harness
that reproduces the paper's Table 1 numbers (``throughput``).
"""
