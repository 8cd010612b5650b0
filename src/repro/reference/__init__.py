"""Pure-Python sequential reference implementations.

These are literal transcriptions of the paper's definitions and algorithms
(peeling, offsets, SCS-Peel) on small in-memory graphs. They exist solely as
test oracles for the distributed PySpark implementations in
``repro.graph`` / ``repro.core`` / ``repro.models`` — never import them from
production dataflow code.
"""
