"""Reproduction of "Unifying the Global and Local Approaches: An Efficient
Power Iteration with Forward Push" (Wu, Gan, Wei, Zhang — SIGMOD 2021).

Package layout:

* ``repro.graphs``   — directed-graph substrate: DataFrame graphs, synthetic
  generators, Pregel-style connected components.
* ``repro.linalg``   — numpy-only CSR kernels, exact PPR ground truth, and
  instrumented single-machine reference implementations of the paper's
  algorithms (used for op-count experiments and as test oracles).
* ``repro.core``     — the distributed (PySpark DataFrame) algorithms:
  PowItr, FIFO-FwdPush/SimFwdPush, PowerPush, MonteCarlo, FORA(+),
  SpeedPPR(+Index) and the shared random-walk index.
* ``repro.bepi``     — the BePI baseline (hub-and-spoke block-elimination
  index + iterative query), rebuilt from the paper's description.
* ``repro.experiments`` — dataset stand-ins and one harness per table.
"""

__version__ = "0.1.0"

ALPHA_DEFAULT = 0.2
"""Teleport (stop) probability of an α-random walk — the paper's default."""
