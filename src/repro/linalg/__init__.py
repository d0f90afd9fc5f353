"""numpy-only linear-algebra kernels, exact PPR ground truth, and the
instrumented single-machine reference implementations of the paper's
algorithms (scipy is not available in this environment, so the CSR type is
home-grown)."""

from repro.linalg.csr import CSR

__all__ = ["CSR"]
