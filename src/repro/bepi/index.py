"""The persisted BePI-lite index.

All matrices are over ``H₀ = I − (1−α)·P₀ᵀ`` where ``P₀`` zeroes dead-end
rows (walk dies there); queries repair this exactly with the rank-1
source-correction ``x = y / (1 − (1−α)·Σ_dead y / α)`` — see
:mod:`repro.bepi.query`. This keeps the index source-independent, exactly
like the original BePI's preprocessed matrices.

Layout: non-hub nodes are concatenated block by block (``nonhub`` order),
hubs follow; ``M12/M21/M22`` are COO over local positions with entries
``(1−α)/d_src`` per directed edge; ``inv_k`` is the dense inverse of block
``k``'s ``H11`` sub-matrix.
"""
from __future__ import annotations

import os
from dataclasses import dataclass, field

import numpy as np


@dataclass
class BepiIndex:
    n: int
    alpha: float
    hubs: np.ndarray  # hub node ids, local hub position = index herein
    nonhub: np.ndarray  # non-hub node ids in block-concatenated order
    block_sizes: np.ndarray  # len = #blocks; block k occupies a contiguous slice
    inverses: list[np.ndarray]  # dense H11-block inverses, aligned with block_sizes
    # COO matrices (rows/cols are LOCAL positions: nonhub-local or hub-local)
    m12: tuple[np.ndarray, np.ndarray, np.ndarray]  # nonhub ← hub
    m21: tuple[np.ndarray, np.ndarray, np.ndarray]  # hub ← nonhub
    m22: tuple[np.ndarray, np.ndarray, np.ndarray]  # hub ← hub
    dead: np.ndarray  # dead-end node ids
    build_seconds: float = float("nan")
    path: str | None = None
    stats: dict = field(default_factory=dict)

    # ------------------------------------------------------------------
    def block_slices(self) -> list[slice]:
        offs = np.concatenate([[0], np.cumsum(self.block_sizes)])
        return [slice(int(offs[k]), int(offs[k + 1])) for k in range(len(self.block_sizes))]

    @property
    def size_bytes(self) -> int:
        if self.path and os.path.exists(self.path):
            return os.path.getsize(self.path)
        # in-memory estimate: inverses dominate
        total = sum(inv.nbytes for inv in self.inverses)
        for coo in (self.m12, self.m21, self.m22):
            total += sum(a.nbytes for a in coo)
        total += self.hubs.nbytes + self.nonhub.nbytes + self.dead.nbytes
        return total

    # ------------------------------------------------------------------
    def save(self, path: str) -> None:
        arrays = {
            "n": np.array([self.n]),
            "alpha": np.array([self.alpha]),
            "hubs": self.hubs,
            "nonhub": self.nonhub,
            "block_sizes": self.block_sizes,
            "dead": self.dead,
        }
        for name, coo in (("m12", self.m12), ("m21", self.m21), ("m22", self.m22)):
            arrays[f"{name}_r"], arrays[f"{name}_c"], arrays[f"{name}_v"] = coo
        for k, inv in enumerate(self.inverses):
            arrays[f"inv_{k}"] = inv
        np.savez(path, **arrays)
        self.path = path if path.endswith(".npz") else path + ".npz"

    @staticmethod
    def load(path: str) -> "BepiIndex":
        z = np.load(path)
        nb = len(z["block_sizes"])
        return BepiIndex(
            n=int(z["n"][0]),
            alpha=float(z["alpha"][0]),
            hubs=z["hubs"],
            nonhub=z["nonhub"],
            block_sizes=z["block_sizes"],
            inverses=[z[f"inv_{k}"] for k in range(nb)],
            m12=(z["m12_r"], z["m12_c"], z["m12_v"]),
            m21=(z["m21_r"], z["m21_c"], z["m21_v"]),
            m22=(z["m22_r"], z["m22_c"], z["m22_v"]),
            dead=z["dead"],
            path=path,
        )


def coo_matvec(coo: tuple[np.ndarray, np.ndarray, np.ndarray], x: np.ndarray, out_dim: int) -> np.ndarray:
    rows, cols, vals = coo
    y = np.zeros(out_dim, dtype=np.float64)
    if rows.size:
        np.add.at(y, rows, vals * x[cols])
    return y
