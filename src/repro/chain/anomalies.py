"""Anomaly injection for the synthetic chains.

Two kinds of events, both observed by the paper in real 2019 Bitcoin
data:

* **Coinbase anomalies** — blocks whose coinbase pays many independent
  addresses (the paper's day-14 example: blocks 558,473 / 558,545 with
  more than 80 / 90 addresses). Attribution is one producer credit per
  address, which is what makes the affected day's Gini collapse and its
  entropy / Nakamoto spike.
* **Dominant surges** — a contiguous block range in which one miner
  takes a majority of blocks, straddling a fixed-window boundary so the
  event is diluted in fixed windows but aligned with one M = N/2
  sliding window (paper §III.A / the "day 60" Nakamoto anomaly).
"""

from __future__ import annotations

import numpy as np

from repro.chain.params import ChainSpec


def resolve_coinbase_anomalies(
    spec: ChainSpec, counts: np.ndarray
) -> list[tuple[int, int, int, int]]:
    """Resolve coinbase anomalies to concrete blocks.

    Returns ``(global_block_idx, n_addresses, day, k)`` tuples, where
    ``k`` numbers the anomalous blocks within their day. Positions not
    pinned by the spec are spread evenly through the day.
    """
    day_start = np.concatenate([[0], np.cumsum(counts)])
    out: list[tuple[int, int, int, int]] = []
    for a in spec.coinbase_anomalies:
        day_blocks = int(counts[a.day - 1])
        if a.positions is not None:
            positions = a.positions
        else:
            positions = tuple(
                int((j + 1) * day_blocks / (len(a.block_sizes) + 1))
                for j in range(len(a.block_sizes))
            )
        if len(positions) != len(a.block_sizes):
            raise ValueError(f"anomaly on day {a.day}: positions/sizes mismatch")
        for k, (pos, size) in enumerate(zip(positions, a.block_sizes)):
            if not 0 <= pos < day_blocks:
                raise ValueError(
                    f"anomaly position {pos} outside day {a.day} ({day_blocks} blocks)"
                )
            out.append((int(day_start[a.day - 1] + pos), int(size), a.day, k))
    return out


def apply_surges(
    spec: ChainSpec,
    counts: np.ndarray,
    miner_idx: np.ndarray,
    pool_index: dict[str, int],
    rng: np.random.Generator,
) -> None:
    """Overwrite per-block miners inside each surge range (in place).

    The surge starts ``blocks_before_boundary`` blocks before the end of
    ``start_day``; within its ``length`` blocks the surge miner takes
    each block independently with probability ``share``.
    """
    for surge in spec.surges:
        idx0 = int(counts[: surge.start_day].sum()) - surge.blocks_before_boundary
        if idx0 < 0 or idx0 + surge.length > len(miner_idx):
            raise ValueError(f"surge at day {surge.start_day} out of range")
        sel = np.arange(idx0, idx0 + surge.length)
        taken = rng.random(surge.length) < surge.share
        miner_idx[sel[taken]] = pool_index[surge.miner]
