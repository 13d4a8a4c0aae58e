"""Configuration selection on a predicted PPM (§4.4, §5.3, §3.3).

Given run times over candidate executor counts (from a PPM, Sparklens
estimates, or interpolated actuals), pick the operating point:

- :func:`limited_slowdown` — smallest ``n`` whose slowdown over the
  minimum time stays within a threshold ``H`` (``H = 1`` → fastest run
  with fewest executors).
- :func:`elbow_point` — the paper's normalized-slope crossover (Eq. 7–9):
  range-scale both axes to [0, 1], compute per-step slopes, and return
  the smallest ``n`` with ``slope(u(n)) ≥ 1`` and ``slope(u(n+1)) ≤ 1``.
- :func:`interpolate_times` — piecewise-linear expansion of a sparse
  ``n → t`` grid to every integer in ``[lo, hi]`` (§5.3 does this for
  Actual and Sparklens series).
- :func:`factorize_cores` — §3.3's optimization problem: split total
  cores ``k`` into (executors, cores-per-executor) minimising stranded
  cores per node under the node's core/memory capacity.
"""
from __future__ import annotations

import numpy as np


def interpolate_times(times: dict[int, float], lo: int = 1, hi: int = 48) -> dict[int, float]:
    """Piecewise-linear interpolation of a sparse n→t map onto [lo, hi]."""
    ns = sorted(times)
    ts = [times[n] for n in ns]
    grid = range(lo, hi + 1)
    vals = np.interp(list(grid), ns, ts)
    return {n: float(v) for n, v in zip(grid, vals)}


def limited_slowdown(times: dict[int, float], h: float) -> int:
    """Smallest n with ``t(n) / t_min ≤ h`` (§5.3 "Limited Slowdown")."""
    if h < 1.0:
        raise ValueError("slowdown threshold H must be ≥ 1")
    t_min = min(times.values())
    for n in sorted(times):
        if times[n] <= h * t_min:
            return n
    return max(times)  # unreachable for h ≥ 1, kept for safety


def elbow_point(times: dict[int, float]) -> int:
    """Normalized-slope elbow (Eq. 7–9).

    Returns the smallest n where the normalized curve's slope crosses
    from ≥ 1 to ≤ 1; falls back to the largest n if no crossover exists
    (monotone-flat curves) and to the smallest n for constant curves.
    """
    ns = sorted(times)
    if len(ns) < 3:
        return ns[0]
    t = np.array([times[n] for n in ns], dtype=float)
    n_arr = np.array(ns, dtype=float)
    dn = n_arr.max() - n_arr.min()
    dt = t.max() - t.min()
    if dt <= 0 or dn <= 0:
        return ns[0]
    u = (n_arr - n_arr.min()) / dn
    v = (t - t.min()) / dt
    # slope at index i refers to the segment (i-1, i], as in Eq. 9
    slopes = (v[:-1] - v[1:]) / (u[1:] - u[:-1])
    for i in range(len(slopes) - 1):
        if slopes[i] >= 1.0 and slopes[i + 1] <= 1.0:
            return ns[i + 1]
    return ns[-1] if slopes[-1] >= 1.0 else ns[1]


def factorize_cores(
    k: int,
    *,
    node_cores: int = 8,
    node_memory_gb: float = 64.0,
    executor_memory_gb: float = 28.0,
    candidate_ec: tuple[int, ...] = (1, 2, 4, 6, 8),
) -> tuple[int, int] | None:
    """Split total cores ``k`` into ``(n, e_c)`` per §3.3.

    minimise   node_cores mod e_c           (stranded cores per node)
    subject to executor_memory × ⌊node_cores / e_c⌋ ≤ node_memory
    and        e_c × ⌊node_cores / e_c⌋ divides the packing so that
               n = k / e_c is integral.

    Ties prefer smaller ``e_c`` (finer price-performance granularity).
    Returns None when no candidate satisfies the constraints.
    """
    best: tuple[int, int] | None = None
    best_key: tuple[int, int] | None = None
    for e_c in candidate_ec:
        per_node = node_cores // e_c
        if per_node == 0 or k % e_c != 0:
            continue
        if executor_memory_gb * per_node > node_memory_gb:
            continue
        stranded = node_cores % e_c
        key = (stranded, e_c)
        if best_key is None or key < best_key:
            best_key = key
            best = (k // e_c, e_c)
    return best
