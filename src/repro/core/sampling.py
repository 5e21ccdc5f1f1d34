"""Input and output samples for partitioning optimizers.

The paper (Algorithm 1, Section 6.1) draws a fixed-size random input
sample from S and T and a random *output* sample with the method of
Vitorovic et al. [38]. We reproduce the output sample by band-joining
independent uniform sub-samples of S and T: every output pair (s, t)
appears in the sub-sample join with probability
``(k_S / n_S) * (k_T / n_T)``, so the sub-sample join is a uniform
sample of the output and scaling its counts by
``(n_S * n_T) / (k_S * k_T)`` gives unbiased per-region output
estimates. If the sub-sample join is huge it is thinned (with the scale
weight adjusted); if it is empty, output is negligible and optimizers
fall back to input-only load balancing — exactly the paper's regime
where output has negligible impact on join cost.
"""
from __future__ import annotations

from dataclasses import dataclass

import numpy as np

from ..dist.local_join import band_join_pairs


@dataclass
class Samples:
    """Input samples with scale weights, plus an output-pair sample."""

    s_pts: np.ndarray  # (k_s, d) input sample of S
    t_pts: np.ndarray  # (k_t, d)
    sw_s: float        # n_S / k_s : tuples represented per S sample point
    sw_t: float
    o_s: np.ndarray    # (k_o, d) S-side coordinates of sampled output pairs
    o_t: np.ndarray    # (k_o, d) T-side coordinates
    sw_o: float        # output pairs represented per sampled pair
    n_s: int
    n_t: int

    @property
    def o_total_est(self) -> float:
        return len(self.o_s) * self.sw_o


def draw_samples(
    S_pts: np.ndarray,
    T_pts: np.ndarray,
    eps: np.ndarray,
    k_input: int = 8192,
    k_output_base: int = 20000,
    max_output_pairs: int = 60000,
    seed: int = 0,
) -> Samples:
    """Draw the optimizer's input and output samples.

    ``k_input`` caps the per-relation input sample; ``k_output_base``
    caps the per-relation sub-sample joined to produce output pairs;
    ``max_output_pairs`` thins an oversized output sample.
    """
    rng = np.random.default_rng(seed)
    n_s, n_t = len(S_pts), len(T_pts)
    k_s = min(n_s, k_input)
    k_t = min(n_t, k_input)
    s_idx = rng.choice(n_s, k_s, replace=False)
    t_idx = rng.choice(n_t, k_t, replace=False)

    m_s = min(n_s, k_output_base)
    m_t = min(n_t, k_output_base)
    os_idx = rng.choice(n_s, m_s, replace=False)
    ot_idx = rng.choice(n_t, m_t, replace=False)
    ps, pt = band_join_pairs(S_pts[os_idx], T_pts[ot_idx], eps)
    sw_o = (n_s / m_s) * (n_t / m_t)
    if len(ps) > max_output_pairs:
        keep = rng.choice(len(ps), max_output_pairs, replace=False)
        sw_o *= len(ps) / max_output_pairs
        ps, pt = ps[keep], pt[keep]

    return Samples(
        s_pts=S_pts[s_idx].astype(float),
        t_pts=T_pts[t_idx].astype(float),
        sw_s=n_s / k_s,
        sw_t=n_t / k_t,
        o_s=S_pts[os_idx][ps].astype(float),
        o_t=T_pts[ot_idx][pt].astype(float),
        sw_o=sw_o,
        n_s=n_s,
        n_t=n_t,
    )
