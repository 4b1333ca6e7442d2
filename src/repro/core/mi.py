"""Mutual information machinery for A-STPM (Section V).

Implements entropy / conditional entropy / (normalized) mutual
information over *aligned* symbolic series (Defs. 5.1-5.3), the Lambert
W function (principal branch, needed by Theorem 1's lower bound — no
scipy in this environment, so Halley iteration), and the mu threshold of
Corollary 1.1.

All logarithms are base 2, matching the paper's use of ``log`` for
entropies and ``ln`` where it says so.

Known paper wrinkle (see DESIGN.md): the main-text Eq. (14) case 2
disagrees with the appendix derivation Eq. (37); we follow the appendix
(``mu >= 1 - rho*lambda2*log(rho) / (ln 2 * log lambda1)``), which is
the one actually derived from Theorem 1.
"""
from __future__ import annotations

import math
from collections import Counter
from typing import Mapping, Sequence

import numpy as np

_E_INV = 1.0 / math.e


def probabilities(symbols: Sequence[str]) -> dict[str, float]:
    """Empirical symbol distribution p(x) of a symbolic series."""
    n = len(symbols)
    if n == 0:
        raise ValueError("empty series")
    return {s: c / n for s, c in Counter(symbols).items()}


def joint_probabilities(xs: Sequence[str], ys: Sequence[str]) -> dict[tuple[str, str], float]:
    """Empirical joint distribution p(x, y) of two aligned symbolic series."""
    if len(xs) != len(ys):
        raise ValueError(f"length mismatch: {len(xs)} vs {len(ys)}")
    n = len(xs)
    if n == 0:
        raise ValueError("empty series")
    return {xy: c / n for xy, c in Counter(zip(xs, ys)).items()}


def entropy(p: Mapping[str, float]) -> float:
    """Shannon entropy H(X) in bits (Eq. 2)."""
    return -sum(v * math.log2(v) for v in p.values() if v > 0)


def conditional_entropy(
    joint: Mapping[tuple[str, str], float], py: Mapping[str, float]
) -> float:
    """H(X|Y) in bits (Eq. 3)."""
    out = 0.0
    for (_, y), pxy in joint.items():
        if pxy > 0:
            out -= pxy * math.log2(pxy / py[y])
    return out


def mutual_information(xs: Sequence[str], ys: Sequence[str]) -> float:
    """I(X;Y) in bits (Eq. 4)."""
    px, py = probabilities(xs), probabilities(ys)
    joint = joint_probabilities(xs, ys)
    out = 0.0
    for (x, y), pxy in joint.items():
        if pxy > 0:
            out += pxy * math.log2(pxy / (px[x] * py[y]))
    return max(0.0, out)


def nmi(xs: Sequence[str], ys: Sequence[str]) -> float:
    """Normalized MI, Ĩ(X;Y) = I(X;Y)/H(X) (Eq. 5). Asymmetric by design.

    A constant X has H(X)=0 and shares no information; we return 0.0
    (nothing can reduce zero uncertainty) rather than dividing by zero.
    """
    h = entropy(probabilities(xs))
    if h == 0.0:
        return 0.0
    return min(1.0, mutual_information(xs, ys) / h)


def encode_symbols(symbols: Sequence[str]) -> tuple[np.ndarray, int]:
    """Factorize a symbol sequence into integer codes (for the fast path)."""
    codes, levels = pd_factorize(symbols)
    return codes, levels


def pd_factorize(symbols: Sequence[str]) -> tuple[np.ndarray, int]:
    arr = np.asarray(symbols)
    levels, codes = np.unique(arr, return_inverse=True)
    return codes.astype(np.int64), len(levels)


def min_nmi_fast(
    cx: np.ndarray, kx: int, cy: np.ndarray, ky: int
) -> float:
    """min(NMI(X;Y), NMI(Y;X)) from pre-encoded series — vectorized.

    Numerically identical (to float tolerance) to :func:`nmi` both ways;
    used by the scalability harness where O(n_series^2) pairs make the
    Counter-based path the bottleneck.
    """
    n = len(cx)
    joint = np.bincount(cx * ky + cy, minlength=kx * ky).astype(float) / n
    pxy = joint.reshape(kx, ky)
    px = pxy.sum(axis=1)
    py = pxy.sum(axis=0)
    mask = pxy > 0
    denom = np.outer(px, py)
    mi = float((pxy[mask] * np.log2(pxy[mask] / denom[mask])).sum())
    mi = max(0.0, mi)
    hx = float(-(px[px > 0] * np.log2(px[px > 0])).sum())
    hy = float(-(py[py > 0] * np.log2(py[py > 0])).sum())
    nmi_xy = min(1.0, mi / hx) if hx > 0 else 0.0
    nmi_yx = min(1.0, mi / hy) if hy > 0 else 0.0
    return min(nmi_xy, nmi_yx)


def pair_min_nmis(symbolic: Mapping[str, Sequence[str]]) -> dict[frozenset, float]:
    """min-NMI for every unordered series pair, via the vectorized path."""
    names = sorted(symbolic)
    enc = {s: pd_factorize(symbolic[s]) for s in names}
    out: dict[frozenset, float] = {}
    for i, a in enumerate(names):
        ca, ka = enc[a]
        for b in names[i + 1 :]:
            cb, kb = enc[b]
            out[frozenset((a, b))] = min_nmi_fast(ca, ka, cb, kb)
    return out


def lambert_w(x: float, *, tol: float = 1e-12, max_iter: int = 100) -> float:
    """Principal branch W_0: solves w * e^w = x for x >= -1/e.

    Halley iteration from a standard initial guess; inputs a hair below
    -1/e (float noise from callers) are clamped to the branch point.
    """
    if x < -_E_INV:
        if x < -_E_INV - 1e-9:
            raise ValueError(f"lambert_w undefined for x={x} < -1/e")
        x = -_E_INV
    if x == -_E_INV:
        return -1.0
    w = math.log1p(x) if x > -0.25 else -1.0 + math.sqrt(2.0 * (1.0 + math.e * x))
    for _ in range(max_iter):
        ew = math.exp(w)
        f = w * ew - x
        denom = ew * (w + 1.0) - (w + 2.0) * f / (2.0 * w + 2.0) if w != -1.0 else ew
        w_new = w - f / denom
        if abs(w_new - w) <= tol * (1.0 + abs(w_new)):
            return w_new
        w = w_new
    return w


def max_season_lower_bound(
    mu: float, lambda1: float, lambda2: float, n_seq: int, min_density: int
) -> float:
    """Theorem 1: lower bound of maxSeason(X_1, Y_1) given NMI >= mu."""
    if not (0 < lambda1 <= 1 and 0 < lambda2 <= 1):
        raise ValueError("lambda1/lambda2 must be in (0, 1]")
    if lambda1 == 1.0:
        # degenerate single-symbol X: log lambda1 = 0 -> bound is the trivial max
        return lambda2 * n_seq / min_density
    arg = math.log2(lambda1) * (1.0 - mu) * math.log(2.0) / lambda2
    arg = max(arg, -_E_INV)
    return lambda2 * n_seq / min_density * math.exp(lambert_w(arg))


def mu_pair(
    lambda1: float,
    lambda2: float,
    *,
    min_season: int,
    min_density: int,
    n_seq: int,
) -> float:
    """Corollary 1.1: smallest mu making the Theorem-1 bound reach minSeason.

    ``lambda1`` = min symbol probability of X_S; ``lambda2`` = p(Y_1) for
    the event pair's Y-side event. Follows appendix Eqs. (36)/(37); the
    result may exceed 1 when the thresholds are unreachable for this pair
    (then no finite NMI qualifies, i.e. the pair is prunable).
    """
    if lambda1 >= 1.0:
        # degenerate constant X: it carries no information, so no NMI
        # evidence can certify the bound — treat the pair as unprunable
        # only at perfect NMI (Def. 5.4 requires 0 < mu)
        return 1.0
    rho = min_season * min_density / (lambda2 * n_seq)
    log_inv_l1 = math.log2(1.0 / lambda1)
    if rho <= _E_INV:
        return 1.0 - lambda2 / (math.e * math.log(2.0) * log_inv_l1)
    return 1.0 - rho * lambda2 * math.log2(rho) / (math.log(2.0) * math.log2(lambda1))


def mu_series_pair(
    px: Mapping[str, float],
    py: Mapping[str, float],
    *,
    min_season: int,
    min_density: int,
    n_seq: int,
) -> float:
    """Final mu for a series pair: the minimum over all event pairs.

    Per Section V-B, mu is computed per event pair (X_1, Y_1) and the
    chosen threshold is the minimum across pairs — for the X->Y
    direction, lambda1 = min_x p(x) is fixed, so the minimizer scans
    lambda2 = p(y) over Y's symbols. Both directions are taken (NMI is
    asymmetric) and the overall minimum returned.
    """
    out = math.inf
    for pa, pb in ((px, py), (py, px)):
        l1 = min(pa.values())
        for l2 in pb.values():
            out = min(
                out,
                mu_pair(l1, l2, min_season=min_season, min_density=min_density, n_seq=n_seq),
            )
    return out
