"""String / numeric similarity primitives used by labeling functions.

Everything here is plain-Python/numpy and safe to call from inside pandas
UDFs on executors (no Spark objects, no global state). Labeling functions
(`repro.labeling.functions`) and Magellan-lite features (`repro.features`)
are thin compositions of these primitives.
"""
from __future__ import annotations

import re

import numpy as np

_TOKEN_RE = re.compile(r"[a-z0-9]+")
_NUM_RE = re.compile(r"\d+(?:\.\d+)?")


def tokens(s: str | None) -> set[str]:
    """Lower-cased alphanumeric token set; empty for null/NA values."""
    if s is None or (isinstance(s, float) and np.isnan(s)):
        return set()
    return set(_TOKEN_RE.findall(str(s).lower()))


def token_list(s: str | None) -> list[str]:
    """Lower-cased alphanumeric token list (order kept, duplicates kept)."""
    if s is None or (isinstance(s, float) and np.isnan(s)):
        return []
    return _TOKEN_RE.findall(str(s).lower())


def jaccard(a: str | None, b: str | None) -> float:
    """Jaccard similarity of the token sets; 0.0 when either side is empty."""
    ta, tb = tokens(a), tokens(b)
    if not ta or not tb:
        return 0.0
    return len(ta & tb) / len(ta | tb)


def overlap_coeff(a: str | None, b: str | None) -> float:
    """Overlap coefficient |A∩B| / min(|A|,|B|) of the token sets."""
    ta, tb = tokens(a), tokens(b)
    if not ta or not tb:
        return 0.0
    return len(ta & tb) / min(len(ta), len(tb))


def overlap_size(a: str | None, b: str | None) -> int:
    """Number of shared tokens — the quantity used by the overlap blocker."""
    return len(tokens(a) & tokens(b))


def levenshtein(a: str, b: str) -> int:
    """Classic edit distance (two-row DP)."""
    if a == b:
        return 0
    if not a:
        return len(b)
    if not b:
        return len(a)
    prev = list(range(len(b) + 1))
    for i, ca in enumerate(a, 1):
        cur = [i]
        for j, cb in enumerate(b, 1):
            cur.append(min(prev[j] + 1, cur[j - 1] + 1, prev[j - 1] + (ca != cb)))
        prev = cur
    return prev[-1]


def lev_sim(a: str | None, b: str | None) -> float:
    """Normalized Levenshtein similarity 1 - d/max_len on lower-cased text.

    Returns 0.0 when either side is null so threshold LFs abstain/reject
    rather than crash on missing values.
    """
    if a is None or b is None:
        return 0.0
    a, b = str(a).lower(), str(b).lower()
    if not a and not b:
        return 1.0
    m = max(len(a), len(b))
    if m == 0:
        return 1.0
    # Cap cost on very long strings: compare first 64 chars (LF heuristic).
    return 1.0 - levenshtein(a[:64], b[:64]) / max(len(a[:64]), len(b[:64]), 1)


def extract_numbers(s: str | None) -> list[float]:
    """All decimal numbers appearing in the string (regex search)."""
    if s is None:
        return []
    return [float(x) for x in _NUM_RE.findall(str(s))]


def first_number(s: str | None) -> float | None:
    """First decimal number in the string, or None — e.g. a screen size."""
    ns = extract_numbers(s)
    return ns[0] if ns else None


def rel_num_diff(a: float | None, b: float | None) -> float | None:
    """Relative absolute difference |a-b| / max(|a|,|b|); None if missing."""
    if a is None or b is None:
        return None
    try:
        fa, fb = float(a), float(b)
    except (TypeError, ValueError):
        return None
    if np.isnan(fa) or np.isnan(fb):
        return None
    denom = max(abs(fa), abs(fb))
    if denom == 0:
        return 0.0
    return abs(fa - fb) / denom


def norm_str(s: str | None) -> str:
    """Canonical form for equality LFs: lower-cased joined token list."""
    return " ".join(token_list(s))
