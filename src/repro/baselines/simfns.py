"""Symbolic string-similarity functions.

The pool a Magellan-style system draws its features from (the paper cites
SimMetrics' 29 functions; we implement the standard representatives used by
Magellan's automatic feature generation: token jaccard, 3-gram jaccard,
edit-distance similarity, exact match, relative numeric difference).
"""
from __future__ import annotations

from repro.embeddings.tokenize import tokenize

_LEV_CAP = 24  # edit distance is O(len^2); real EM systems cap long strings


def _norm(value) -> str:
    return " ".join(tokenize(value))


def jaccard_tokens(a, b) -> float:
    ta, tb = set(tokenize(a)), set(tokenize(b))
    if not ta and not tb:
        return 0.0
    return len(ta & tb) / max(1, len(ta | tb))


def _trigrams(s: str) -> set[str]:
    s = f"##{s}#"
    return {s[i:i + 3] for i in range(len(s) - 2)}


def jaccard_trigrams(a, b) -> float:
    sa, sb = _norm(a), _norm(b)
    if not sa and not sb:
        return 0.0
    ta, tb = _trigrams(sa), _trigrams(sb)
    return len(ta & tb) / max(1, len(ta | tb))


def levenshtein(a: str, b: str) -> int:
    """Plain DP edit distance (strings pre-capped by the caller)."""
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
            cur.append(min(prev[j] + 1, cur[j - 1] + 1,
                           prev[j - 1] + (ca != cb)))
        prev = cur
    return prev[-1]


def levenshtein_sim(a, b) -> float:
    sa, sb = _norm(a)[:_LEV_CAP], _norm(b)[:_LEV_CAP]
    if not sa and not sb:
        return 0.0
    m = max(len(sa), len(sb))
    return 1.0 - levenshtein(sa, sb) / m if m else 0.0


def exact_match(a, b) -> float:
    sa, sb = _norm(a), _norm(b)
    return 1.0 if sa and sa == sb else 0.0


def numeric_sim(a, b) -> float:
    """Relative closeness of the first number in each value (price etc.)."""
    def first_num(v):
        for t in tokenize(v):
            try:
                return float(t)
            except ValueError:
                continue
        return None

    na, nb = first_num(a), first_num(b)
    if na is None or nb is None:
        return 0.0
    denom = max(abs(na), abs(nb), 1e-9)
    return max(0.0, 1.0 - abs(na - nb) / denom)
