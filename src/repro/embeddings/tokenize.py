"""Standard tokenizer used throughout DeepER (§2.3 "standard tokenizer").

Lowercases, strips punctuation to spaces, splits on whitespace. NULL /
empty attribute values tokenize to the empty list (the composition layer
maps those to the UNK vector, per the paper).
"""
from __future__ import annotations

import re

_PUNCT = re.compile(r"[^\w']+")


def tokenize(value) -> list[str]:
    if value is None:
        return []
    s = str(value).strip().lower()
    if not s or s == "nan" or s == "none":
        return []
    return [t for t in _PUNCT.sub(" ", s).split() if t]
