"""Synthetic English→Spanish dataset translation (Table 7).

The paper ran its English datasets through Google Translate and re-ran
DeepER with Spanish embeddings. We translate token-wise through the shared
lexicon's English→Spanish map: covered common words are translated (with the
map's deliberate many-to-one collapses providing translation lossiness),
while names/brands/acronyms/numbers keep their surface form — exactly what a
real MT system does to proper nouns.
"""
from __future__ import annotations

from repro.embeddings import lexicon as lx
from repro.er_data.datasets import ERDataset


def translate_value(value) -> str | None:
    if value is None:
        return None
    out = []
    for tok in str(value).split():
        low = tok.lower()
        out.append(lx.SPANISH.get(low, low))
    return " ".join(out)


def translate_dataset(ds: ERDataset) -> ERDataset:
    """Translate both tables; match ground truth is unchanged."""
    def conv(pdf):
        out = pdf.copy()
        for attr in ds.attributes:
            out[attr] = out[attr].map(translate_value)
        return out

    return ERDataset(
        name=f"{ds.name}_es",
        tier=ds.tier,
        attributes=list(ds.attributes),
        table_a=conv(ds.table_a),
        table_b=conv(ds.table_b),
        matches=set(ds.matches),
    )
