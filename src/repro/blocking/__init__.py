"""LSH-based blocking over tuple DRs (§4)."""
from repro.blocking.lsh import (
    add_lsh_codes,
    candidate_pairs,
    candidate_pairs_np,
    lsh_codes_np,
    random_hyperplanes,
)
from repro.blocking.metrics import (
    end_to_end_pr,
    pair_completeness,
    reduction_ratio,
)
from repro.blocking.multiprobe import multiprobe_topn_candidates

__all__ = [
    "random_hyperplanes",
    "lsh_codes_np",
    "candidate_pairs_np",
    "add_lsh_codes",
    "candidate_pairs",
    "pair_completeness",
    "reduction_ratio",
    "end_to_end_pr",
    "multiprobe_topn_candidates",
]
