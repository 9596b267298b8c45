"""The paper's contribution: GPNM matching, DER detection, EH-Tree, UA-GPNM."""
from repro.core.matching import label_candidates, match_fixpoint, matches_to_dict
from repro.core.gpnm import gpnm_from_scratch

__all__ = [
    "label_candidates",
    "match_fixpoint",
    "matches_to_dict",
    "gpnm_from_scratch",
]
