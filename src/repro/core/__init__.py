"""SeeSaw's core query-alignment algorithms (paper §4)."""
from repro.core.aligner import AlignerParams, QueryAligner  # noqa: F401
from repro.core.seesaw import SeeSawSession  # noqa: F401
