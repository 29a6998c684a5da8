"""Baseline search methods evaluated against SeeSaw (paper §5.4)."""
from repro.baselines.zeroshot import ZeroShotRanker  # noqa: F401
from repro.baselines.fewshot import FewShotRanker  # noqa: F401
from repro.baselines.rocchio import RocchioRanker  # noqa: F401
from repro.baselines.ens import EnsRanker  # noqa: F401
