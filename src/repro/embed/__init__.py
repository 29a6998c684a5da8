"""Synthetic visual-semantic embedding substrate (CLIP stand-in).

See DESIGN.md §2 for why this substitution preserves the behaviour SeeSaw's
algorithms depend on (alignment deficits, concept locality, linear
separability, multiscale dilution of small objects).
"""
from repro.embed.clipsim import EmbeddedDataset, WorldSpec, generate_world  # noqa: F401
from repro.embed.datasets import DATASET_SPECS, build_dataset  # noqa: F401
