"""Synthetic data-lake substrate.

The paper evaluates on crawled Kaggle / data.gov / HuggingFace table
lakes (Table 2) that are not redistributable, so this package builds
synthetic lakes with the same *mechanics* the MODis search exploits:
joinable source tables around a labeled base table, carrying a mix of
informative, pure-noise and *poisoned* columns, plus row-groups with
corrupted labels keyed by a visible group attribute. Reduction of
poisoned groups/columns raises accuracy and lowers training cost;
augmentation of informative sources raises accuracy at a training-cost
price — the exact trade-off surface of the paper's Tables 4–6.
"""
from repro.lake.tasks import Lake, movie_lake, house_lake, avocado_lake, mental_lake

__all__ = ["Lake", "movie_lake", "house_lake", "avocado_lake", "mental_lake"]
