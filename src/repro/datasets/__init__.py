"""Dataset generators: the paper's synthetic benchmark and surrogates for
its five real datasets (no network in the container — see DESIGN.md)."""
from repro.datasets.paper_synthetic import SyntheticSeries, paper_synthetic
from repro.datasets.real_surrogates import (
    RealDataset,
    all_real_datasets,
    bike_sharing,
    daily_female_births,
    elecequip,
    internet_traffic,
    min_temperature,
)

__all__ = [
    "SyntheticSeries",
    "paper_synthetic",
    "RealDataset",
    "all_real_datasets",
    "bike_sharing",
    "daily_female_births",
    "elecequip",
    "internet_traffic",
    "min_temperature",
]
