"""Specs of the 10 dataset analogues (paper Table 2, scaled).

Sizes are scaled down so the paper's no-blocking all-pairs similarity
computation fits a single-machine Spark session (largest analogue
~1.0M candidate pairs vs the paper's 640M); relative sizes, duplicate
fractions (and hence the BLC/OSD/SCR categories of Sec. 6-QE4), domains
and noise profiles follow the originals. Schema-based experiments use
the spec's ``attributes`` — the analogue of the paper's high-coverage /
high-distinctiveness attribute choice per dataset.

Noise knobs are tuned per the paper's qualitative description: D4/D9
are bibliographic with misplaced values; D5-D8 and D10 are noisy with
many missing values; D1's names/phones are relatively clean.
"""
from __future__ import annotations

from .generator import DatasetSpec

SPECS: dict[str, DatasetSpec] = {
    s.name: s
    for s in [
        DatasetSpec(
            name="D1", label="Rest1-Rest2", domain="restaurant",
            n1=120, n2=750, n_dups=30, category="SCR",
            noise=0.02, token_noise=0.04, missing=0.03,
            attributes=("name", "phone"), seed=101,
        ),
        DatasetSpec(
            name="D2", label="Abt-Buy", domain="product",
            n1=360, n2=360, n_dups=360, category="BLC",
            noise=0.05, token_noise=0.12, missing=0.10,
            attributes=("title",), seed=102,
        ),
        DatasetSpec(
            name="D3", label="Amazon-GoogleProducts", domain="product",
            n1=450, n2=1000, n_dups=370, category="OSD",
            noise=0.06, token_noise=0.15, missing=0.12,
            attributes=("title",), seed=103,
        ),
        DatasetSpec(
            name="D4", label="DBLP-ACM", domain="bib",
            n1=870, n2=760, n_dups=740, category="BLC",
            noise=0.02, token_noise=0.05, missing=0.03, misplace=0.25,
            attributes=("title", "authors"), seed=104,
        ),
        DatasetSpec(
            name="D5", label="IMDb-TMDb", domain="movie",
            n1=700, n2=820, n_dups=270, category="SCR",
            noise=0.04, token_noise=0.10, missing=0.20,
            attributes=("title", "name"), seed=105,
        ),
        DatasetSpec(
            name="D6", label="IMDb-TVDB", domain="movie",
            n1=700, n2=1050, n_dups=150, category="SCR",
            noise=0.05, token_noise=0.12, missing=0.22,
            attributes=("title",), seed=106,
        ),
        DatasetSpec(
            name="D7", label="TMDb-TVDB", domain="movie",
            n1=820, n2=1050, n_dups=150, category="SCR",
            noise=0.05, token_noise=0.12, missing=0.22,
            attributes=("name", "title"), seed=107,
        ),
        DatasetSpec(
            name="D8", label="Walmart-Amazon", domain="product",
            n1=260, n2=1800, n_dups=85, category="SCR",
            noise=0.07, token_noise=0.18, missing=0.15,
            attributes=("title",), seed=108,
        ),
        DatasetSpec(
            name="D9", label="DBLP-Scholar", domain="bib",
            n1=420, n2=2400, n_dups=385, category="OSD",
            noise=0.04, token_noise=0.10, missing=0.08, misplace=0.30,
            attributes=("title", "authors"), seed=109,
        ),
        DatasetSpec(
            name="D10", label="IMDb-DBpedia", domain="movie",
            n1=760, n2=640, n_dups=610, category="BLC",
            noise=0.06, token_noise=0.14, missing=0.30,
            attributes=("title",), seed=110,
        ),
    ]
}

DATASET_ORDER = [f"D{i}" for i in range(1, 11)]

#: Category partition used by Table 5 (paper Sec. 6, QE4).
CATEGORY_OF = {name: spec.category for name, spec in SPECS.items()}
