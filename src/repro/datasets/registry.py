"""The six paper datasets (Table III) as synthetic-generator configs.

Each config reproduces the paper dataset's schema (Table VII "All
attributes"), number of sources, and the Table III entities/tuples/pairs
ratios via its tuple-size distribution.  ``paper_stats`` stores the Table III
row so jobs/EXPERIMENTS.md can print paper-vs-generated side by side.

``REPRO_SCALE`` holds the scale factor each dataset is *run* at in this
reproduction (Music-2000 and Person are scaled down to fit a 16-core
single-node Spark; see DESIGN.md §7).
"""
from repro.datasets.generator import AttrSpec, DatasetConfig

_MUSIC_ATTRS = (
    # Per-source random platform id — the uninformative attribute EER must drop.
    AttrSpec("id", "id", per_source=True, params={"prefix": "WoM", "digits": 8}),
    # Track number and length differ across platforms (different editions /
    # encodings) — uninformative noise the EER module must learn to drop.
    AttrSpec("number", "track_number", per_source=True),
    AttrSpec("title", "words", corr_level=0.6, missing_p=0.02,
             params={"n_min": 2, "n_max": 5}),
    AttrSpec("length", "length", per_source=True),
    AttrSpec("artist", "person_name", corr_level=0.4, missing_p=0.02),
    AttrSpec("album", "words", corr_level=0.5, missing_p=0.05,
             params={"n_min": 2, "n_max": 3}),
    AttrSpec("year", "year", corr_level=0.05, missing_p=0.1),
    AttrSpec("language", "language", corr_level=0.05, missing_p=0.1),
)

_MUSIC_SIZES = {1: 0.4937, 2: 0.2025, 3: 0.1924, 4: 0.0709, 5: 0.0405}


def _music(name: str, n_truth: int, paper_entities: int, paper_tuples: int,
           paper_pairs: int) -> DatasetConfig:
    return DatasetConfig(
        name=name,
        n_sources=5,
        attrs=_MUSIC_ATTRS,
        n_truth=n_truth,
        size_weights=_MUSIC_SIZES,
        seed=23,
        paper_stats={"srcs": 5, "attrs": 8, "entities": paper_entities,
                     "tuples": paper_tuples, "pairs": paper_pairs,
                     "selected_attrs": ["title", "artist", "album"]},
    )


DATASETS: dict[str, DatasetConfig] = {
    "geo": DatasetConfig(
        name="geo",
        n_sources=4,
        attrs=(
            AttrSpec("name", "geo_name", corr_level=0.35),
            # Coordinates disagree across sources by ~1 degree (uncurated
            # feeds) — informative-looking noise the EER module must drop.
            AttrSpec("longitude", "longitude", params={"jitter": 1.0}),
            AttrSpec("latitude", "latitude", params={"jitter": 1.0}),
        ),
        n_truth=840,
        size_weights={1: 0.0238, 2: 0.0976, 3: 0.0976, 4: 0.7810},
        seed=19,
        paper_stats={"srcs": 4, "attrs": 3, "entities": 3054, "tuples": 820,
                     "pairs": 4391, "selected_attrs": ["name"]},
    ),
    "music20": _music("music20", 9_875, 19_375, 5_000, 16_250),
    "music200": _music("music200", 98_750, 193_750, 50_000, 162_500),
    "music2000": _music("music2000", 987_500, 1_937_500, 500_000, 1_625_000),
    "person": DatasetConfig(
        name="person",
        n_sources=5,
        attrs=(
            AttrSpec("givenname", "first_name", corr_level=0.5),
            AttrSpec("surname", "surname", corr_level=0.5),
            AttrSpec("suburb", "place", corr_level=0.4),
            AttrSpec("postcode", "postcode", corr_level=0.2),
        ),
        n_truth=3_475_000,
        size_weights={1: 0.85612, 2: 0.00719, 3: 0.01439, 4: 0.08633, 5: 0.03597},
        seed=29,
        paper_stats={"srcs": 5, "attrs": 4, "entities": 5_000_000,
                     "tuples": 500_000, "pairs": 3_331_384,
                     "selected_attrs": ["givenname", "surname", "suburb", "postcode"]},
    ),
    "shopee": DatasetConfig(
        name="shopee",
        n_sources=20,
        attrs=(
            # One long title from a small shared product vocabulary, heavily
            # corrupted: different products collide on tokens, which keeps
            # this the hard low-F1 dataset like the paper's Shopee.
            AttrSpec("title", "words", corr_level=3.0,
                     params={"pool": "product", "n_min": 6, "n_max": 10}),
        ),
        n_truth=12_503,
        size_weights={1: 0.1283, 2: 0.6213, 3: 0.1331, 6: 0.0730, 10: 0.0443},
        seed=31,
        paper_stats={"srcs": 20, "attrs": 1, "entities": 32_563,
                     "tuples": 10_962, "pairs": 54_488,
                     "selected_attrs": ["title"]},
    ),
}

# Scale each dataset is run at in this reproduction's jobs/benchmarks.
REPRO_SCALE: dict[str, float] = {
    "geo": 1.0,
    "music20": 1.0,
    "music200": 1.0,
    "music2000": 0.1,
    "person": 0.04,
    "shopee": 1.0,
}


def get_config(name: str) -> DatasetConfig:
    """Look up a dataset config by its registry name."""
    try:
        return DATASETS[name]
    except KeyError:
        raise KeyError(f"unknown dataset {name!r}; known: {sorted(DATASETS)}") from None
