"""Per-dataset tuned hyperparameters (paper §IV-A grid search results).

m from {0.05, 0.2, 0.35, 0.5}; gamma from {0.8, 0.9}; eps from {0.8, 1.0};
r = 0.2 (0.05 for the largest datasets); k=1 and MinPts=2 fixed.

``bands``/``bits`` size the LSH banding for MultiEM's *per-table-pair*
merging joins (small tables → loose banding for recall).  ``bl_bands``/
``bl_bits`` size the *all-table-pairs* baseline joins, which see S·(S-1)/2
pairs at once and need sharper signatures where ambient similarity is high
(Shopee's shared product vocabulary) or the dataset is large — otherwise the
candidate volume explodes the shuffle (validated the hard way).
"""
TUNED: dict[str, dict] = {
    "geo": dict(m=0.5, gamma=0.8, eps=1.0, r=0.2,
                bands=16, bits=8, bl_bands=16, bl_bits=10),
    "music20": dict(m=0.35, gamma=0.9, eps=1.0, r=0.2,
                    bands=16, bits=8, bl_bands=16, bl_bits=12),
    "music200": dict(m=0.35, gamma=0.9, eps=1.0, r=0.2,
                     bands=32, bits=12, bl_bands=16, bl_bits=14),
    "music2000": dict(m=0.35, gamma=0.9, eps=1.0, r=0.05,
                      bands=32, bits=12, bl_bands=16, bl_bits=14),
    "person": dict(m=0.35, gamma=0.9, eps=1.0, r=0.05,
                   bands=32, bits=12, bl_bands=16, bl_bits=14),
    "shopee": dict(m=0.35, gamma=0.8, eps=0.8, r=0.2,
                   bands=32, bits=14, bl_bands=24, bl_bits=16),
}
