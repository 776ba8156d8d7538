"""The paper's reported numbers, transcribed for side-by-side comparison.

Source: ConnectIt (Dhulipala, Hong, Shun; VLDB 2020), arXiv:2008.03909.
Times in seconds; throughputs in edge updates/second.
"""

# Table 1 — connectivity on the Hyperlink graphs across systems.
TABLE1 = [
    {"system": "Mosaic", "graph": "Hyperlink2014", "threads": 1000, "time_s": 708.0},
    {"system": "FlashGraph", "graph": "Hyperlink2012", "threads": 64, "time_s": 461.0},
    {"system": "GBBS", "graph": "Hyperlink2012", "threads": 144, "time_s": 25.8},
    {"system": "GBBS (NVRAM)", "graph": "Hyperlink2012", "threads": 96, "time_s": 36.2},
    {"system": "Galois (NVRAM)", "graph": "Hyperlink2012", "threads": 96, "time_s": 76.0},
    {"system": "Slota et al.", "graph": "Hyperlink2012", "threads": 8192, "time_s": 63.0},
    {"system": "Stergiou et al.", "graph": "Hyperlink2012", "threads": 24000, "time_s": 341.0},
    {"system": "Gluon", "graph": "Hyperlink2012", "threads": 69632, "time_s": 75.3},
    {"system": "Zhang et al. (FastSV)", "graph": "Hyperlink2012", "threads": 262000, "time_s": 30.0},
    {"system": "ConnectIt", "graph": "Hyperlink2014", "threads": 144, "time_s": 2.83},
    {"system": "ConnectIt", "graph": "Hyperlink2012", "threads": 144, "time_s": 8.20},
]

# Table 2 — graph inputs.
TABLE2 = {
    "RO": {"n": 23.9e6, "m": 57.7e6, "diam": 6809, "num_c": 1, "largest_c": 23.9e6, "load_s": 0.108},
    "LJ": {"n": 4.8e6, "m": 85.7e6, "diam": 16, "num_c": 1876, "largest_c": 4.8e6, "load_s": 0.101},
    "CO": {"n": 3.1e6, "m": 234.4e6, "diam": 9, "num_c": 1, "largest_c": 3.1e6, "load_s": 0.094},
    "TW": {"n": 41.7e6, "m": 2.4e9, "diam": 23, "num_c": 1, "largest_c": 41.7e6, "load_s": 0.115},
    "FR": {"n": 65.6e6, "m": 3.6e9, "diam": 32, "num_c": 1, "largest_c": 65.6e6, "load_s": 0.182},
    "CW": {"n": 978.4e6, "m": 74.7e9, "diam": 132, "num_c": 23.7e6, "largest_c": 950.5e6, "load_s": 0.534},
    "HL14": {"n": 1.7e9, "m": 124.1e9, "diam": 207, "num_c": 129e6, "largest_c": 1.57e9, "load_s": 1.02},
    "HL12": {"n": 3.6e9, "m": 225.8e9, "diam": 331, "num_c": 144e6, "largest_c": 3.35e9, "load_s": 1.64},
}

# Table 3 — static running times (seconds). Representative transcription:
# the consistently-fastest algorithm (UF-Rem-CAS) in every sampling group,
# the full No-Sampling column ordering for LJ and HL12 (variant-ranking
# shape), and the other-systems rows.
TABLE3_UF_REM_CAS = {
    #            RO        LJ        CO        TW      FR     CW    HL14  HL12
    "none": {"RO": 2.80e-2, "LJ": 1.27e-2, "CO": 1.91e-2, "TW": 0.316, "FR": 0.902, "CW": 4.04, "HL14": 6.64, "HL12": 13.9},
    "kout": {"RO": 3.43e-2, "LJ": 8.96e-3, "CO": 8.62e-3, "TW": 0.117, "FR": 0.227, "CW": 2.15, "HL14": 3.51, "HL12": 8.20},
    "bfs": {"RO": 2.66, "LJ": 1.06e-2, "CO": 9.19e-3, "TW": 9.24e-2, "FR": 0.183, "CW": 2.21, "HL14": 2.83, "HL12": 9.11},
    "ldd": {"RO": 9.86e-2, "LJ": 1.29e-2, "CO": 8.48e-3, "TW": 0.122, "FR": 0.193, "CW": 1.69, "HL14": 3.46, "HL12": 8.28},
}
TABLE3_NOSAMPLE_LJ = {
    "uf-early": 3.48e-2, "uf-hooks": 1.75e-2, "uf-rem-cas": 1.27e-2, "uf-rem-lock": 1.95e-2,
    "uf-jtb": 4.49e-2, "liu-tarjan": 5.18e-2, "sv": 4.34e-2, "labelprop": 4.66e-2,
}
TABLE3_NOSAMPLE_HL12 = {
    "uf-early": 32.9, "uf-hooks": 20.0, "uf-async": 25.5, "uf-rem-cas": 13.9, "uf-rem-lock": 19.3,
    "uf-jtb": 72.1, "liu-tarjan": 142.0, "sv": 106.0, "labelprop": 46.5,
}
TABLE3_OTHER_SYSTEMS = {
    "BFSCC": {"RO": 2.60, "LJ": 1.94e-2, "CO": 1.05e-2, "TW": 0.169, "FR": 1.34, "CW": 5.56, "HL14": 61.6, "HL12": 62.5},
    "WorkeffCC": {"RO": 0.41, "LJ": 0.247, "CO": 2.78e-2, "TW": 0.109, "FR": 2.18, "CW": 5.97, "HL14": 11.4, "HL12": 25.8},
    "MultiStep": {"RO": 29.6, "LJ": 0.247, "CO": 0.138, "FR": 1.76},
    "GAP-SV": {"RO": 0.103, "LJ": 0.134, "CO": 0.150, "TW": 5.669, "FR": 7.01},
    "GAP-Afforest": {"RO": 4.29e-2, "LJ": 5.30e-2, "CO": 7.32e-2, "TW": 0.172, "FR": 0.306},
    "PatwaryRM": {"LJ": 3.65e-2, "CO": 3.93e-2, "TW": 0.428, "FR": 1.15},
}

# Table 4 — maximum streaming throughput (edge updates/second).
TABLE4 = {
    "UF-Early": {"RO": 1.48e9, "LJ": 9.23e8, "CO": 1.38e9, "TW": 4.31e8, "FR": 1.05e9, "RM": 3.49e8, "BA": 5.16e8, "CW": 4.00e8, "HL14": 3.15e9, "HL12": 2.80e9},
    "UF-Hooks": {"RO": 3.12e9, "LJ": 4.21e9, "CO": 5.94e9, "TW": 2.79e9, "FR": 1.49e9, "RM": 7.27e8, "BA": 1.18e9, "CW": 4.69e9, "HL14": 5.17e9, "HL12": 4.48e9},
    "UF-Async": {"RO": 3.49e9, "LJ": 3.36e9, "CO": 5.29e9, "TW": 2.73e9, "FR": 1.41e9, "RM": 8.05e8, "BA": 1.13e9, "CW": 4.86e9, "HL14": 5.92e9, "HL12": 4.69e9},
    "UF-Rem-CAS": {"RO": 3.98e9, "LJ": 5.28e9, "CO": 7.16e9, "TW": 3.85e9, "FR": 2.01e9, "RM": 8.78e8, "BA": 1.46e9, "CW": 5.73e9, "HL14": 6.64e9, "HL12": 5.64e9},
    "UF-Rem-Lock": {"RO": 1.56e9, "LJ": 3.68e9, "CO": 5.95e9, "TW": 3.36e9, "FR": 1.74e9, "RM": 7.67e8, "BA": 1.42e9, "CW": 3.56e9, "HL14": 2.99e9, "HL12": 3.21e9},
    "UF-JTB": {"RO": 1.15e9, "LJ": 1.06e9, "CO": 2.68e9, "TW": 1.42e9, "FR": 7.33e8, "RM": 2.88e8, "BA": 5.27e8, "CW": 2.15e9, "HL14": 2.26e9, "HL12": 1.79e9},
    "Liu-Tarjan": {"RO": 2.87e8, "LJ": 4.31e8, "CO": 5.98e8, "TW": 3.77e8, "FR": 1.84e8, "RM": 1.11e8, "BA": 1.98e8, "CW": 3.02e8, "HL14": 2.80e8, "HL12": 2.62e8},
    "SV": {"RO": 1.79e8, "LJ": 4.56e8, "CO": 1.13e9, "TW": 2.89e8, "FR": 1.76e8, "RM": 1.06e8, "BA": 2.43e8, "CW": 3.34e8, "HL14": 2.65e8, "HL12": 2.24e8},
}

# Table 5 — STINGER vs ConnectIt on batch inserts (RMAT, empty start).
TABLE5 = [
    {"batch": 10, "stinger_s": 6.07e-2, "stinger_rate": 164, "connectit_s": 2.14e-6, "connectit_rate": 4.67e6},
    {"batch": 100, "stinger_s": 9.87e-2, "stinger_rate": 1013, "connectit_s": 1.19e-5, "connectit_rate": 8.40e6},
    {"batch": 1000, "stinger_s": 0.171, "stinger_rate": 5847, "connectit_s": 2.19e-5, "connectit_rate": 45.6e6},
    {"batch": 10_000, "stinger_s": 0.137, "stinger_rate": 72992, "connectit_s": 5.19e-5, "connectit_rate": 192e6},
    {"batch": 100_000, "stinger_s": 0.503, "stinger_rate": 198807, "connectit_s": 3.25e-4, "connectit_rate": 307e6},
    {"batch": 1_000_000, "stinger_s": 3.99, "stinger_rate": 250626, "connectit_s": 2.73e-3, "connectit_rate": 366e6},
    {"batch": 2_000_000, "stinger_s": 6.52, "stinger_rate": 306748, "connectit_s": 4.313e-3, "connectit_rate": 463e6},
]

# Table 6 — BFS / LDD sampling quality (time, coverage, inter-comp fraction).
TABLE6 = {
    "RO": {"bfs_s": 2.67, "bfs_cov": 1.00, "bfs_ic": 0.0, "ldd_s": 0.0743, "ldd_cov": 1.00, "ldd_ic": 0.0},
    "LJ": {"bfs_s": 0.0109, "bfs_cov": 0.999, "bfs_ic": 1.29e-4, "ldd_s": 0.0136, "ldd_cov": 0.999, "ldd_ic": 1.29e-4},
    "CO": {"bfs_s": 0.00909, "bfs_cov": 1.00, "bfs_ic": 0.0, "ldd_s": 0.00823, "ldd_cov": 1.00, "ldd_ic": 0.0},
    "TW": {"bfs_s": 0.0868, "bfs_cov": 1.00, "bfs_ic": 0.0, "ldd_s": 0.117, "ldd_cov": 1.00, "ldd_ic": 0.0},
    "FR": {"bfs_s": 0.330, "bfs_cov": 1.00, "bfs_ic": 0.0, "ldd_s": 0.3266, "ldd_cov": 0.290, "ldd_ic": 0.439},
    "CW": {"bfs_s": 2.04, "bfs_cov": 0.976, "bfs_ic": 1.61e-3, "ldd_s": 1.523, "ldd_cov": 0.976, "ldd_ic": 1.61e-3},
    "HL14": {"bfs_s": 2.49, "bfs_cov": 0.914, "bfs_ic": 5.60e-3, "ldd_s": 3.101, "ldd_cov": 0.914, "ldd_ic": 5.30e-3},
    "HL12": {"bfs_s": None, "bfs_cov": 0.939, "bfs_ic": 5.38e-3, "ldd_s": 7.586, "ldd_cov": 0.939, "ldd_ic": 4.83e-3},
}

# Table 7 — k-out(Hybrid) sampling quality (k = 2).
TABLE7 = {
    "RO": {"s": 0.0267, "cov": 0.944, "ic": 5.05e-3},
    "LJ": {"s": 8.82e-2, "cov": 0.999, "ic": 4.20e-6},
    "CO": {"s": 8.574e-2, "cov": 1.00, "ic": 0.0},
    "TW": {"s": 0.112, "cov": 0.999, "ic": 5.66e-5},
    "FR": {"s": 0.274, "cov": 0.527, "ic": 8.39e-6},
    "CW": {"s": 2.11, "cov": 0.948, "ic": 7.35e-3},
    "HL14": {"s": 3.31, "cov": 0.899, "ic": 3.23e-4},
    "HL12": {"s": 7.79, "cov": 0.915, "ic": 8.57e-4},
}

# Table 8 — MapEdges / GatherEdges vs the fastest ConnectIt times.
TABLE8 = {
    "RO": {"map": 5.54e-3, "gather": 1.33e-2, "cc_nosample": 2.80e-2, "cc_sample": 3.77e-2},
    "LJ": {"map": 1.31e-3, "gather": 8.59e-3, "cc_nosample": 1.27e-2, "cc_sample": 8.96e-3},
    "CO": {"map": 9.77e-4, "gather": 1.65e-2, "cc_nosample": 1.91e-2, "cc_sample": 8.56e-3},
    "TW": {"map": 2.63e-2, "gather": 0.488, "cc_nosample": 0.316, "cc_sample": 9.24e-2},
    "FR": {"map": 2.77e-2, "gather": 1.50, "cc_nosample": 0.902, "cc_sample": 0.183},
    "CW": {"map": 0.790, "gather": 2.77, "cc_nosample": 4.04, "cc_sample": 1.69},
    "HL14": {"map": 1.36, "gather": 4.14, "cc_nosample": 6.64, "cc_sample": 2.83},
    "HL12": {"map": 2.96, "gather": 10.4, "cc_nosample": 13.9, "cc_sample": 8.20},
}
