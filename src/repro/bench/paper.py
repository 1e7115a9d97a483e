"""The paper's published numbers, for side-by-side reporting.

Transcribed from He et al., PVLDB 15(11), 2022.  ``None`` marks N/A in
the original (query unsupported / errored).
"""

# Table 1: filter over ~6M elements (seconds).
TABLE1 = {
    # (implementation, device, mode) -> seconds
    ("bitmap", "cpu", "torch"): 0.0366,
    ("bitmap", "cpu", "jit"): 0.0366,
    ("bitmap", "gpu", "torch"): 0.0029,
    ("bitmap", "gpu", "jit"): 0.0029,
    ("python", "cpu", "torch"): 23.0,
    ("python", "cpu", "jit"): 22.7,
    ("python", "gpu", "torch"): 200.3,
    ("python", "gpu", "jit"): 200.0,
}

# Table 2: TPC-H SF1 query times in seconds.
# columns: spark, duckdb, tqp, tqpj (CPU 1 core); blazing, omnisci, tqp_gpu,
# tqpj_gpu (GPU).
TABLE2 = {
    1: (2.261, 0.664, 7.535, 7.301, 0.216, 0.095, 0.027, 0.026),
    2: (8.751, 0.101, 0.629, 0.577, 0.238, 0.351, 0.039, 0.028),
    3: (3.669, 0.273, 1.154, 1.165, 0.128, 0.293, 0.027, 0.024),
    4: (4.719, 0.216, 1.050, 1.087, 0.093, 0.292, 0.020, 0.018),
    5: (6.963, 0.302, 2.459, 2.963, 0.164, 0.064, 0.048, 0.042),
    6: (0.381, 0.156, 0.143, 0.073, 0.045, 0.047, 0.003, 0.002),
    7: (5.569, 0.430, 2.236, 1.931, 0.244, 0.067, 0.042, 0.035),
    8: (4.034, 0.278, 2.460, 2.503, 0.215, 0.079, 0.050, 0.039),
    9: (17.61, 2.533, 4.518, 4.616, 0.569, 0.072, 0.105, 0.092),
    10: (15.98, 0.430, 1.168, 1.184, 0.173, 0.740, 0.057, 0.052),
    11: (1.047, 0.034, 0.476, 0.324, None, 0.084, 0.016, 0.009),
    12: (4.063, 0.309, 0.976, 0.966, 0.069, 0.062, 0.025, 0.021),
    13: (6.081, 0.181, 9.379, 9.197, 0.303, 0.069, 0.153, 0.136),
    14: (0.509, 0.171, 0.124, 0.096, 0.076, None, 0.007, 0.005),
    15: (2.640, 0.291, 0.133, None, None, 0.086, 0.129, None),
    16: (16.94, 0.093, 3.664, 3.699, None, 3.689, 0.320, 0.301),
    17: (3.165, 0.381, 2.303, 2.466, 0.121, 0.132, 0.061, 0.051),
    18: (6.942, 0.765, 2.245, 2.406, 0.204, 0.593, 0.053, 0.048),
    19: (2.300, 0.419, 1.577, 1.316, 0.188, 0.058, 0.042, 0.036),
    20: (4.232, 0.276, 2.032, 1.975, 0.149, None, 0.048, 0.041),
    21: (12.39, 0.932, 25.49, 24.25, None, None, 0.158, 0.151),
    22: (3.919, 0.069, 0.315, 0.296, None, None, 0.011, 0.010),
}
TABLE2_COLS = [
    "spark", "duckdb", "tqp", "tqpj",
    "blazing", "omnisci", "tqp_gpu", "tqpj_gpu",
]

# Table 3: hand-optimized plans, SF10 (seconds).
# per query: {setting: (best_baseline_name, best_baseline, torch, jit, tvm)}
TABLE3 = {
    1: {
        "cpu1": ("DuckDB", 6.54, 5.97, 6.89, None),
        "cpu6": ("DuckDB", 1.1, 4.68, 5.17, None),
        "gpu": ("OmnisciDB", 0.17, 0.13, 0.13, None),
    },
    6: {
        "cpu1": ("DuckDB", 1.5, 0.87, 1.18, 0.24),
        "cpu6": ("DuckDB", 0.25, 0.66, 0.71, 0.12),
        "gpu": ("OmnisciDB", 0.02, 0.01, 0.01, 0.06),
    },
    9: {
        "cpu1": ("DuckDB", 45.11, 19.34, 18.66, None),
        "cpu6": ("DuckDB", 7.75, 14.59, 13.83, None),
        "gpu": ("OmnisciDB", 0.14, 0.45, 0.44, None),
    },
    14: {
        "cpu1": ("DuckDB", 1.7, 0.52, 0.49, 0.47),
        "cpu6": ("DuckDB", 0.33, 0.12, 0.10, 0.16),
        "gpu": ("BlazingSQL", 0.12, 0.01, 0.01, 0.30),
    },
}

# Table 4: Q6 hand-opt portability (milliseconds, SF1).
TABLE4 = {
    "igpu-intel": 62,
    "igpu-amd": 17,
    "gpu-k80": 5,
    "gpu-v100": 1,
    "tpu": 25,
    "wasm-chrome": 1900,
}

# Table 5: lines of source code per relational operator.
TABLE5 = {
    "TQP (Various HW)": {"hash_join": 148, "sort_join": 182, "aggregation": 104},
    "Spark (CPU)": {"hash_join": 706, "sort_join": 1439, "aggregation": 637},
    "DuckDB (CPU)": {"hash_join": 1415, "sort_join": 877, "aggregation": 1466},
    "BlazingSQL (GPU)": {"hash_join": 1628, "sort_join": None, "aggregation": 1389},
    "OmnisciDB (GPU)": {"hash_join": 10141, "sort_join": None, "aggregation": 2416},
}
