"""The paper's reported numbers, transcribed from Tables 2-8.

Kept next to the harnesses so every job prints paper-vs-measured rows
and EXPERIMENTS.md can be regenerated. Speeds are MB/s on the authors'
C++/Xeon testbed and are not expected to transfer to a pure-Python
substrate; ratios are implementation-near-independent and are the shape
we reproduce.
"""

# Table 2 — datasets: (num records, avg record length)
TABLE2 = {
    "KV1": (33.1e9, 71.5), "KV2": (20.9e9, 158.6), "KV3": (2.86e6, 90.6),
    "KV4": (418e3, 44.1), "KV5": (2.68e6, 53.1), "Android": (1.55e6, 129.7),
    "Apache": (56.5e3, 63.9), "BGL": (4.75e6, 164.1), "HDFS": (11.2e6, 141.2),
    "Hadoop": (2.61e6, 266.9), "AliLogs": (350e3, 299.2), "github": (8.6e3, 863.8),
    "cities": (148e3, 232.2), "unece": (0.81e3, 4494.8), "urls": (100e3, 63.1),
    "uuid": (100e3, 35.6),
}

# Table 3 — line-by-line compression ratio per codec
TABLE3_RATIO = {
    #            FSST   LZ4    Zstd   PBC    PBC_F     (LZ4/Zstd are dict-trained)
    "KV1":     (0.393, 0.504, 0.577, 0.236, 0.147),
    "KV2":     (0.486, 0.490, 0.433, 0.284, 0.185),
    "KV3":     (0.307, 0.371, 0.423, 0.239, 0.134),
    "KV4":     (0.455, 0.594, 0.771, 0.346, 0.215),
    "KV5":     (0.545, 0.438, 0.596, 0.241, 0.211),
    "Android": (0.576, 0.560, 0.543, 0.347, 0.245),
    "Apache":  (0.322, 0.349, 0.411, 0.151, 0.104),
    "BGL":     (0.293, 0.376, 0.356, 0.325, 0.146),
    "HDFS":    (0.288, 0.374, 0.353, 0.308, 0.147),
    "Hadoop":  (0.286, 0.215, 0.196, 0.157, 0.075),
    "AliLogs": (0.484, 0.516, 0.436, 0.425, 0.347),
    "cities":  (0.316, 0.336, 0.305, 0.261, 0.189),
    "github":  (0.278, 0.151, 0.101, 0.110, 0.092),
    "unece":   (0.437, 0.210, 0.125, 0.106, 0.057),
    "urls":    (0.413, 0.456, 0.611, 0.299, 0.248),
    "uuid":    (0.443, 0.788, 0.984, 0.721, 0.421),
}
TABLE3_CODECS = ["FSST", "LZ4(dict)", "Zstd(dict)", "PBC", "PBC_F"]

# Table 4 — file compression ratio per codec
TABLE4_RATIO = {
    #            Snappy LZMA   LZ4    Zstd   PBC_Z  PBC_L
    "KV1":     (0.345, 0.138, 0.339, 0.192, 0.133, 0.109),
    "KV2":     (0.449, 0.131, 0.436, 0.209, 0.142, 0.100),
    "KV3":     (0.243, 0.109, 0.233, 0.140, 0.106, 0.080),
    "KV4":     (0.427, 0.183, 0.435, 0.255, 0.192, 0.161),
    "KV5":     (0.229, 0.078, 0.182, 0.102, 0.090, 0.066),
    "Android": (0.232, 0.053, 0.197, 0.078, 0.059, 0.038),
    "Apache":  (0.108, 0.040, 0.088, 0.053, 0.038, 0.027),
    "BGL":     (0.169, 0.057, 0.167, 0.094, 0.080, 0.041),
    "HDFS":    (0.182, 0.074, 0.176, 0.096, 0.072, 0.051),
    "Hadoop":  (0.108, 0.044, 0.086, 0.048, 0.038, 0.023),
    "AliLogs": (0.463, 0.288, 0.456, 0.312, 0.279, 0.265),
    "cities":  (0.205, 0.077, 0.172, 0.120, 0.099, 0.075),
    "github":  (0.103, 0.055, 0.117, 0.062, 0.014, 0.012),
    "unece":   (0.201, 0.069, 0.172, 0.090, 0.049, 0.042),
    "urls":    (0.361, 0.151, 0.355, 0.208, 0.158, 0.122),
    "uuid":    (0.687, 0.347, 0.687, 0.400, 0.396, 0.346),
}
TABLE4_CODECS = ["Snappy", "LZMA", "LZ4", "Zstd", "PBC_Z", "PBC_L"]

# Table 5 — log compression (averaged over log datasets)
TABLE5 = {
    "LogReducer": {"ratio": 0.219, "comp_mbs": 7.23, "decomp_mbs": 12.72},
    "PBC_L": {"ratio": 0.224, "comp_mbs": 13.8, "decomp_mbs": 169.5},
}

# Table 6 — JSON compression (averaged over JSON datasets); the record
# ratios are illegible in the source scan, speeds are legible
TABLE6 = {
    "record": {
        "Ion-B": {"comp_mbs": 37.25, "decomp_mbs": 55.07},
        "BP-D": {"comp_mbs": 10.97, "decomp_mbs": 23.73},
        "PBC": {"comp_mbs": 71.17, "decomp_mbs": 6050.0},
        "PBC_F": {"comp_mbs": 65.39, "decomp_mbs": 4166.0},
    },
    "file": {
        "Ion-B+LZMA": {"ratio": 0.051, "comp_mbs": 9.727, "decomp_mbs": 44.27},
        "BP-D+LZMA": {"comp_mbs": 4.969, "decomp_mbs": 22.53},
        "PBC_L": {"comp_mbs": 28.10, "decomp_mbs": 662.0},
    },
}

# Table 7 — per-JSON-dataset file ratio
TABLE7 = {
    "cities": {"BP-D+LZMA": 0.072, "PBC_L": 0.075},
    "github": {"BP-D+LZMA": 0.029, "PBC_L": 0.012},
    "unece": {"BP-D+LZMA": 0.023, "PBC_L": 0.042},
}

# Table 8 — TierBase case study (workloads A and B)
TABLE8 = {
    "Uncompressed": {"mem": (100, 100), "set": (125409, 123167), "get": (131285, 134807)},
    "Zstd": {"mem": (45, 37), "set": (80914, 91432), "get": (110302, 130140)},
    "PBC_F": {"mem": (25, 29), "set": (84719, 100088), "get": (129947, 130893)},
}
