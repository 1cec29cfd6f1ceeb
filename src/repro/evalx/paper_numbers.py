"""The paper's reported numbers (Tables II–VI), verbatim, for diffing.

Dataset keys use our benchmark names; method keys use the proxy-registry
names plus the CEAFF variants. ``None`` marks cells the paper leaves blank
("-" in Tables IV/VI: MultiKE needs aligned relations missing on SRPRS,
GM-Align did not finish on DBP100K, GM-Align reports no MRR, and CEAFF's
collective output has no ranked lists for Hits@10/MRR).
"""
from __future__ import annotations

# Table II — benchmark statistics: (kg1_triples, kg2_triples, kg1_entities,
# kg2_entities) at the paper's full scale.
TABLE2: dict[str, tuple[int, int, int, int]] = {
    "dbp15k_zh_en": (153_929, 237_674, 66_469, 98_125),
    "dbp15k_ja_en": (164_373, 233_319, 65_744, 95_680),
    "dbp15k_fr_en": (192_191, 278_590, 66_858, 105_889),
    "dyw100k_dbp_wd": (463_294, 448_774, 100_000, 100_000),
    "dyw100k_dbp_yg": (428_952, 502_563, 100_000, 100_000),
    "srprs_en_fr": (36_508, 33_532, 15_000, 15_000),
    "srprs_en_de": (38_281, 37_069, 15_000, 15_000),
    "srprs_dbp_wd": (38_421, 40_159, 15_000, 15_000),
    "srprs_dbp_yg": (33_571, 34_660, 15_000, 15_000),
}

_CROSS = ("dbp15k_zh_en", "dbp15k_ja_en", "dbp15k_fr_en", "srprs_en_fr", "srprs_en_de")

# Table III — cross-lingual accuracy.
TABLE3: dict[str, dict[str, float]] = {
    m: dict(zip(_CROSS, v))
    for m, v in {
        "mtranse": (0.308, 0.279, 0.244, 0.251, 0.312),
        "iptranse": (0.406, 0.367, 0.333, 0.255, 0.313),
        "bootea": (0.629, 0.622, 0.653, 0.313, 0.442),
        "rsns": (0.581, 0.563, 0.607, 0.348, 0.497),
        "mugnn": (0.494, 0.501, 0.495, 0.139, 0.255),
        "naea": (0.650, 0.641, 0.673, 0.195, 0.321),
        "gcn_align": (0.413, 0.399, 0.373, 0.155, 0.253),
        "jape": (0.412, 0.363, 0.324, 0.256, 0.320),
        "rdgcn": (0.708, 0.767, 0.886, 0.514, 0.613),
        "gm_align": (0.679, 0.740, 0.894, 0.627, 0.677),
        "ceaff": (0.795, 0.860, 0.964, 0.964, 0.977),
    }.items()
}

_MONO = ("dyw100k_dbp_wd", "dyw100k_dbp_yg", "srprs_dbp_wd", "srprs_dbp_yg")

# Table IV — mono-lingual accuracy.
TABLE4: dict[str, dict[str, float | None]] = {
    m: dict(zip(_MONO, v))
    for m, v in {
        "mtranse": (0.281, 0.252, 0.223, 0.246),
        "iptranse": (0.349, 0.297, 0.231, 0.227),
        "bootea": (0.748, 0.761, 0.323, 0.313),
        "rsns": (0.656, 0.711, 0.399, 0.402),
        "mugnn": (0.616, 0.741, 0.151, 0.175),
        "naea": (0.767, 0.779, 0.215, 0.211),
        "gcn_align": (0.477, 0.601, 0.177, 0.193),
        "jape": (0.318, 0.236, 0.219, 0.233),
        "multike": (0.915, 0.880, None, None),
        "rdgcn": (0.902, 0.864, 0.834, 0.852),
        "gm_align": (None, None, 0.815, 0.828),
        "ceaff_wo_ml": (0.992, 0.955, 0.915, 0.937),
        "ceaff": (1.000, 1.000, 1.000, 1.000),
    }.items()
}

_ABL = ("srprs_en_fr", "srprs_en_de", "srprs_dbp_wd", "srprs_dbp_yg", "dbp15k_zh_en")

# Table V — ablation (datasets: EN-FR, EN-DE, DBP-WD, DBP-YG, ZH-EN).
TABLE5: dict[str, dict[str, float]] = {
    m: dict(zip(_ABL, v))
    for m, v in {
        "ceaff": (0.964, 0.977, 1.000, 1.000, 0.795),
        "wo_ms": (0.915, 0.971, 1.000, 1.000, 0.622),
        "wo_mn": (0.947, 0.972, 1.000, 1.000, 0.507),
        "wo_ml": (0.782, 0.863, 0.915, 0.937, 0.778),
        "wo_aff": (0.956, 0.968, 0.998, 0.999, 0.785),
        "wo_c": (0.930, 0.939, 1.000, 1.000, 0.719),
        "wo_c_ms": (0.873, 0.886, 1.000, 1.000, 0.586),
        "wo_c_mn": (0.904, 0.927, 0.999, 1.000, 0.408),
        "wo_c_ml": (0.628, 0.769, 0.866, 0.898, 0.711),
        "wo_c_aff": (0.914, 0.925, 0.986, 0.994, 0.701),
        "wo_theta": (0.940, 0.969, 0.994, 0.996, 0.768),
        "lr": (0.957, 0.965, 1.000, 1.000, 0.786),
    }.items()
}

_DBP15K = ("dbp15k_zh_en", "dbp15k_ja_en", "dbp15k_fr_en")

# Table VI — ranking evaluation on DBP15K: (hits1, hits10, mrr) per dataset;
# Hits reported as fractions (the paper prints percentages).
TABLE6: dict[str, dict[str, tuple[float | None, float | None, float | None]]] = {
    m: dict(zip(_DBP15K, v))
    for m, v in {
        "mtranse": ((0.308, 0.614, 0.364), (0.279, 0.575, 0.349), (0.244, 0.556, 0.335)),
        "iptranse": ((0.406, 0.735, 0.516), (0.367, 0.693, 0.474), (0.333, 0.686, 0.451)),
        "bootea": ((0.629, 0.848, 0.703), (0.622, 0.854, 0.701), (0.653, 0.874, 0.731)),
        "rsns": ((0.581, 0.812, 0.662), (0.563, 0.798, 0.647), (0.607, 0.845, 0.691)),
        "mugnn": ((0.494, 0.844, 0.611), (0.501, 0.857, 0.621), (0.495, 0.870, 0.621)),
        "naea": ((0.650, 0.867, 0.720), (0.641, 0.873, 0.718), (0.673, 0.894, 0.752)),
        "gcn_align": ((0.413, 0.744, 0.549), (0.399, 0.745, 0.546), (0.373, 0.745, 0.532)),
        "jape": ((0.412, 0.745, 0.490), (0.363, 0.685, 0.476), (0.324, 0.667, 0.430)),
        "rdgcn": ((0.708, 0.846, 0.746), (0.767, 0.895, 0.812), (0.886, 0.957, 0.911)),
        "gm_align": ((0.679, 0.785, None), (0.740, 0.872, None), (0.894, 0.952, None)),
        "ceaff_wo_c": ((0.719, 0.874, 0.774), (0.783, 0.907, 0.827), (0.928, 0.979, 0.947)),
        "ceaff": ((0.795, None, None), (0.860, None, None), (0.964, None, None)),
    }.items()
}
