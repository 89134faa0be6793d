"""The paper's published numbers (Tables 4-6), transcribed verbatim.

Used by the jobs and EXPERIMENTS.md to print paper-vs-measured diffs.
``None`` encodes the paper's "n/a" (no result within 24 hours);
``"n/a*"`` in Table 6 (HoloClean OOM) is also None here.
"""
from __future__ import annotations

# Table 4: metric -> dataset -> algorithm -> value.
PAPER_TABLE4: dict[str, dict[str, dict[str, float | None]]] = {
    "EDR": {
        "hospital": {
            "BigDansing": -0.0819, "Holistic": -0.0039, "Nadeef": -1.7996,
            "Daisy": 0.0, "MLNClean": 0.4322, "Horizon": 0.0530,
            "Baran": 0.4519, "Scare": 0.0, "HoloClean": 0.4872,
            "Unified": 0.6012, "Relative": None, "BoostClean": -5.7132,
        },
        "flights": {
            "BigDansing": -0.0026, "Holistic": -0.0021, "Nadeef": 0.0001,
            "Daisy": 0.0, "MLNClean": 0.0030, "Horizon": 0.0004,
            "Baran": 0.0083, "Scare": 0.0, "HoloClean": -0.0004,
            "Unified": 0.0, "Relative": None, "BoostClean": -0.0028,
        },
        "beers": {
            "BigDansing": -0.0109, "Holistic": -0.0110, "Nadeef": -0.4783,
            "Daisy": 0.0, "MLNClean": 0.0482, "Horizon": -0.0679,
            "Baran": 0.0708, "Scare": 0.0, "HoloClean": -4.2478,
            "Unified": -0.1221, "Relative": None, "BoostClean": -0.7174,
        },
        "rayyan": {
            "BigDansing": -0.4535, "Holistic": -0.9614, "Nadeef": -2.5367,
            "Daisy": 0.0, "MLNClean": -0.6042, "Horizon": -0.3028,
            "Baran": 0.0875, "Scare": 0.0, "HoloClean": -1.2249,
            "Unified": -0.1862, "Relative": None, "BoostClean": -0.6220,
        },
    },
    "ER_F1": {
        "hospital": {
            "BigDansing": 0.6245, "Holistic": 0.6403, "Nadeef": 0.0713,
            "Daisy": 0.0, "MLNClean": 0.7240, "Horizon": 0.5661,
            "Baran": 0.6618, "Scare": 0.0469, "HoloClean": 0.6552,
            "Unified": 0.7826, "Relative": None, "BoostClean": 0.3310,
        },
        "flights": {
            "BigDansing": 0.0014, "Holistic": 0.0024, "Nadeef": 0.0007,
            "Daisy": 0.0, "MLNClean": 0.0059, "Horizon": 0.0028,
            "Baran": 0.0219, "Scare": 0.0001, "HoloClean": 0.0029,
            "Unified": 0.0, "Relative": None, "BoostClean": 0.0,
        },
        "beers": {
            "BigDansing": 0.0731, "Holistic": 0.0688, "Nadeef": 0.0094,
            "Daisy": 0.0, "MLNClean": 0.1191, "Horizon": 0.0818,
            "Baran": 0.8420, "Scare": 0.0009, "HoloClean": 0.0498,
            "Unified": 0.0106, "Relative": None, "BoostClean": 0.0,
        },
        "rayyan": {
            "BigDansing": 0.0128, "Holistic": 0.0047, "Nadeef": 0.0,
            "Daisy": 0.0, "MLNClean": 0.0, "Horizon": 0.0,
            "Baran": 0.4308, "Scare": 0.0, "HoloClean": 0.4819,
            "Unified": 0.0, "Relative": None, "BoostClean": 0.0,
        },
    },
    "ED_F1": {
        "hospital": {
            "BigDansing": 0.5903, "Holistic": 0.5834, "Nadeef": 0.0745,
            "Daisy": 0.0, "MLNClean": 0.7297, "Horizon": 0.4039,
            "Baran": 0.6316, "Scare": 0.2998, "HoloClean": 0.0753,
            "Unified": 0.5502, "Relative": None, "BoostClean": 0.3062,
        },
        "flights": {
            "BigDansing": 0.6341, "Holistic": 0.6440, "Nadeef": 0.8885,
            "Daisy": 0.0, "MLNClean": 0.0236, "Horizon": 0.9069,
            "Baran": 0.9903, "Scare": 0.0, "HoloClean": 0.9057,
            "Unified": 0.0, "Relative": None, "BoostClean": 0.0,
        },
        "beers": {
            "BigDansing": 0.0730, "Holistic": 0.0687, "Nadeef": 0.0385,
            "Daisy": 0.0, "MLNClean": 0.1191, "Horizon": 0.0330,
            "Baran": 0.9947, "Scare": 0.0, "HoloClean": 0.0665,
            "Unified": 0.0095, "Relative": None, "BoostClean": 0.0,
        },
        "rayyan": {
            "BigDansing": 0.4582, "Holistic": 0.4679, "Nadeef": 0.2502,
            "Daisy": 0.0, "MLNClean": 0.1272, "Horizon": 0.3867,
            "Baran": 0.7823, "Scare": 0.0, "HoloClean": 0.4040,
            "Unified": 0.0059, "Relative": None, "BoostClean": 0.0040,
        },
    },
}

# Table 5: dataset -> (#tuples, #attrs, error rate, error types).
PAPER_TABLE5 = {
    "hospital": (1000, 20, 0.03, ("T", "VAD")),
    "flights": (2376, 7, 0.30, ("MV", "FI", "VAD")),
    "beers": (2410, 11, 0.16, ("MV", "FI", "VAD")),
    "rayyan": (1000, 11, 0.09, ("MV", "T", "FI", "VAD")),
    "tax": (200_000, 15, 0.04, ("T", "FI", "VAD")),
}

# Table 6: size -> algorithm -> seconds (None = n/a / n/a*).
PAPER_TABLE6: dict[int, dict[str, float | None]] = {
    10_000: {
        "BigDansing": 2691, "Holistic": 45261, "Nadeef": 821,
        "Daisy": None, "MLNClean": 66, "Horizon": 1675, "Baran": 49346,
        "Scare": 41871, "HoloClean": 935, "Unified": 2040,
        "Relative": None, "BoostClean": 502,
    },
    20_000: {
        "BigDansing": None, "Holistic": None, "Nadeef": 4421,
        "Daisy": None, "MLNClean": 122, "Horizon": 5757, "Baran": None,
        "Scare": 17616, "HoloClean": None, "Unified": 7411,
        "Relative": None, "BoostClean": 1233,
    },
    30_000: {
        "BigDansing": None, "Holistic": None, "Nadeef": 7497,
        "Daisy": None, "MLNClean": 226, "Horizon": 11378, "Baran": None,
        "Scare": None, "HoloClean": None, "Unified": 11885,
        "Relative": None, "BoostClean": 1729,
    },
    40_000: {
        "BigDansing": None, "Holistic": None, "Nadeef": 15492,
        "Daisy": None, "MLNClean": 329, "Horizon": 18613, "Baran": None,
        "Scare": None, "HoloClean": None, "Unified": 17223,
        "Relative": None, "BoostClean": 2708,
    },
    50_000: {
        "BigDansing": None, "Holistic": None, "Nadeef": 19571,
        "Daisy": None, "MLNClean": 395, "Horizon": 27124, "Baran": None,
        "Scare": None, "HoloClean": None, "Unified": 23671,
        "Relative": None, "BoostClean": 3939,
    },
}
