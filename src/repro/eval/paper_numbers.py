"""The paper's reported numbers (MUST, ICDE 2024), transcribed from the
provided full text, keyed the way our result rows are keyed. ``None``
marks cells that are garbled/missing in the source text. Used by
``jobs/render_experiments.py`` to lay paper-vs-measured side by side in
EXPERIMENTS.md.
"""

# (framework, encoder) -> (R@1, R@5, R@10, SME)
TABLE3_MITSTATES = {
    ("je", "tirg"): (0.1181, 0.3027, 0.4175, 0.1574),
    ("je", "clip"): (0.2236, 0.4979, 0.6187, 0.1382),
    ("mr", "resnet17+lstm"): (0.3998, 0.6336, 0.7106, 0.1222),
    ("mr", "resnet50+lstm"): (0.5401, 0.7104, 0.7639, 0.1012),
    ("mr", "resnet17+transformer"): (0.2435, 0.4110, 0.4931, 0.1381),
    ("mr", "resnet50+transformer"): (0.3112, 0.4475, 0.5142, 0.1404),
    ("mr", "tirg+lstm"): (0.3768, 0.6574, 0.7691, 0.1283),
    ("mr", "tirg+transformer"): (0.2830, 0.4918, 0.5834, 0.1395),
    ("mr", "clip+lstm"): (0.4911, 0.7619, 0.8436, 0.1108),
    ("mr", "clip+transformer"): (0.3707, 0.5912, 0.6751, 0.1285),
    ("must", "resnet17+lstm"): (0.5275, 0.7897, 0.8780, 0.0915),
    ("must", "resnet50+lstm"): (0.6655, 0.8558, 0.9127, 0.0738),
    ("must", "resnet17+transformer"): (0.3325, 0.4828, 0.5548, 0.1272),
    ("must", "resnet50+transformer"): (0.3743, 0.4866, 0.5367, 0.1344),
    ("must", "tirg+lstm"): (0.4202, 0.7012, 0.8137, 0.1184),
    ("must", "tirg+transformer"): (0.3131, 0.4800, 0.5543, 0.1333),
    ("must", "clip+lstm"): (0.5376, 0.7859, 0.8678, 0.1006),
    ("must", "clip+transformer"): (0.4190, 0.5262, 0.5731, 0.1229),
}

TABLE4_CELEBA = {
    ("je", "tirg"): (0.2725, 0.5258, 0.6220, 0.1896),
    ("je", "clip"): (0.3644, 0.7006, 0.7789, 0.1453),
    ("mr", "resnet17+encoding"): (None, 0.5477, 0.6233, 0.1724),
    ("mr", "resnet50+encoding"): (0.3098, 0.5029, 0.5717, 0.2047),
    ("mr", "tirg+encoding"): (0.3275, 0.5707, None, 0.1875),
    ("mr", "clip+encoding"): (0.4578, 0.7319, 0.7990, 0.1416),
    ("must", "resnet17+encoding"): (0.5701, 0.7888, 0.8446, 0.1087),
    ("must", "resnet50+encoding"): (0.5423, 0.7539, 0.8106, 0.1293),
    ("must", "tirg+encoding"): (0.4932, None, None, 0.1433),
    ("must", "clip+encoding"): (0.6388, 0.8583, 0.9024, 0.0952),
}

TABLE5_SHOPPING_TSHIRT = {
    ("je", "tirg"): (0.1320, 0.4005, 0.5162, 0.0964),
    ("mr", "resnet17+encoding"): (0.0027, 0.0190, 0.0399, 0.1379),
    ("mr", "tirg+encoding"): (0.1320, 0.4015, 0.5206, 0.0964),
    ("must", "resnet17+encoding"): (0.4208, 0.6931, 0.7973, 0.0743),
    ("must", "tirg+encoding"): (0.4669, 0.7585, 0.8507, 0.0651),
}

# (framework, encoder) -> (R@10, R@50, R@100)
TABLE6_MSCOCO = {
    ("je", "mpc"): (0.0202, 0.0865, 0.1512),
    ("mr", "mpc+gru+resnet50"): (None, 0.1827, 0.2741),
    ("mr", "resnet50+gru+resnet50"): (0.0493, 0.1633, 0.2425),
    ("must", "mpc+gru+resnet50"): (0.0825, 0.2272, 0.3363),
    ("must", "resnet50+gru+resnet50"): (0.0914, 0.2498, 0.3711),
}

# scale -> (MUST-- seconds, MUST seconds, reduction %)
TABLE7_SCALE = {
    "1M": (15.4, 2.7, 82.5),
    "2M": (32.8, 2.7, 91.8),
    "4M": (67.5, 3.4, 95.0),
    "8M": (129.9, 3.4, 97.4),
    "16M": (266.9, 4.4, 98.4),
}

# omega_0^2 -> (IP(q0,r0), IP(q1,r1)); the q0 row is garbled in the
# source text, only the monotone-increasing shape is known.
TABLE9_USER_WEIGHTS = {
    0.5: (None, 0.9999),
    0.6: (None, 0.9960),
    0.7: (None, 0.9748),
    0.8: (None, 0.9242),
    0.9: (None, 0.8525),
}

# (dataset, modality, encoder) -> (R@1, R@5, R@10) — Tabs X, XIX, XX
TABLE10_SINGLE_MODALITY = {
    ("mitstates", "target", "resnet17"): (0.0268, 0.1103, 0.1822),
    ("mitstates", "target", "resnet50"): (0.0363, 0.1393, 0.2257),
    ("mitstates", "auxiliary", "lstm"): (0.2747, 0.4343, 0.4844),
    ("mitstates", "auxiliary", "transformer"): (0.2601, 0.2641, 0.2824),
    ("celeba", "target", "resnet17"): (None, 0.4055, 0.4913),
    ("celeba", "target", "resnet50"): (0.1475, 0.3785, 0.4519),
    ("celeba", "auxiliary", "encoding"): (0.0377, 0.0936, 0.1291),
    ("shopping", "target", "resnet17"): (0.0, 0.0192, 0.0399),
    ("shopping", "auxiliary", "encoding"): (0.0964, 0.4126, 0.5362),
}

# dataset -> {eps: quality}
TABLE11_GRAPH_QUALITY = {
    "ImageText": {1: 0.0094, 2: 0.7795, 3: 0.9900},
    "AudioText": {1: 0.0088, 2: 0.7945, 3: 0.9900},
    "VideoText": {1: 0.0096, 2: 0.7842, 3: 0.9900},
}

# l -> (Recall@10(10), response ms)
TABLE12_L_SWEEP = {
    700: (0.5061, 5), 1000: (0.6373, 7), 1500: (0.7662, 11),
    2000: (0.8563, 15), 4000: (0.9733, 35),
}

# dataset -> {encoder: weights (omega_i^2)}
TABLE13_WEIGHTS = {
    "mitstates": {
        "resnet17+lstm": (0.3000, 0.7000), "resnet50+lstm": (0.0012, 1.4291),
        "resnet17+transformer": (0.1172, 0.2669), "resnet50+transformer": (0.5, 0.5),
        "tirg+lstm": (0.5, 0.5), "tirg+transformer": (0.0295, 0.0224),
        "clip+lstm": (0.5, 0.5), "clip+transformer": (0.0670, 0.0432),
    },
    "celeba": {
        "resnet17+encoding": (0.0007, 0.9526), "resnet50+encoding": (0.0848, 1.1855),
        "tirg+encoding": (0.1064, 0.6414), "clip+encoding": (0.1089, 0.8551),
    },
    "shopping-tshirt": {
        "resnet17+encoding": (0.0262, 1.2124), "tirg+encoding": (0.0092, 1.2042),
    },
    "mscoco": {
        "mpc+gru+resnet50": (0.0083, 0.0342, 0.0123),
        "resnet50+gru+resnet50": (0.0091, 0.0233, 0.0144),
    },
    "celeba+": {
        "clip+encoding+resnet17+resnet50": (0.4092, 3.1363, 0.0721, 0.0290),
    },
    "imagetext": {"resnet50+lstm": (0.1199, 0.5572)},
}

TABLE21_SHOPPING_BOTTOMS = {
    ("je", "tirg"): (0.0905, 0.2715, 0.3924),
    ("mr", "resnet17+encoding"): (0.0107, 0.0551, 0.0995),
    ("mr", "tirg+encoding"): (0.0596, None, 0.3850),
    ("must", "resnet17+encoding"): (None, None, 0.8887),
    ("must", "tirg+encoding"): (0.4784, 0.8162, 0.8999),
}
