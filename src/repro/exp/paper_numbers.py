"""The paper's reported numbers (Tables II–VI), for side-by-side diffing.

Transcribed from the ICDE 2025 paper; EXPERIMENTS.md and the jobs print
these next to our measured values so a reader can compare shapes.
"""

# Table II — dataset info: (#tuples, #attrs, overall error %)
PAPER_TABLE2 = {
    "hospital": (1000, 20, 4.82),
    "flights": (2376, 7, 34.51),
    "beers": (2410, 11, 12.98),
    "rayyan": (1000, 11, 29.19),
    "billionaire": (2615, 22, 9.84),
    "movies": (7390, 17, 4.97),
    "tax": (200_000, 22, 0.11),
}

# Table III — method -> dataset -> (prec, rec, f1)
PAPER_TABLE3 = {
    "dBoost": {
        "hospital": (0.887, 0.355, 0.507), "flights": (0.753, 0.582, 0.657),
        "beers": (0.535, 0.997, 0.697), "rayyan": (0.515, 0.414, 0.459),
        "billionaire": (0.795, 0.497, 0.612), "movies": (0.555, 0.412, 0.473),
    },
    "Nadeef": {
        "hospital": (0.061, 0.257, 0.059), "flights": (0.420, 0.927, 0.578),
        "beers": (0.135, 0.089, 0.107), "rayyan": (0.742, 0.556, 0.632),
        "billionaire": (0.145, 0.083, 0.106), "movies": (1.000, 0.104, 0.189),
    },
    "Katara": {
        "hospital": (0.439, 0.071, 0.122), "flights": (0.0, 0.0, 0.0),
        "beers": (0.0, 0.0, 0.0), "rayyan": (0.0, 0.0, 0.0),
        "billionaire": (0.101, 0.013, 0.022), "movies": (0.0, 0.0, 0.0),
    },
    "ActiveClean": {
        "hospital": (0.049, 0.088, 0.074), "flights": (0.350, 0.959, 0.513),
        "beers": (0.130, 0.996, 0.230), "rayyan": (0.292, 1.000, 0.452),
        "billionaire": (0.098, 0.935, 0.179), "movies": (0.109, 0.006, 0.011),
    },
    "Raha": {
        "hospital": (0.727, 0.068, 0.125), "flights": (0.719, 0.612, 0.591),
        "beers": (0.742, 0.636, 0.685), "rayyan": (0.532, 0.350, 0.422),
        "billionaire": (0.278, 0.126, 0.174), "movies": (0.376, 0.371, 0.373),
    },
    "FM_ED": {
        "hospital": (0.665, 0.638, 0.651), "flights": (0.926, 0.513, 0.660),
        "beers": (0.866, 0.076, 0.139), "rayyan": (0.793, 0.568, 0.662),
        "billionaire": (0.628, 0.727, 0.674), "movies": (0.793, 0.461, 0.583),
    },
    "ZeroED": {
        "hospital": (0.936, 0.715, 0.811), "flights": (0.935, 0.586, 0.722),
        "beers": (0.888, 0.689, 0.774), "rayyan": (0.778, 0.692, 0.732),
        "billionaire": (0.768, 0.767, 0.767), "movies": (0.724, 0.812, 0.765),
    },
}

# Table IV — ablation -> dataset -> (prec, rec, f1)
PAPER_TABLE4 = {
    "w/o. Guid.": {
        "hospital": (0.926, 0.697, 0.795), "flights": (0.905, 0.577, 0.705),
        "beers": (0.852, 0.370, 0.516), "rayyan": (0.751, 0.618, 0.678),
        "billionaire": (0.497, 0.752, 0.598), "movies": (0.662, 0.805, 0.727),
    },
    "w/o. Crit.": {
        "hospital": (0.652, 0.573, 0.609), "flights": (0.965, 0.534, 0.688),
        "beers": (0.923, 0.581, 0.714), "rayyan": (0.697, 0.611, 0.651),
        "billionaire": (0.624, 0.718, 0.667), "movies": (0.543, 0.664, 0.598),
    },
    "w/o. Corr.": {
        "hospital": (0.903, 0.692, 0.784), "flights": (0.681, 0.573, 0.623),
        "beers": (0.931, 0.395, 0.555), "rayyan": (0.696, 0.457, 0.552),
        "billionaire": (0.685, 0.702, 0.693), "movies": (0.392, 0.738, 0.511),
    },
    "w/o. Veri.": {
        "hospital": (0.932, 0.664, 0.775), "flights": (0.933, 0.571, 0.708),
        "beers": (0.890, 0.682, 0.772), "rayyan": (0.774, 0.663, 0.714),
        "billionaire": (0.768, 0.767, 0.767), "movies": (0.724, 0.812, 0.765),
    },
    "ZeroED": PAPER_TABLE3["ZeroED"],
}

# Table V — LLM -> dataset -> (prec, rec, f1)
PAPER_TABLE5 = {
    "gpt-4o-mini": {
        "hospital": (0.164, 0.691, 0.265), "flights": (0.687, 0.492, 0.574),
        "beers": (0.532, 0.617, 0.571), "rayyan": (0.447, 0.545, 0.491),
        "billionaire": (0.311, 0.501, 0.384), "movies": (0.208, 0.736, 0.325),
    },
    "llama3.1-8b": {
        "hospital": (0.678, 0.815, 0.755), "flights": (0.820, 0.594, 0.689),
        "beers": (0.629, 0.434, 0.514), "rayyan": (0.798, 0.627, 0.702),
        "billionaire": (0.819, 0.702, 0.756), "movies": (0.484, 0.782, 0.598),
    },
    "llama3.1-70b": {
        "hospital": (0.687, 0.763, 0.723), "flights": (0.886, 0.583, 0.703),
        "beers": (0.907, 0.502, 0.647), "rayyan": (0.774, 0.682, 0.724),
        "billionaire": (0.612, 0.706, 0.656), "movies": (0.686, 0.735, 0.710),
    },
    "qwen2.5-7b": {
        "hospital": (0.532, 0.776, 0.631), "flights": (0.802, 0.552, 0.654),
        "beers": (0.712, 0.543, 0.616), "rayyan": (0.779, 0.596, 0.675),
        "billionaire": (0.418, 0.318, 0.361), "movies": (0.300, 0.449, 0.360),
    },
    "qwen2.5-72b": PAPER_TABLE3["ZeroED"],
}

# Table VI — sampling method -> dataset -> (prec, rec, f1)
PAPER_TABLE6 = {
    "random": {
        "flights": (0.875, 0.599, 0.702),
        "billionaire": (0.510, 0.571, 0.539),
        "movies": (0.368, 0.741, 0.491),
    },
    "agc": {
        "flights": (0.946, 0.580, 0.719),
        "billionaire": (0.668, 0.762, 0.718),
        "movies": (0.589, 0.720, 0.632),
    },
    "kmeans": {
        "flights": (0.935, 0.586, 0.722),
        "billionaire": (0.768, 0.767, 0.767),
        "movies": (0.724, 0.812, 0.765),
    },
}
