"""The paper's published evaluation numbers, verbatim, for diffing.

Transcribed from ICDE'23 / arXiv:2206.14604 Tables V, VII, IX, X, XI,
XII, XIX, XX plus the headline speedup/memory ranges quoted in the text
(Sections VI-C and appendix K/L). EXPERIMENTS.md prints these next to
our measured values.
"""

# Table V (real datasets): #seq, #time series, #events, #ins/seq
TABLE_V = {
    "re": dict(n_seq=1460, n_series=21, n_events=102, ins_per_seq=93),
    "sc": dict(n_seq=1249, n_series=14, n_events=56, ins_per_seq=55),
    "inf": dict(n_seq=608, n_series=25, n_events=124, ins_per_seq=48),
    "hfm": dict(n_seq=730, n_series=24, n_events=115, ins_per_seq=40),
}

# Table VII: A-STPM accuracy (%) on real data, rows=minSeason, cols=minDensity%
TABLE_VII = {
    "re": {8: {0.5: 81, 0.75: 82, 1.0: 86}, 12: {0.5: 84, 0.75: 86, 1.0: 92},
           16: {0.5: 94, 0.75: 95, 1.0: 100}, 20: {0.5: 97, 0.75: 100, 1.0: 100}},
    "inf": {8: {0.5: 81, 0.75: 83, 1.0: 87}, 12: {0.5: 88, 0.75: 90, 1.0: 93},
            16: {0.5: 95, 0.75: 96, 1.0: 100}, 20: {0.5: 100, 0.75: 100, 1.0: 100}},
    "sc": {8: {0.5: 80, 0.75: 81, 1.0: 87}, 12: {0.5: 83, 0.75: 85, 1.0: 93},
           16: {0.5: 92, 0.75: 95, 1.0: 100}, 20: {0.5: 95, 0.75: 99, 1.0: 100}},
    "hfm": {8: {0.5: 82, 0.75: 84, 1.0: 89}, 12: {0.5: 86, 0.75: 92, 1.0: 94},
            16: {0.5: 96, 0.75: 97, 1.0: 100}, 20: {0.5: 97, 0.75: 100, 1.0: 100}},
}

# Tables IX/X/XIII/XIV: number of seasonal patterns;
# rows = maxPeriod %, cols = (minSeason, minDensity %)
TABLE_IX_RE = {
    0.2: {(8, 0.5): 35626, (8, 0.75): 20427, (8, 1.0): 11339,
          (12, 0.5): 21309, (12, 0.75): 12941, (12, 1.0): 6935,
          (16, 0.5): 8045, (16, 0.75): 4218, (16, 1.0): 3018},
    0.4: {(8, 0.5): 41462, (8, 0.75): 29729, (8, 1.0): 14281,
          (12, 0.5): 25207, (12, 0.75): 17381, (12, 1.0): 7294,
          (16, 0.5): 10261, (16, 0.75): 7480, (16, 1.0): 5483},
    0.6: {(8, 0.5): 48651, (8, 0.75): 35018, (8, 1.0): 16247,
          (12, 0.5): 31860, (12, 0.75): 24627, (12, 1.0): 9826,
          (16, 0.5): 14061, (16, 0.75): 9738, (16, 1.0): 7409},
}
TABLE_X_INF = {
    0.2: {(8, 0.5): 7812, (8, 0.75): 5704, (8, 1.0): 4285,
          (12, 0.5): 5159, (12, 0.75): 3163, (12, 1.0): 2157,
          (16, 0.5): 3521, (16, 0.75): 2105, (16, 1.0): 1284},
    0.4: {(8, 0.5): 10581, (8, 0.75): 8294, (8, 1.0): 6535,
          (12, 0.5): 7952, (12, 0.75): 5863, (12, 1.0): 4068,
          (16, 0.5): 5293, (16, 0.75): 4618, (16, 1.0): 2690},
    0.6: {(8, 0.5): 12084, (8, 0.75): 9618, (8, 1.0): 8260,
          (12, 0.5): 11850, (12, 0.75): 8591, (12, 1.0): 6028,
          (16, 0.5): 6809, (16, 0.75): 5073, (16, 1.0): 3529},
}

# Table XI: % pruned by A-STPM (synthetic), rows = #attributes
TABLE_XI = {
    "re": {
        "series": {2000: (35.20, 32.10, 26.80), 10000: (28.59, 24.87, 18.91)},
        "events": {2000: (27.22, 23.53, 19.03), 10000: (24.50, 21.07, 16.69)},
    },
    "inf": {
        "series": {2000: (42.60, 36.75, 29.70), 10000: (31.06, 26.48, 21.15)},
        "events": {2000: (28.63, 26.12, 22.10), 10000: (26.61, 24.36, 20.27)},
    },
    # columns are the (minSeason, minDensity%) combos:
    "combos": ((12, 0.5), (16, 0.75), (20, 1.0)),
}

# Table XII: A-STPM accuracy (%) on synthetic data, rows = #attributes
TABLE_XII = {
    "re": {2000: (85, 96, 100), 10000: (89, 98, 100)},
    "inf": {2000: (89, 96, 100), 10000: (93, 98, 100)},
    "combos": ((12, 0.5), (16, 0.75), (20, 1.0)),
}

# Tables XIX/XX: epsilon sensitivity — #patterns and % loss vs smallest eps
TABLE_XIX_XX = {
    "re": {1: (35626, 0.00), 2: (35407, 0.61), 3: (35192, 1.21)},
    "sc": {1: (17241, 0.00), 2: (16921, 1.85), 3: (16812, 2.48)},
    "inf": {1: (7812, 0.00), 2: (7812, 0.00), 3: (7803, 0.11)},
    "hfm": {1: (14763, 0.00), 2: (14763, 0.00), 3: (14750, 0.08)},
}

# Headline runtime/memory factors (Figs. 7-16 text):
HEADLINES = dict(
    astpm_vs_estpm_speedup=(1.5, 4.7, 2.6),     # (min, max, avg)
    astpm_vs_baseline_speedup=(5.2, 10.6, 7.1),
    estpm_vs_baseline_speedup=(3.5, 7.2, 4.3),
    astpm_vs_estpm_memory=(1.4, 2.7, 1.8),
    estpm_vs_baseline_memory=(1.5, 4.1, 2.3),
    allprune_vs_noprune_speedup=(3.0, 6.0, None),
)
