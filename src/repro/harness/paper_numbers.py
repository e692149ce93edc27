"""The paper's published evaluation numbers (Tables 1-8), embedded so
every harness emits paper-vs-measured rows side by side.

"NA" in the paper means the algorithm could not finish within the time
limit (12 h pre-processing / 8 h detection) on that dataset; we keep the
string as-is. Values transcribed from the arXiv full version
(2110.08959) of the SIGMOD'21 paper.
"""

DATASETS = ["Deep", "Glove", "HEPMASS", "MNIST", "PAMAP2", "SIFT", "Words"]

ALGOS_ALL = ["Nested-loop", "SNIF", "DOLPHIN", "VP-tree",
             "NSW", "KGraph", "MRPG-basic", "MRPG"]
ALGOS_GRAPH = ["NSW", "KGraph", "MRPG-basic", "MRPG"]

# Table 3: pre-processing time [sec].
TABLE3 = {
    "Deep":    {"NSW": "NA", "KGraph": 20079.80, "MRPG-basic": 13417.40, "MRPG": 17230.30},
    "Glove":   {"NSW": 2333.47, "KGraph": 923.83, "MRPG-basic": 755.54, "MRPG": 791.53},
    "HEPMASS": {"NSW": "NA", "KGraph": 7935.25, "MRPG-basic": 4345.63, "MRPG": 5221.86},
    "MNIST":   {"NSW": 33368.0, "KGraph": 2972.96, "MRPG-basic": 1566.05, "MRPG": 2281.55},
    "PAMAP2":  {"NSW": 4522.14, "KGraph": 1325.40, "MRPG-basic": 729.54, "MRPG": 888.61},
    "SIFT":    {"NSW": 4910.94, "KGraph": 929.48, "MRPG-basic": 723.75, "MRPG": 817.33},
    "Words":   {"NSW": 871.27, "KGraph": 455.15, "MRPG-basic": 707.08, "MRPG": 868.62},
}

# Table 4: decomposed pre-processing time on Glove [sec].
TABLE4 = {
    "KGraph":     {"NNDescent(+)": 923.83, "Connect-SubGraphs": None,
                   "Remove-Detours": None, "Remove-Links": None},
    "MRPG-basic": {"NNDescent(+)": 464.34, "Connect-SubGraphs": 20.36,
                   "Remove-Detours": 278.21, "Remove-Links": 19.44},
    "MRPG":       {"NNDescent(+)": 474.20, "Connect-SubGraphs": 24.28,
                   "Remove-Detours": 271.41, "Remove-Links": 19.61},
}

# Table 5: running (detection) time [sec].
TABLE5 = {
    "Deep":    {"Nested-loop": "NA", "SNIF": "NA", "DOLPHIN": "NA", "VP-tree": "NA",
                "NSW": "NA", "KGraph": 8616.10, "MRPG-basic": 5474.10, "MRPG": 1966.17},
    "Glove":   {"Nested-loop": 1045.47, "SNIF": 1222.43, "DOLPHIN": 9277.89, "VP-tree": 1398.92,
                "NSW": 147.00, "KGraph": 83.82, "MRPG-basic": 56.80, "MRPG": 2.63},
    "HEPMASS": {"Nested-loop": 17295.40, "SNIF": 20360.80, "DOLPHIN": "NA", "VP-tree": 8597.23,
                "NSW": "NA", "KGraph": 780.19, "MRPG-basic": 638.83, "MRPG": 38.40},
    "MNIST":   {"Nested-loop": 15494.00, "SNIF": 22579.80, "DOLPHIN": "NA", "VP-tree": 13836.60,
                "NSW": 1630.25, "KGraph": 1702.57, "MRPG-basic": 1264.26, "MRPG": 918.91},
    "PAMAP2":  {"Nested-loop": 422.40, "SNIF": 1213.56, "DOLPHIN": 1819.90, "VP-tree": 208.55,
                "NSW": 22.16, "KGraph": 23.77, "MRPG-basic": 18.16, "MRPG": 10.55},
    "SIFT":    {"Nested-loop": 1427.74, "SNIF": 1507.58, "DOLPHIN": 8684.08, "VP-tree": 2005.27,
                "NSW": 200.89, "KGraph": 175.88, "MRPG-basic": 144.11, "MRPG": 11.32},
    "Words":   {"Nested-loop": 1844.65, "SNIF": 2086.50, "DOLPHIN": 7061.50, "VP-tree": 1021.39,
                "NSW": 498.34, "KGraph": 393.95, "MRPG-basic": 374.08, "MRPG": 2.67},
}

# Table 6: index size [MB].
TABLE6 = {
    "Deep":    {"Nested-loop": 0, "SNIF": "NA", "DOLPHIN": "NA", "VP-tree": 324.35,
                "NSW": "NA", "KGraph": 1405.94, "MRPG-basic": 5516.58, "MRPG": 7350.83},
    "Glove":   {"Nested-loop": 0, "SNIF": 13.26, "DOLPHIN": 69.14, "VP-tree": 54.86,
                "NSW": 188.62, "KGraph": 167.91, "MRPG-basic": 460.48, "MRPG": 438.76},
    "HEPMASS": {"Nested-loop": 0, "SNIF": 61.04, "DOLPHIN": "NA", "VP-tree": 265.39,
                "NSW": "NA", "KGraph": 1195.35, "MRPG-basic": 2188.65, "MRPG": 2450.84},
    "MNIST":   {"Nested-loop": 0, "SNIF": 27.75, "DOLPHIN": "NA", "VP-tree": 117.80,
                "NSW": 417.95, "KGraph": 404.29, "MRPG-basic": 589.08, "MRPG": 591.27},
    "PAMAP2":  {"Nested-loop": 0, "SNIF": 18.36, "DOLPHIN": 65.12, "VP-tree": 128.00,
                "NSW": 819.17, "KGraph": 528.26, "MRPG-basic": 553.87, "MRPG": 760.69},
    "SIFT":    {"Nested-loop": 0, "SNIF": 8.10, "DOLPHIN": 47.00, "VP-tree": 39.99,
                "NSW": 157.58, "KGraph": 140.54, "MRPG-basic": 433.48, "MRPG": 489.14},
    "Words":   {"Nested-loop": 0, "SNIF": 4.41, "DOLPHIN": 26.86, "VP-tree": 27.79,
                "NSW": 102.20, "KGraph": 93.92, "MRPG-basic": 191.73, "MRPG": 178.74},
}

# Table 7: number of false positives after the filtering phase.
TABLE7 = {
    "Deep":    {"NSW": "NA", "KGraph": 81140, "MRPG-basic": 33180, "MRPG": 20616},
    "Glove":   {"NSW": 19970, "KGraph": 3356, "MRPG-basic": 40, "MRPG": 24},
    "HEPMASS": {"NSW": "NA", "KGraph": 11133, "MRPG-basic": 2363, "MRPG": 438},
    "MNIST":   {"NSW": 7079, "KGraph": 4698, "MRPG-basic": 2509, "MRPG": 2061},
    "PAMAP2":  {"NSW": 18346, "KGraph": 22543, "MRPG-basic": 4290, "MRPG": 3986},
    "SIFT":    {"NSW": 4899, "KGraph": 2513, "MRPG-basic": 585, "MRPG": 51},
    "Words":   {"NSW": 9569, "KGraph": 989, "MRPG-basic": 120, "MRPG": 4},
}

# Table 8: decomposed detection time on Glove [sec].
TABLE8 = {
    "NSW":        {"Filtering": 1.28, "Verification": 147.00},
    "KGraph":     {"Filtering": 0.86, "Verification": 82.96},
    "MRPG-basic": {"Filtering": 2.43, "Verification": 57.03},
    "MRPG":       {"Filtering": 1.98, "Verification": 0.65},
}
