"""Hand-computed fixture modelled on the paper's Figure 1 running example.

Seven smartphone profiles (Dirty ER) with duplicate pairs (0,2), (1,3),
(5,6). Every block, candidate pair and weighting-scheme value below was
derived by hand (arithmetic in the comments), so tests can assert exact
numbers instead of trusting the implementation under test.

Blocks after Token Blocking (no purging/filtering effect at this size),
restricted to comparison-bearing ones (|b| >= 2):

    iphone{0,2} 5{0,2} black{0,2,5} galaxy{1,3,4} s4{1,3} lumia{5,6} 920{5,6}

So |B| = 7, block sizes sum to 16, ||B|| = 1+1+3+3+1+1+1 = 11,
CEP K = 16/2 = 8, CNP k = max(1, 16 // 7) = 2.
"""
import math

import pandas as pd

#: entity_id -> profile text (token multiset).
ENTITIES = {
    0: "iphone 5 black",
    1: "galaxy s4 white",
    2: "iphone 5 black 16gb",
    3: "galaxy s4",
    4: "galaxy note",
    5: "lumia 920 black",
    6: "lumia 920",
}

GROUND_TRUTH = [(0, 2), (1, 3), (5, 6)]

#: Comparison-bearing blocks: token -> sorted entity ids.
BLOCKS = {
    "iphone": [0, 2],
    "5": [0, 2],
    "black": [0, 2, 5],
    "galaxy": [1, 3, 4],
    "s4": [1, 3],
    "lumia": [5, 6],
    "920": [5, 6],
}

#: All distinct candidate pairs.
CANDIDATES = [(0, 2), (0, 5), (1, 3), (1, 4), (2, 5), (3, 4), (5, 6)]

N_BLOCKS = 7  # |B|
TOTAL_PAIR_CARD = 11.0  # ||B||
SUM_BLOCK_SIZES = 16
CEP_K = 8
CNP_K = 2

#: Per-entity |B_i| over comparison-bearing blocks.
N_BLOCKS_PER_ENTITY = {0: 3, 1: 2, 2: 3, 3: 2, 4: 1, 5: 3, 6: 2}

#: Per-entity LCP (distinct candidates).
LCP = {0: 2, 1: 2, 2: 2, 3: 2, 4: 2, 5: 3, 6: 1}

_l73 = math.log(7 / 3)
_l72 = math.log(7 / 2)
_l7 = math.log(7.0)
_l115 = math.log(11 / 5)
_l114 = math.log(11 / 4)
_l113 = math.log(11 / 3)
_l112 = math.log(11 / 2)

#: (id1, id2) -> dict of hand-computed scheme values.
EXPECTED_FEATURES = {
    # cb=3 over iphone(||b||=1,|b|=2), 5(1,2), black(3,3); |B_i|=|B_j|=3;
    # ||e0||=||e2||=5; sipc=7/3 each; sis=4/3 each.
    (0, 2): dict(
        cf_ibf=3 * _l73 * _l73, raccb=1 + 1 + 1 / 3, js=1.0,
        lcp_1=2, lcp_2=2, ejs=1.0 * _l115 * _l115,
        wjs=1.0, rs=0.5 + 0.5 + 1 / 3, nrs=1.0,
    ),
    # cb=1 (black); |B_0|=3,|B_5|=3; ||e5||=5;
    # wjs=(1/3)/(7/3+7/3-1/3); nrs=(1/3)/(4/3+4/3-1/3).
    (0, 5): dict(
        cf_ibf=_l73 * _l73, raccb=1 / 3, js=0.2,
        lcp_1=2, lcp_2=3, ejs=0.2 * _l115 * _l115,
        wjs=(1 / 3) / (13 / 3), rs=1 / 3, nrs=(1 / 3) / (7 / 3),
    ),
    # symmetric to (0,5): e2 has the same stats as e0.
    (2, 5): dict(
        cf_ibf=_l73 * _l73, raccb=1 / 3, js=0.2,
        lcp_1=2, lcp_2=3, ejs=0.2 * _l115 * _l115,
        wjs=(1 / 3) / (13 / 3), rs=1 / 3, nrs=(1 / 3) / (7 / 3),
    ),
    # cb=2 (galaxy ||b||=3,|b|=3; s4 1,2); |B_1|=|B_3|=2; ||e1||=||e3||=4.
    (1, 3): dict(
        cf_ibf=2 * _l72 * _l72, raccb=1 / 3 + 1, js=1.0,
        lcp_1=2, lcp_2=2, ejs=1.0 * _l114 * _l114,
        wjs=1.0, rs=1 / 3 + 0.5, nrs=1.0,
    ),
    # cb=1 (galaxy); |B_1|=2, |B_4|=1; ||e4||=3; e4 sipc=1/3, sis=1/3.
    (1, 4): dict(
        cf_ibf=_l72 * _l7, raccb=1 / 3, js=0.5,
        lcp_1=2, lcp_2=2, ejs=0.5 * _l114 * _l113,
        wjs=(1 / 3) / (4 / 3), rs=1 / 3, nrs=(1 / 3) / (5 / 6),
    ),
    # symmetric to (1,4): e3 has the same stats as e1.
    (3, 4): dict(
        cf_ibf=_l72 * _l7, raccb=1 / 3, js=0.5,
        lcp_1=2, lcp_2=2, ejs=0.5 * _l114 * _l113,
        wjs=(1 / 3) / (4 / 3), rs=1 / 3, nrs=(1 / 3) / (5 / 6),
    ),
    # cb=2 (lumia 1,2; 920 1,2); |B_5|=3, |B_6|=2; ||e5||=5, ||e6||=2;
    # e5 sipc=7/3, e6 sipc=2; e5 sis=4/3, e6 sis=1.
    (5, 6): dict(
        cf_ibf=2 * _l73 * _l72, raccb=2.0, js=2 / 3,
        lcp_1=3, lcp_2=1, ejs=(2 / 3) * _l115 * _l112,
        wjs=2 / (7 / 3), rs=1.0, nrs=0.75,
    ),
}


def entities_pdf() -> pd.DataFrame:
    return pd.DataFrame(
        {
            "entity_id": list(ENTITIES),
            "source": [1] * len(ENTITIES),
            "text": list(ENTITIES.values()),
        }
    )


def ground_truth_pdf() -> pd.DataFrame:
    return pd.DataFrame(GROUND_TRUTH, columns=["id1", "id2"])
