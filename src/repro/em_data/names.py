"""Name pools and perturbation for the semi-synthetic social datasets.

The paper builds FACULTYMATCH from CSRankings and NOFLYCOMPAS from
COMPAS; neither dump ships with this container, so these pools encode
the two *distributional properties* the paper audits (§5.1.2):

* Chinese (pinyin-romanized) names come from a small syllable
  inventory, so distinct people often have near-identical English
  transcriptions (``Qingming Huang`` vs ``Qing-Hu Huang``) — the
  "higher intra-group name similarity" condition.
* The African-American surname pool is small and dominated by very
  common names (Brown, Jackson, Williams, …, as called out by the
  paper), while the Caucasian pool is larger — so an over-represented
  group sees many more near-collisions — the "over-representation"
  condition.

All sampling is driven by a caller-provided ``numpy`` Generator, so
datasets are deterministic in their seed.
"""
from __future__ import annotations

import numpy as np

# ------------------------------------------------------------------ pinyin
PINYIN_SURNAMES = [
    "Huang", "Wang", "Li", "Chen", "Zhang", "Liu", "Yang", "Zhao",
    "Wu", "Zhou", "Xu", "Sun", "Ma", "Zhu", "Hu", "Guo", "Lin", "He",
    "Gao", "Luo", "Zheng", "Liang", "Xie", "Tang", "Shen", "Han",
]
PINYIN_SYLLABLES = [
    "Qing", "Ming", "Lin", "Wei", "Hui", "Hu", "Jun", "Hong", "Xin",
    "Yan", "Li", "Jia", "Feng", "Hao", "Lei", "Ning", "Ping", "Rui",
    "Shan", "Tao", "Xiao", "Yu", "Zhi", "Bo", "Chao", "Dan", "Fang",
    "Guang", "Jing", "Kai",
]

# ------------------------------------------------------------------ german
GERMAN_FIRST = [
    "Friedrich", "Wolfgang", "Matthias", "Sebastian", "Johannes",
    "Alexander", "Christoph", "Benedikt", "Maximilian", "Tobias",
    "Katharina", "Franziska", "Annelies", "Margarete", "Stefanie",
    "Gertrud", "Heinrich", "Dietrich", "Siegfried", "Reinhard",
    "Gunther", "Albrecht", "Bernhard", "Eberhard", "Gottfried",
    "Hildegard", "Irmgard", "Juergen", "Karlheinz", "Lieselotte",
]
GERMAN_LAST = [
    "Schneidermann", "Hoffstetter", "Brandenburg", "Kellermann",
    "Lichtenberg", "Morgenstern", "Neuhausser", "Oberlander",
    "Pfefferkorn", "Quandtbauer", "Rosenberger", "Schwarzkopf",
    "Tannenbaum", "Untermeyer", "Vogelsang", "Wasserstein",
    "Zimmermann", "Ackermann", "Blumenthal", "Creutzfeldt",
    "Drechsler", "Eichelberger", "Falkenrath", "Grunewald",
    "Hartenstein", "Isenberg", "Jagermeister", "Kirchhoff",
    "Landsberger", "Mittelstadt", "Niederhoffer", "Ostermeier",
    "Pappenheim", "Rothschild", "Steinbrenner", "Teufelsdorf",
    "Ullsperger", "Voegelin", "Weidenfeller", "Zellweger",
]

# ---------------------------------------------------------------- US names
#: First-name pools. The Black-group pool is smaller (names more
#: concentrated), mirroring the paper's "names are more similar in some
#: groups" condition; the Caucasian pool is broader.
US_FIRST_AFR = [
    "Jamesron", "Robert", "Jonathan", "Michael", "Davonte", "William",
    "Marissa", "Patricia", "Latoya", "Keisha", "Darnell", "Tyrone",
    "Jamal", "Deshawn", "Aaliyah", "Imani", "Malik", "Samantha",
    "Jasmine", "Antoine",
]
US_FIRST_CAUC = [
    "Richard", "Thomas", "Christopher", "Daniel", "Matthew", "Anthony",
    "Martin", "Steven", "Andrew", "Joshua", "Kevin", "Brian", "Timothy",
    "Jason", "Jennifer", "Linda", "Elizabeth", "Barbara", "Susan",
    "Jessica", "Sarah", "Karen", "Pamela", "Nancy", "Sandra", "Ashley",
    "Kimberly", "Emily", "Donna", "Michelle", "Carol", "Amanda",
    "Gregory", "Patrick", "Douglas", "Raymond", "Henry", "Walter",
    "Arthur", "Gerald", "Harold", "Roger", "Eugene", "Ralph", "Louise",
    "Frances", "Catherine", "Dorothy", "Margaret", "Charlotte",
]
US_FIRST = US_FIRST_AFR + US_FIRST_CAUC
#: Small pool of very common surnames (the paper names Brown, Jackson,
#: Williams, Johnson as over-common in the Black group). Every name is
#: >= 6 characters and every pair is >= 3 edits apart, so a single
#: perturbation can never bring two *different* surnames within the
#: 1-edit distance of a true match — the residual confusion is then an
#: embedding-level phenomenon (shared first names, common-surname token
#: statistics), not an edit-distance ambiguity.
SURNAMES_COMMON = [
    "Jackson", "Williams", "Robinson", "Coleman", "Simmons", "Gardner",
    "Freeman", "Watkins", "Sanders", "Brownlee", "Johnston", "Dawson",
]
SURNAMES_VARIED = [
    "Abernathy", "Beaumont", "Callahan", "Dempsey", "Ellsworth",
    "Fitzgerald", "Galloway", "Hawthorne", "Ingersoll", "Jorgensen",
    "Kowalski", "Lindqvist", "Macallister", "Ostrowski",
    "Pemberton", "Quigley", "Rutherford", "Sinclair", "Thornberry",
    "Vandenberg", "Whitfield", "Yarborough", "Ziegler",
    "Ashworth", "Carmichael", "Donnelly", "Eastwood",
    "Gillespie", "Kingsley", "Lockhart",
    "Merriweather", "Northrup", "Oakley", "Prescott", "Radcliffe",
    "Stanfield", "Templeton", "Vanderpool", "Wexford", "Youngblood",
    "Atherton", "Bellamy", "Cromwell", "Drapert", "Everhart",
    "Ferguson", "Goldstein", "Harrington", "Iverson", "Jefferies",
    "Kensington", "Livingston", "Montgomery", "Nicholson", "Ogletree",
    "Pendleton", "Quantrell", "Rasmussen", "Silverman", "Thackeray",
    "Umberland", "Villanueva", "Winchester", "Yancey", "Zabrowski",
    "Applewhite", "Birkenstock", "Cavanaugh", "Delacroix", "Engelhardt",
    "Fairbanks", "Greenfield", "Hollister", "Ironside", "Josephson",
    "Kirkpatrick", "Lancaster", "Middleton", "Nightingale", "Oppenheim",
]


def chinese_full_name(g: np.random.Generator) -> str:
    """Pinyin-style full name: 1–2 given syllables + surname."""
    n_syl = 1 + int(g.random() < 0.7)
    given = [PINYIN_SYLLABLES[g.integers(len(PINYIN_SYLLABLES))] for _ in range(n_syl)]
    style = g.random()
    if n_syl == 2:
        if style < 0.5:
            first = given[0] + given[1].lower()
        elif style < 0.8:
            first = given[0] + "-" + given[1]
        else:
            first = given[0] + " " + given[1]
    else:
        first = given[0]
    return f"{first} {PINYIN_SURNAMES[g.integers(len(PINYIN_SURNAMES))]}"


def german_full_name(g: np.random.Generator) -> str:
    return (
        f"{GERMAN_FIRST[g.integers(len(GERMAN_FIRST))]} "
        f"{GERMAN_LAST[g.integers(len(GERMAN_LAST))]}"
    )


def us_name(g: np.random.Generator, race: str) -> tuple[str, str]:
    """(firstName, lastName). The African-American group draws from a
    small first-name pool and the small common-surname pool 90% of the
    time; the Caucasian group from broad pools (common surnames only 8%
    of the time) — the concentration behind the paper's §5.2.1 finding
    that common Black surnames drive false matches."""
    if race == "African-American":
        first = US_FIRST_AFR[g.integers(len(US_FIRST_AFR))]
        p_common = 0.9
    else:
        first = US_FIRST_CAUC[g.integers(len(US_FIRST_CAUC))]
        p_common = 0.03
    pool = SURNAMES_COMMON if g.random() < p_common else SURNAMES_VARIED
    return first, pool[g.integers(len(pool))]


_ALPHABET = "abcdefghijklmnopqrstuvwxyz"


def perturb(s: str, g: np.random.Generator) -> str:
    """Randomly add, remove, or replace one character (§5.1.2)."""
    if not s:
        return s
    op = g.integers(3)
    i = int(g.integers(len(s)))
    ch = _ALPHABET[g.integers(26)]
    if op == 0:  # add
        return s[:i] + ch + s[i:]
    if op == 1 and len(s) > 1:  # remove
        return s[:i] + s[i + 1 :]
    return s[:i] + ch + s[i + 1 :]  # replace
