"""Synthetic schema-faithful generators for the six complementary
benchmark datasets of Table 4 (Magellan / WDC corpora stand-ins).

Each generator reproduces its dataset's *shape*: schema, type
(structured / dirty / textual), positive rate, sensitive-attribute type,
and the specific failure phenomena the paper analyzes in §5.3 —
guest editorials and extended versions (DBLP-ACM), country-genre title
near-duplicates and punctuation-heavy rap titles (iTunes-Amazon),
missing values (DBLP-Scholar, Cricket), match-heavy ground truth
(Cricket, 96.5 % positive), aggressive retitling within a brand (Shoes)
and mixed English/Dutch descriptions (Cameras).

All generators return ``(pairs_df, DatasetMeta)`` and are deterministic
in ``seed``.
"""
from __future__ import annotations

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame, SparkSession

from repro.em_data.meta import AttrSpec, DatasetMeta
from repro.em_data.pairs import pairs_from_pandas


def _choice(g: np.random.Generator, xs):
    return xs[int(g.integers(len(xs)))]


def _maybe_missing(g: np.random.Generator, v, p: float):
    return None if g.random() < p else v


# =====================================================================
# iTunes-Amazon — structured, 8 attrs, setwise genre
# =====================================================================
ITUNES_META = DatasetMeta(
    name="iTunes-Amazon",
    domain="Music",
    dtype="structured",
    attrs=(
        AttrSpec("song", "long_str"),
        AttrSpec("artist", "short_str"),
        AttrSpec("album", "long_str"),
        AttrSpec("genre", "long_str"),
        AttrSpec("price", "numeric"),
        AttrSpec("copyright", "long_str"),
        AttrSpec("time", "short_str"),
        AttrSpec("released", "short_str"),
    ),
    sens_attr="genre",
    sens_type="setwise",
)

_GENRE_CLUSTERS = {
    "country": (["Country", "Cont. Country", "Honky Tonk"],
                ["Kenny Chesney", "Luke Briar", "Tim Colton", "Dolly Mason"]),
    "rap": (["Hip-Hop/Rap", "Rap & Hip-Hop", "Rap"],
            ["MC Vortex", "Lil Quasar", "Big Moses", "DJ Canon"]),
    "pop": (["Pop"], ["Ava Sterling", "Mia Colette", "Leo Banks"]),
    "rock": (["Rock"], ["The Granite Owls", "Neon Harbor", "Static Vale"]),
    "dance": (["Dance", "Electronic"], ["Pulse Unit", "Klang Motor"]),
    "jazz": (["Jazz"], ["Ella Marlowe", "Duke Farrow"]),
}
_COUNTRY_VERBS = ["Likes", "Loves", "Wants", "Needs", "Holds", "Misses"]
_COUNTRY_PREFIX = ["", "Tequila ", "Whiskey ", "Summer ", "She ", "Mama "]
_COUNTRY_OBJ = ["Me", "You", "Us"]
_RAP_PLACES = ["Southside", "Eastgate", "Block 9", "The Yard", "Uptown"]
_POP_WORDS = ["Midnight", "Golden", "Echo", "Paradise", "Neon", "Silver",
              "Crystal", "Velvet", "Electric", "Lonely", "Wild", "Burning"]
_POP_NOUNS = ["Hearts", "Roads", "Skies", "Dreams", "Lights", "Rivers",
              "Shadows", "Fires", "Waves", "Stars"]


def _itunes_song(g: np.random.Generator, cluster: str) -> dict:
    genres, artists = _GENRE_CLUSTERS[cluster]
    if cluster == "country":
        # Tiny title space on purpose: the paper's "Tequila Loves Me" vs
        # "Likes Me" FP trap — different songs, near-identical titles.
        title = (f"{_choice(g, _COUNTRY_PREFIX)}{_choice(g, _COUNTRY_VERBS)} "
                 f"{_choice(g, _COUNTRY_OBJ)}").strip()
        gset = ["Country"] + [x for x in genres[1:] if g.random() < 0.5]
    elif cluster == "rap":
        title = (f"Straight Outta {_choice(g, _RAP_PLACES)} "
                 f"(feat. {_choice(g, _GENRE_CLUSTERS['rap'][1])}) [Explicit]")
        gset = [genres[0]] + [x for x in genres[1:] if g.random() < 0.4]
    else:
        title = f"{_choice(g, _POP_WORDS)} {_choice(g, _POP_NOUNS)}"
        gset = [x for x in genres if g.random() < 0.8] or [genres[0]]
    artist = _choice(g, artists)
    year = int(1995 + g.integers(25))
    return {
        "song": title,
        "artist": artist,
        "album": f"{_choice(g, _POP_WORDS)} {_choice(g, _POP_NOUNS)} LP",
        "genres": gset,
        "price": round(0.99 + 0.3 * int(g.integers(4)), 2),
        "copyright": f"(C) {year} {artist.split()[-1]} Records",
        "time": f"{2 + int(g.integers(4))}:{10 + int(g.integers(50))}",
        "released": f"{1 + int(g.integers(12)):02d}/{year}",
    }


def _itunes_variant(g: np.random.Generator, s: dict) -> dict:
    v = dict(s)
    if g.random() < 0.5:
        v["song"] = v["song"].replace("feat.", "ft.").lower()
    if g.random() < 0.4:
        a = v["artist"].split()
        v["artist"] = f"{a[0][0]}. {' '.join(a[1:])}"
    if g.random() < 0.4:
        v["album"] = v["album"] + " (Deluxe Edition)"
    if g.random() < 0.3:
        v["price"] = round(v["price"] + 0.3, 2)
    v["genres"] = list(v["genres"])
    g.shuffle(v["genres"])
    return v


def _itunes_row(left: dict, right: dict, label: int) -> dict:
    row = {}
    for side, s in (("l", left), ("r", right)):
        for k in ("song", "artist", "album", "price", "copyright", "time",
                  "released"):
            row[f"{side}_{k}"] = s[k]
        row[f"{side}_genre"] = ", ".join(s["genres"])
        row[f"{side}_groups"] = sorted(s["genres"])
    row["label"] = label
    return row


def itunes_amazon(
    spark: SparkSession, *, n_pairs: int = 430, seed: int = 21,
    test_frac: float = 0.25,
) -> tuple[DataFrame, DatasetMeta]:
    g = np.random.default_rng(seed)
    clusters = list(_GENRE_CLUSTERS)
    weights = np.array([0.3, 0.2, 0.15, 0.15, 0.1, 0.1])
    n_pos = round(0.247 * n_pairs)
    rows = []
    for _ in range(n_pos):
        s = _itunes_song(g, clusters[int(g.choice(len(clusters), p=weights))])
        rows.append(_itunes_row(s, _itunes_variant(g, s), 1))
    for _ in range(n_pairs - n_pos):
        c1 = clusters[int(g.choice(len(clusters), p=weights))]
        c2 = c1 if g.random() < 0.7 else _choice(g, clusters)
        a, b = _itunes_song(g, c1), _itunes_song(g, c2)
        rows.append(_itunes_row(a, _itunes_variant(g, b), 0))
    pdf = pd.DataFrame(rows)
    return pairs_from_pandas(spark, pdf, test_frac=test_frac, seed=seed), ITUNES_META


# =====================================================================
# DBLP-ACM — structured, 4 attrs, multi-valued venue
# =====================================================================
DBLP_ACM_META = DatasetMeta(
    name="DBLP-ACM",
    domain="Publications",
    dtype="structured",
    attrs=(
        AttrSpec("title", "long_str"),
        AttrSpec("authors", "long_str"),
        AttrSpec("venue", "short_str"),
        AttrSpec("year", "numeric"),
    ),
    sens_attr="venue",
    sens_type="multi",
)

_VENUES = ["SIGMOD", "VLDB", "SIGMOD Rec.", "VLDBJ", "ACM TODS", "TKDE"]
_VENUE_W = np.array([0.25, 0.25, 0.13, 0.14, 0.12, 0.11])
_CS_ADJ = ["efficient", "scalable", "adaptive", "incremental", "distributed",
           "approximate", "robust", "parallel", "secure", "interactive",
           "effective", "optimal"]
_CS_NOUN = ["query processing", "entity matching", "data integration",
            "join algorithms", "schema mapping", "stream processing",
            "index structures", "view maintenance", "data cleaning",
            "transaction management", "lineage tracing", "graph mining"]
_CS_TAIL = ["in relational databases", "for data warehouses", "over streams",
            "at scale", "with provenance", "under uncertainty",
            "in the cloud", "on modern hardware"]
_AUTHOR_FIRST = ["jennifer", "michael", "david", "susan", "rakesh", "hector",
                 "laura", "divesh", "joseph", "christos", "anhai", "magda",
                 "carlo", "vassilis", "yingwei", "kristian", "shu-yao"]
_AUTHOR_LAST = ["widom", "stonebraker", "dewitt", "davidson", "agrawal",
                "garcia-molina", "haas", "srivastava", "hellerstein",
                "faloutsos", "doan", "balazinska", "zaniolo", "tsotras",
                "cui", "torp", "chien"]


def _acm_paper(g: np.random.Generator) -> dict:
    title = (f"{_choice(g, _CS_ADJ)} {_choice(g, _CS_NOUN)} "
             f"{_choice(g, _CS_TAIL)}")
    n_auth = 1 + int(g.integers(3))
    authors = ", ".join(
        f"{_choice(g, _AUTHOR_FIRST)} {_choice(g, _AUTHOR_LAST)}"
        for _ in range(n_auth)
    )
    return {
        "title": title,
        "authors": authors,
        "venue": _VENUES[int(g.choice(len(_VENUES), p=_VENUE_W))],
        "year": int(1995 + g.integers(12)),
    }


def _acm_variant(g: np.random.Generator, p: dict) -> dict:
    v = dict(p)
    if g.random() < 0.5:  # abbreviate author first names
        v["authors"] = ", ".join(
            f"{a.strip().split()[0][0]}. {' '.join(a.strip().split()[1:])}"
            for a in v["authors"].split(",")
        )
    if g.random() < 0.4:  # reorder authors
        auths = [a.strip() for a in v["authors"].split(",")]
        g.shuffle(auths)
        v["authors"] = " , ".join(auths)
    if g.random() < 0.3:
        v["title"] = v["title"].replace(" for ", " in ")
    return v


def _acm_row(left: dict, right: dict, label: int) -> dict:
    row = {}
    for side, s in (("l", left), ("r", right)):
        for k in ("title", "authors", "venue", "year"):
            row[f"{side}_{k}"] = s[k]
        row[f"{side}_groups"] = [s["venue"]]
    row["label"] = label
    return row


def dblp_acm(
    spark: SparkSession, *, n_pairs: int = 2670, seed: int = 23,
    test_frac: float = 0.25,
) -> tuple[DataFrame, DatasetMeta]:
    g = np.random.default_rng(seed)
    n_pos = round(0.179 * n_pairs)
    rows = []
    for _ in range(n_pos):
        p = _acm_paper(g)
        rows.append(_acm_row(p, _acm_variant(g, p), 1))
    n_neg = n_pairs - n_pos
    for i in range(n_neg):
        r = g.random()
        if r < 0.12:
            # Guest-editorial trap (§5.3.3): same title, different
            # authors/years, in SIGMOD Rec. or VLDBJ — a non-match that
            # title-weighted models call a match.
            venue = "SIGMOD Rec." if g.random() < 0.5 else "VLDBJ"
            title = _choice(g, ["guest editorial", "editors notes",
                                "letter from the editor"])
            a, b = _acm_paper(g), _acm_paper(g)
            a.update(title=title, venue=venue)
            b.update(title=title, venue=venue, year=a["year"] + 1)
            rows.append(_acm_row(a, b, 0))
        elif r < 0.22:
            # Extended-version trap: same authors, near-identical title,
            # VLDB -> VLDBJ one year later — still a non-match.
            a = _acm_paper(g)
            a["venue"] = "VLDB"
            b = dict(a)
            b.update(
                title=a["title"] + " extended",
                venue="VLDBJ",
                year=a["year"] + 1,
            )
            rows.append(_acm_row(a, _acm_variant(g, b), 0))
        else:
            a, b = _acm_paper(g), _acm_paper(g)
            if g.random() < 0.5:
                b["venue"] = a["venue"]
            rows.append(_acm_row(a, _acm_variant(g, b), 0))
    pdf = pd.DataFrame(rows)
    return pairs_from_pandas(spark, pdf, test_frac=test_frac, seed=seed), DBLP_ACM_META


# =====================================================================
# DBLP-Scholar — dirty, 10 attrs, multi-valued entry type
# =====================================================================
DBLP_SCHOLAR_META = DatasetMeta(
    name="DBLP-Scholar",
    domain="Publications",
    dtype="dirty",
    attrs=(
        AttrSpec("title", "long_str"),
        AttrSpec("authors", "long_str"),
        AttrSpec("venue", "short_str"),
        AttrSpec("year", "numeric"),
        AttrSpec("pages", "short_str"),
        AttrSpec("publisher", "short_str"),
        AttrSpec("volume", "numeric"),
        AttrSpec("number", "numeric"),
        AttrSpec("ee", "short_str"),
        AttrSpec("entry_type", "short_str"),
    ),
    sens_attr="entry_type",
    sens_type="multi",
)

_ENTRY_TYPES = ["article", "inproceedings", "book", "incollection"]


def _scholar_paper(g: np.random.Generator) -> dict:
    base = _acm_paper(g)
    start = int(g.integers(1, 400))
    return {
        **base,
        "pages": f"{start}-{start + int(g.integers(5, 30))}",
        "publisher": _choice(g, ["ACM", "IEEE", "Springer", "Elsevier"]),
        "volume": int(g.integers(1, 40)),
        "number": int(g.integers(1, 12)),
        "ee": f"http://doi.org/10.{int(g.integers(1000, 9999))}",
        "entry_type": _ENTRY_TYPES[int(g.choice(4, p=[0.4, 0.4, 0.1, 0.1]))],
    }


def _dirty(g: np.random.Generator, rec: dict, p_missing: float,
           keep: tuple[str, ...] = ("title", "entry_type")) -> dict:
    return {
        k: (v if k in keep else _maybe_missing(g, v, p_missing))
        for k, v in rec.items()
    }


def _scholar_row(left: dict, right: dict, label: int) -> dict:
    keys = ("title", "authors", "venue", "year", "pages", "publisher",
            "volume", "number", "ee", "entry_type")
    row = {}
    for side, s in (("l", left), ("r", right)):
        for k in keys:
            row[f"{side}_{k}"] = s[k]
        row[f"{side}_groups"] = [s["entry_type"] or "unknown"]
    row["label"] = label
    return row


def dblp_scholar(
    spark: SparkSession, *, n_pairs: int = 325, seed: int = 29,
    test_frac: float = 0.31,
) -> tuple[DataFrame, DatasetMeta]:
    g = np.random.default_rng(seed)
    n_pos = round(0.19 * n_pairs)
    rows = []
    for _ in range(n_pos):
        p = _scholar_paper(g)
        v = _acm_variant(g, p)
        rows.append(_scholar_row(_dirty(g, p, 0.25), _dirty(g, v, 0.35), 1))
    for _ in range(n_pairs - n_pos):
        a, b = _scholar_paper(g), _scholar_paper(g)
        if g.random() < 0.4:
            b["entry_type"] = a["entry_type"]
        rows.append(_scholar_row(_dirty(g, a, 0.25), _dirty(g, b, 0.35), 0))
    pdf = pd.DataFrame(rows)
    return (
        pairs_from_pandas(spark, pdf, test_frac=test_frac, seed=seed),
        DBLP_SCHOLAR_META,
    )


# =====================================================================
# Cricket — dirty, 20 attrs, binary batting style, 96.5% positive
# =====================================================================
_CRICKET_NUMERIC = ["matches", "innings", "runs", "high_score", "average",
                    "strike_rate", "hundreds", "fifties", "fours", "sixes",
                    "catches", "stumpings", "wickets", "economy",
                    "debut_year"]
CRICKET_META = DatasetMeta(
    name="Cricket",
    domain="Sports",
    dtype="dirty",
    attrs=(
        AttrSpec("name", "short_str"),
        AttrSpec("country", "short_str"),
        AttrSpec("batting_style", "short_str"),
        AttrSpec("bowling_style", "short_str"),
        AttrSpec("role", "short_str"),
        *[AttrSpec(a, "numeric") for a in _CRICKET_NUMERIC],
    ),
    sens_attr="batting_style",
    sens_type="binary",
    threshold=0.9,  # §5.1.4: all pairs are highly similar
)

_CRICKET_FIRST = ["Arjun", "Rohit", "Steve", "Kane", "Babar", "Joe", "Ben",
                  "Shakib", "Rashid", "Trent", "Pat", "Marnus", "Quinton",
                  "Faf", "Jos", "Dawid", "Tamim", "Angelo", "Dimuth"]
_CRICKET_LAST = ["Sharma", "Patel", "Smith", "Williamson", "Azam", "Root",
                 "Stokes", "Hasan", "Khan", "Boult", "Cummins",
                 "Labuschagne", "Kock", "Plessis", "Buttler", "Malan",
                 "Iqbal", "Mathews", "Karunaratne"]


def _cricket_player(g: np.random.Generator, i: int) -> dict:
    left_handed = g.random() < 0.3
    return {
        "name": f"{_choice(g, _CRICKET_FIRST)} {_choice(g, _CRICKET_LAST)} {i}",
        "country": _choice(g, ["India", "Australia", "England", "Pakistan",
                               "New Zealand", "South Africa", "Sri Lanka"]),
        "batting_style": "Left Handed" if left_handed else "Right Handed",
        "bowling_style": _choice(g, ["Right-arm fast", "Right-arm off break",
                                     "Left-arm orthodox", "Leg break"]),
        "role": _choice(g, ["Batsman", "Bowler", "All-rounder",
                            "Wicketkeeper"]),
        "matches": int(g.integers(10, 200)),
        "innings": int(g.integers(10, 300)),
        "runs": int(g.integers(100, 12000)),
        "high_score": int(g.integers(30, 260)),
        "average": round(float(g.random() * 40 + 15), 2),
        "strike_rate": round(float(g.random() * 80 + 60), 2),
        "hundreds": int(g.integers(0, 30)),
        "fifties": int(g.integers(0, 60)),
        "fours": int(g.integers(10, 1200)),
        "sixes": int(g.integers(0, 300)),
        "catches": int(g.integers(0, 150)),
        "stumpings": int(g.integers(0, 40)),
        "wickets": int(g.integers(0, 300)),
        "economy": round(float(g.random() * 4 + 3), 2),
        "debut_year": int(1990 + g.integers(30)),
    }


def _cricket_profile(g: np.random.Generator, p: dict) -> dict:
    """A second (scraped-elsewhere) profile of the same player. Left-handed
    players' profiles are dirtier (more missing values, bigger stat
    drift) — the coverage gap behind the paper's NPVP finding."""
    hard = p["batting_style"] == "Left Handed"
    drift = 0.35 if hard else 0.08
    p_missing = 0.45 if hard else 0.12
    v = dict(p)
    for k in _CRICKET_NUMERIC:
        if isinstance(v[k], int):
            v[k] = max(0, int(round(v[k] * (1 + (g.random() - 0.5) * 2 * drift))))
        else:
            v[k] = round(v[k] * (1 + (g.random() - 0.5) * 2 * drift), 2)
    if hard and g.random() < 0.5:
        parts = v["name"].split()
        v["name"] = f"{parts[0][0]}. {' '.join(parts[1:])}"
    return _dirty(g, v, p_missing, keep=("name", "batting_style"))


def _cricket_row(left: dict, right: dict, label: int) -> dict:
    keys = [a.name for a in CRICKET_META.attrs]
    row = {}
    for side, s in (("l", left), ("r", right)):
        for k in keys:
            row[f"{side}_{k}"] = s[k]
        row[f"{side}_groups"] = [s["batting_style"]]
    row["label"] = label
    return row


def cricket(
    spark: SparkSession, *, n_pairs: int = 3290, seed: int = 31,
    test_frac: float = 0.31,
) -> tuple[DataFrame, DatasetMeta]:
    g = np.random.default_rng(seed)
    n_pos = round(0.965 * n_pairs)
    rows = []
    for i in range(n_pos):
        p = _cricket_player(g, i)
        rows.append(_cricket_row(p, _cricket_profile(g, p), 1))
    for i in range(n_pairs - n_pos):
        a = _cricket_player(g, 100_000 + i)
        b = _cricket_player(g, 200_000 + i)
        b["country"] = a["country"]
        rows.append(_cricket_row(a, _cricket_profile(g, b), 0))
    pdf = pd.DataFrame(rows)
    return pairs_from_pandas(spark, pdf, test_frac=test_frac, seed=seed), CRICKET_META


# =====================================================================
# Shoes / Cameras — textual, single attribute, company groups
# =====================================================================
SHOES_META = DatasetMeta(
    name="Shoes",
    domain="Products",
    dtype="textual",
    attrs=(AttrSpec("title", "long_str"),),
    sens_attr="company",
    sens_type="multi",
    dedupe_scales=False,
)
CAMERAS_META = DatasetMeta(
    name="Cameras",
    domain="Products",
    dtype="textual",
    attrs=(AttrSpec("title", "long_str"),),
    sens_attr="company",
    sens_type="multi",
    dedupe_scales=False,
)

_SHOE_BRANDS = ["Nike", "Adidas", "Puma", "Reebok", "New Balance", "Asics",
                "Converse", "Vans"]
_SHOE_LINES = {
    "Nike": ["Air Max", "Air Force", "Revolution", "Pegasus"],
    "Adidas": ["Ultraboost", "Superstar", "Gazelle", "NMD"],
    "Puma": ["Suede Classic", "RS-X", "Cali"],
    "Reebok": ["Classic Leather", "Nano", "Club C"],
    "New Balance": ["574", "990", "Fresh Foam"],
    "Asics": ["Gel-Kayano", "Gel-Nimbus", "GT-2000"],
    "Converse": ["Chuck Taylor", "One Star"],
    "Vans": ["Old Skool", "Sk8-Hi", "Authentic"],
}
_COLORS = ["Black", "White", "Grey", "Navy", "Red", "Green", "Blue"]
_COLOR_ABBR = {"Black": "Blk", "White": "Wht", "Grey": "Gry", "Navy": "Nvy",
               "Red": "Red", "Green": "Grn", "Blue": "Blu"}
_SHOE_NOISE = ["Running Shoe", "Sneaker", "Trainer", "Athletic Shoe",
               "Casual Shoe"]


def _shoe(g: np.random.Generator) -> dict:
    brand = _choice(g, _SHOE_BRANDS)
    line = _choice(g, _SHOE_LINES[brand])
    model = int(g.integers(1, 99))
    color = _choice(g, _COLORS)
    gender = _choice(g, ["Men's", "Women's"])
    size = int(g.integers(5, 14))
    title = (f"{brand} {line} {model} {gender} {_choice(g, _SHOE_NOISE)} "
             f"{color}/{_choice(g, _COLORS)} Size {size}")
    return {"brand": brand, "line": line, "model": model, "color": color,
            "gender": gender, "size": size, "title": title}


def _shoe_retitle(g: np.random.Generator, s: dict) -> str:
    """Aggressive marketplace retitle of the same shoe: token glueing,
    abbreviations, reordering, dropped/added marketing tokens."""
    line = s["line"].replace(" ", "") if g.random() < 0.8 else s["line"]
    color = _COLOR_ABBR[s["color"]] if g.random() < 0.85 else s["color"]
    gender = {"Men's": "Mens", "Women's": "Womens"}[s["gender"]] \
        if g.random() < 0.9 else s["gender"]
    bits = [s["brand"].upper() if g.random() < 0.3 else s["brand"],
            f"{line}-{s['model']}" if g.random() < 0.4 else f"{line} {s['model']}",
            color, gender]
    if g.random() < 0.5:
        bits.append(_choice(g, ["NIB", "New in Box", "Authentic", "Sale"]))
    if g.random() < 0.4:
        bits.append(_choice(g, _SHOE_NOISE))
    g.shuffle(bits)
    return " ".join(str(b) for b in bits)


def _textual_row(l_title: str, r_title: str, l_brand: str, r_brand: str,
                 label: int) -> dict:
    return {"l_title": l_title, "r_title": r_title,
            "l_groups": [l_brand], "r_groups": [r_brand], "label": label}


def shoes(
    spark: SparkSession, *, n_pairs: int = 5600, seed: int = 37,
    test_frac: float = 0.29,
) -> tuple[DataFrame, DatasetMeta]:
    g = np.random.default_rng(seed)
    n_pos = round(0.103 * n_pairs)
    rows = []
    for _ in range(n_pos):
        s = _shoe(g)
        rows.append(_textual_row(s["title"], _shoe_retitle(g, s),
                                 s["brand"], s["brand"], 1))
    for _ in range(n_pairs - n_pos):
        a = _shoe(g)
        b = _shoe(g)
        if g.random() < 0.7:  # hard negative: same brand, different model
            b["brand"] = a["brand"]
            b["line"] = _choice(g, _SHOE_LINES[a["brand"]])
            b["title"] = (f"{b['brand']} {b['line']} {b['model']} "
                          f"{b['gender']} {_choice(g, _SHOE_NOISE)} "
                          f"{b['color']}/{_choice(g, _COLORS)} Size {b['size']}")
        rows.append(_textual_row(a["title"], _shoe_retitle(g, b),
                                 a["brand"], b["brand"], 0))
    pdf = pd.DataFrame(rows)
    return pairs_from_pandas(spark, pdf, test_frac=test_frac, seed=seed), SHOES_META


_CAM_BRANDS = ["Sony", "Canon", "Nikon", "Fujifilm", "Olympus", "Panasonic"]
_CAM_MODELS = {
    "Sony": ["Cyber-shot RX100", "Alpha A7", "Cyber-shot WX350"],
    "Canon": ["EOS 5D", "PowerShot G7", "EOS Rebel T7"],
    "Nikon": ["D750", "Coolpix P900", "Z6"],
    "Fujifilm": ["X-T3", "FinePix XP140", "GFX 50R"],
    "Olympus": ["OM-D E-M10", "Tough TG-6", "PEN E-PL9"],
    "Panasonic": ["Lumix GH5", "Lumix ZS200", "Lumix FZ80"],
}


def _camera(g: np.random.Generator) -> dict:
    brand = _choice(g, _CAM_BRANDS)
    model = _choice(g, _CAM_MODELS[brand])
    mk = int(g.integers(1, 7))
    color = _choice(g, ["Black", "Silver", "White"])
    title = (f"{brand} {model} {'Mark ' + str(mk) + ' ' if g.random() < 0.4 else ''}"
             f"{int(g.integers(12, 50))}MP Digital Camera {color} "
             f"{_choice(g, ['Prices - CNET@en', 'Best Price@en', 'Review@en', 'Deals@en'])}")
    return {"brand": brand, "model": model, "mk": mk, "color": color,
            "title": title}


_NL_COLOR = {"Black": "Zwart", "Silver": "Zilver", "White": "Wit"}


def _camera_retitle(g: np.random.Generator, c: dict) -> str:
    if g.random() < 0.3:
        # Dutch marketplace listing: OOV vocabulary for the simulated LM
        # (the paper's "Prijzen @NL Tweakers" FN trap for MCAN).
        return (f"{c['brand']} {c['model']} {_NL_COLOR[c['color']]} - "
                f"{_choice(g, ['Prijzen', 'Goedkoopste Aanbieding', 'Vergelijk Kopen'])} "
                f"@NL Tweakers@NL")
    model = c["model"].replace("-", " ") if g.random() < 0.4 else c["model"]
    bits = [c["brand"], model, c["color"]]
    if g.random() < 0.4:
        bits.append(f"Mk{c['mk']}")
    if g.random() < 0.5:
        bits.append(_choice(g, ["Digital Camera", "Compact Camera", "Body Only"]))
    bits.append(_choice(g, ["Deals@en", "Shop@en", "Best Buy@en"]))
    g.shuffle(bits)
    return " ".join(bits)


def cameras(
    spark: SparkSession, *, n_pairs: int = 2800, seed: int = 41,
    test_frac: float = 0.29,
) -> tuple[DataFrame, DatasetMeta]:
    g = np.random.default_rng(seed)
    n_pos = round(0.172 * n_pairs)
    rows = []
    for _ in range(n_pos):
        c = _camera(g)
        rows.append(_textual_row(c["title"], _camera_retitle(g, c),
                                 c["brand"], c["brand"], 1))
    for _ in range(n_pairs - n_pos):
        a, b = _camera(g), _camera(g)
        if g.random() < 0.6:  # hard negative: same brand, other model
            b["brand"] = a["brand"]
            b["model"] = _choice(g, _CAM_MODELS[a["brand"]])
        rows.append(_textual_row(a["title"], _camera_retitle(g, b),
                                 a["brand"], b["brand"], 0))
    pdf = pd.DataFrame(rows)
    return pairs_from_pandas(spark, pdf, test_frac=test_frac, seed=seed), CAMERAS_META
