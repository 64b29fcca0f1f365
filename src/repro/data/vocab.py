"""Deterministic vocabulary and noise operators for the synthetic ER datasets.

The paper's datasets are real-world CSVs (restaurants, products,
bibliographies, movies, census persons). We rebuild them synthetically, so we
need (a) domain wordlists with realistic character structure — FastText's
n-gram advantage only exists if typos share most n-grams with the clean
token — and (b) a pseudo-frequency table standing in for corpus statistics
(used by the SentenceBERT surrogates' IDF weighting and by the static models'
"pretrained vocabulary" membership).

Everything here is pure Python/numpy and deterministic in the supplied seed.
"""
from __future__ import annotations

import zlib

import numpy as np


def stable_hash(*parts: object) -> int:
    """Process-independent, well-mixed 64-bit hash (Python's ``hash`` is
    salted per process, which would give every Spark worker a different
    vocabulary; raw crc32/adler32 bits are not uniform on short strings, so
    a splitmix64 finalizer avalanches them)."""
    data = "|".join(str(p) for p in parts).encode()
    x = ((zlib.crc32(data) << 32) | zlib.adler32(data)) & 0xFFFFFFFFFFFFFFFF
    x = (x ^ (x >> 30)) * 0xBF58476D1CE4E5B9 & 0xFFFFFFFFFFFFFFFF
    x = (x ^ (x >> 27)) * 0x94D049BB133111EB & 0xFFFFFFFFFFFFFFFF
    return x ^ (x >> 31)

# ---------------------------------------------------------------------------
# Seed wordlists. Small real lists give realistic character structure; the
# syllable generator below expands them into a few thousand domain terms.
# ---------------------------------------------------------------------------

FIRST_NAMES = [
    "james", "mary", "robert", "patricia", "john", "jennifer", "michael",
    "linda", "david", "elizabeth", "william", "barbara", "richard", "susan",
    "joseph", "jessica", "thomas", "sarah", "charles", "karen", "christopher",
    "lisa", "daniel", "nancy", "matthew", "betty", "anthony", "sandra",
    "mark", "margaret", "donald", "ashley", "steven", "kimberly", "andrew",
    "emily", "paul", "donna", "joshua", "michelle", "kenneth", "carol",
    "kevin", "amanda", "brian", "melissa", "george", "deborah", "timothy",
    "stephanie", "ronald", "rebecca", "jason", "sharon", "edward", "laura",
    "jeffrey", "cynthia", "ryan", "kathleen", "jacob", "amy", "gary",
    "angela", "nicholas", "shirley", "eric", "anna", "jonathan", "brenda",
    "stephen", "pamela", "larry", "emma", "justin", "nicole", "scott",
    "helen", "brandon", "samantha", "benjamin", "katherine", "samuel",
    "christine", "gregory", "debra", "alexander", "rachel", "patrick",
    "carolyn", "frank", "janet", "raymond", "maria", "jack", "olivia",
]

LAST_NAMES = [
    "smith", "johnson", "williams", "brown", "jones", "garcia", "miller",
    "davis", "rodriguez", "martinez", "hernandez", "lopez", "gonzalez",
    "wilson", "anderson", "thomas", "taylor", "moore", "jackson", "martin",
    "lee", "perez", "thompson", "white", "harris", "sanchez", "clark",
    "ramirez", "lewis", "robinson", "walker", "young", "allen", "king",
    "wright", "scott", "torres", "nguyen", "hill", "flores", "green",
    "adams", "nelson", "baker", "hall", "rivera", "campbell", "mitchell",
    "carter", "roberts", "gomez", "phillips", "evans", "turner", "diaz",
    "parker", "cruz", "edwards", "collins", "reyes", "stewart", "morris",
    "morales", "murphy", "cook", "rogers", "gutierrez", "ortiz", "morgan",
    "cooper", "peterson", "bailey", "reed", "kelly", "howard", "ramos",
    "kim", "cox", "ward", "richardson", "watson", "brooks", "chavez",
    "wood", "james", "bennett", "gray", "mendoza", "ruiz", "hughes",
]

CITIES = [
    "new york", "los angeles", "chicago", "houston", "phoenix",
    "philadelphia", "san antonio", "san diego", "dallas", "san jose",
    "austin", "jacksonville", "fort worth", "columbus", "charlotte",
    "san francisco", "indianapolis", "seattle", "denver", "washington",
    "boston", "el paso", "nashville", "detroit", "oklahoma city",
    "portland", "las vegas", "memphis", "louisville", "baltimore",
    "milwaukee", "albuquerque", "tucson", "fresno", "mesa", "sacramento",
    "atlanta", "kansas city", "omaha", "raleigh", "miami", "oakland",
    "minneapolis", "tulsa", "wichita", "arlington", "cleveland", "tampa",
]

STREETS = [
    "main", "church", "high", "elm", "park", "walnut", "washington",
    "second", "chestnut", "broad", "center", "maple", "oak", "pine",
    "river", "market", "water", "union", "south", "third", "spring",
    "ridge", "cherry", "hill", "franklin", "highland", "mill", "bridge",
    "jefferson", "jackson", "madison", "cedar", "spruce", "prospect",
    "lincoln", "grove", "sunset", "meadow", "lake", "forest", "college",
]

STATES = [
    "nsw", "vic", "qld", "wa", "sa", "tas", "act", "nt",
]

CUISINES = [
    "american", "italian", "french", "chinese", "japanese", "mexican",
    "thai", "indian", "greek", "spanish", "seafood", "steakhouse",
    "barbecue", "cajun", "vegan", "mediterranean", "korean", "vietnamese",
    "fusion", "continental", "californian", "southern", "delicatessen",
]

BRANDS = [
    "sony", "samsung", "panasonic", "philips", "toshiba", "canon",
    "nikon", "garmin", "logitech", "belkin", "netgear", "linksys",
    "kingston", "sandisk", "seagate", "epson", "brother", "lexmark",
    "olympus", "pioneer", "kenwood", "yamaha", "bose", "jvc", "sharp",
    "motorola", "nokia", "siemens", "casio", "fujifilm", "vtech",
    "plantronics", "jabra", "griffin", "targus", "kensington", "tripp",
]

PRODUCT_NOUNS = [
    "camera", "camcorder", "television", "monitor", "speaker", "headphones",
    "keyboard", "mouse", "router", "switch", "adapter", "charger", "cable",
    "battery", "printer", "scanner", "projector", "receiver", "subwoofer",
    "microphone", "telephone", "smartphone", "tablet", "notebook", "desktop",
    "drive", "memory", "card", "player", "radio", "recorder", "amplifier",
    "turntable", "soundbar", "webcam", "headset", "dock", "case", "mount",
]

PRODUCT_ADJS = [
    "black", "white", "silver", "portable", "wireless", "digital",
    "compact", "professional", "premium", "ultra", "slim", "rugged",
    "waterproof", "rechargeable", "bluetooth", "optical", "stereo",
    "hd", "uhd", "4k", "dual", "mini", "micro", "gaming", "smart",
]

VENUES = [
    "sigmod", "vldb", "icde", "edbt", "cikm", "kdd", "www", "wsdm",
    "acl", "emnlp", "naacl", "icml", "neurips", "aaai", "ijcai", "sigir",
    "tods", "tkde", "vldbj", "pods", "dasfaa", "ssdbm", "icdt", "recsys",
]

TITLE_WORDS = [
    "query", "optimization", "database", "distributed", "parallel",
    "indexing", "learning", "neural", "graph", "stream", "processing",
    "efficient", "scalable", "adaptive", "approximate", "incremental",
    "join", "aggregation", "storage", "transaction", "concurrency",
    "recovery", "privacy", "secure", "federated", "knowledge", "entity",
    "resolution", "matching", "blocking", "similarity", "search",
    "retrieval", "ranking", "clustering", "classification", "embedding",
    "representation", "transformer", "attention", "language", "model",
    "analysis", "mining", "pattern", "sequence", "temporal", "spatial",
    "probabilistic", "sampling", "cardinality", "estimation", "tuning",
    "benchmark", "evaluation", "framework", "architecture", "system",
    "semantic", "schema", "integration", "cleaning", "deduplication",
    "crowdsourcing", "provenance", "workflow", "visualization", "keyword",
]

MOVIE_WORDS = [
    "night", "day", "dark", "light", "love", "war", "king", "queen",
    "lost", "last", "first", "city", "dream", "shadow", "fire", "storm",
    "river", "mountain", "return", "rise", "fall", "secret", "silent",
    "broken", "golden", "black", "white", "red", "blue", "iron", "stone",
    "blood", "heart", "soul", "ghost", "angel", "devil", "star", "moon",
    "summer", "winter", "journey", "escape", "revenge", "legacy", "empire",
    "legend", "hero", "stranger", "hunter", "widow", "garden", "island",
]

GENRES = [
    "drama", "comedy", "action", "thriller", "horror", "romance",
    "adventure", "fantasy", "mystery", "crime", "western", "animation",
    "documentary", "biography", "musical", "war", "family", "history",
]

MUSIC_WORDS = [
    "remix", "acoustic", "live", "radio", "edit", "version", "feat",
    "deluxe", "remastered", "single", "album", "explicit", "instrumental",
]

STOPWORDS = [
    "the", "a", "an", "of", "and", "or", "in", "on", "for", "with",
    "to", "at", "by", "from", "is", "its", "new", "via", "using",
]

_SYL_A = ["ba", "be", "bi", "bo", "bu", "ca", "ce", "co", "da", "de",
          "di", "do", "fa", "fe", "ga", "go", "ha", "he", "ka", "ke",
          "la", "le", "li", "lo", "ma", "me", "mi", "mo", "na", "ne",
          "no", "pa", "pe", "po", "ra", "re", "ri", "ro", "sa", "se",
          "si", "so", "ta", "te", "ti", "to", "va", "ve", "vi", "za"]
_SYL_B = ["n", "r", "l", "s", "t", "x", "m", "nd", "rt", "st", "ck", ""]


def synth_words(n: int, *, seed: int, min_syl: int = 2, max_syl: int = 4) -> list[str]:
    """``n`` pronounceable fake words (model numbers, rare terms, suburbs)."""
    g = np.random.default_rng(seed)
    out = []
    seen = set()
    while len(out) < n:
        k = int(g.integers(min_syl, max_syl + 1))
        w = "".join(g.choice(_SYL_A) for _ in range(k)) + str(g.choice(_SYL_B))
        if w not in seen:
            seen.add(w)
            out.append(w)
    return out


SUBURBS = synth_words(400, seed=11)
TERMINOLOGY = synth_words(3000, seed=12)  # rare domain terms / model numbers

# ---------------------------------------------------------------------------
# The "pretrained corpus": full vocabulary + Zipfian pseudo-frequencies.
# Static surrogates check membership here; SBERT surrogates read IDF weights.
# ---------------------------------------------------------------------------

_DOMAIN_LISTS: list[list[str]] = [
    STOPWORDS, FIRST_NAMES, LAST_NAMES, CITIES, STREETS, STATES, CUISINES,
    BRANDS, PRODUCT_NOUNS, PRODUCT_ADJS, VENUES, TITLE_WORDS, MOVIE_WORDS,
    GENRES, MUSIC_WORDS, SUBURBS, TERMINOLOGY,
]


def full_vocabulary() -> list[str]:
    """Every clean token any generator can emit, most-frequent-ish first.

    Order matters: rank drives both the Zipf pseudo-frequency (IDF) and
    which tokens fall outside a static model's partial vocabulary.
    """
    seen: dict[str, None] = {}
    for lst in _DOMAIN_LISTS:
        for phrase in lst:
            for tok in phrase.split():
                seen.setdefault(tok, None)
    return list(seen)


_VOCAB = full_vocabulary()
_RANK = {t: i for i, t in enumerate(_VOCAB)}


def pseudo_idf(token: str) -> float:
    """IDF-like weight from the token's Zipf rank; unknown tokens are rare.

    Stopwords (rank < len(STOPWORDS)) get strongly down-weighted, rare
    terminology ~1.0, mirroring corpus IDF without dataset-specific fitting.
    """
    r = _RANK.get(token)
    if r is None:
        return 1.0
    freq = 1.0 / (1 + r)  # Zipf
    return float(1.0 / (1.0 + 8.0 * freq ** 0.5))


def in_pretrained_vocab(token: str, coverage: float, salt: int) -> bool:
    """Membership in a static model's (partial) pretrained dictionary.

    A deterministic ``coverage`` fraction of the corpus vocabulary is "in";
    tokens outside the corpus (typos, unseen model numbers) are always OOV.
    """
    if token not in _RANK:
        return False
    # crc32 half of the hash: adler32 is not uniform on short strings
    h = (stable_hash("vocab", salt, token) >> 32) & 0xFFFFFFFF
    return h / 0xFFFFFFFF < coverage


# ---------------------------------------------------------------------------
# Noise operators (Febrl-style). All take a numpy Generator.
# ---------------------------------------------------------------------------

_ALPHA = "abcdefghijklmnopqrstuvwxyz"


def typo(word: str, g: np.random.Generator) -> str:
    """One character-level edit: insert / delete / substitute / transpose."""
    if not word:
        return word
    op = int(g.integers(0, 4))
    i = int(g.integers(0, len(word)))
    c = _ALPHA[int(g.integers(0, 26))]
    if op == 0:
        return word[:i] + c + word[i:]
    if op == 1 and len(word) > 1:
        return word[:i] + word[i + 1:]
    if op == 2:
        return word[:i] + c + word[i + 1:]
    if len(word) > 1:
        j = min(i + 1, len(word) - 1)
        lst = list(word)
        lst[i], lst[j] = lst[j], lst[i]
        return "".join(lst)
    return word


def corrupt_text(text: str, g: np.random.Generator, *, typo_rate: float = 0.0,
                 drop_rate: float = 0.0, abbrev_rate: float = 0.0,
                 max_mods: int = 3) -> str:
    """Apply per-token noise to a whitespace-tokenized string.

    ``typo_rate``/``drop_rate``/``abbrev_rate`` are per-token probabilities;
    at most ``max_mods`` tokens are modified (Febrl's per-attribute cap).
    """
    toks = text.split()
    mods = 0
    out = []
    for t in toks:
        r = g.random()
        if mods < max_mods and r < typo_rate:
            t = typo(t, g)
            mods += 1
        elif mods < max_mods and r < typo_rate + drop_rate:
            mods += 1
            continue
        elif mods < max_mods and r < typo_rate + drop_rate + abbrev_rate and len(t) > 2:
            t = t[0] + "."
            mods += 1
        out.append(t)
    return " ".join(out)
