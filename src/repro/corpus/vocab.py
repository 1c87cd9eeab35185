"""Vocabulary for the synthetic parsed corpus.

The paper evaluates on spaCy-parsed Wikipedia / HappyDB / cafe-blog text.
We have no parser and no dumps, so the corpus generator emits sentences
*with* their dependency trees from templates (see ``templates.py``). This
module holds the word pools the templates draw from, the POS / parse-label
tag sets, and the semantic clusters that drive the paraphrase-embedding
substrate (``repro.nlp.embeddings``).

POS tags are uppercase, parse labels lowercase — this keeps the KOKO label
classifier (word vs POS vs parse label) unambiguous while letting query
authors write lowercase POS names (``//verb``) as in the paper.
"""
from __future__ import annotations

# ---------------------------------------------------------------- tag sets
POS_TAGS = frozenset(
    {"VERB", "NOUN", "PROPN", "ADJ", "DET", "ADV", "ADP", "PUNCT", "NUM", "PRON", "CCONJ"}
)

PARSE_LABELS = frozenset(
    {
        "root", "nsubj", "dobj", "pobj", "det", "amod", "nn", "advmod",
        "prep", "punct", "aux", "attr", "conj", "cc", "appos", "rcmod",
        "acl", "oprd", "num", "relcl", "poss", "xcomp", "acomp",
    }
)

ENTITY_TYPES = frozenset({"Entity", "Person", "Date", "GPE", "Org", "Facility", "Team"})


def classify_label(label: str) -> str:
    """Classify a KOKO path label as ``word`` / ``pos`` / ``parse`` / ``wildcard``.

    Quoted strings are words (the AST strips the quotes and sets the kind
    explicitly); here we classify bare identifiers the way the paper's
    examples do: parse labels win (``det``/``punct``/``num`` are parse
    labels in KOKO queries), then POS names, else the label is a word.
    """
    if label == "*":
        return "wildcard"
    if label in PARSE_LABELS:
        return "parse"
    if label.upper() in POS_TAGS:
        return "pos"
    return "word"


# ------------------------------------------------------------- word pools
FIRST_NAMES = [
    "Anna", "Cyd", "Alys", "Vera", "Marco", "Lena", "Hugo", "Mia",
    "Omar", "Iris", "Noah", "Ruth", "Ezra", "Nina", "Saul", "Tess",
]
LAST_NAMES = [
    "Charisse", "Thomas", "Keller", "Moreau", "Tanaka", "Silva",
    "Novak", "Reyes", "Haddad", "Okafor", "Lindgren", "Petrov",
]
CITIES = ["Beijing", "Tokyo", "Portland", "Seattle", "Oslo", "Lima", "Austin", "Kyoto"]
COUNTRIES = ["China", "Japan", "Norway", "Peru", "Canada", "Chile", "Kenya", "Spain"]
ORGS = ["Acme", "Globex", "Initech", "Umbra", "Vandelay", "Hooli"]

FOODS = ["cheesecake", "pie", "cake", "tart", "pudding", "brioche", "scone", "waffle"]
ADJS = ["delicious", "salty", "sweet", "fresh", "warm", "crisp", "rich", "tangy"]
PLAIN_NOUNS = ["man", "woman", "dog", "book", "garden", "river", "house", "song"]
PLAIN_VERBS = ["saw", "liked", "found", "bought", "made", "heard", "read", "praised"]
CHOC_BRANDS = ["Velvet", "Baking", "Cocoa", "Noir", "Artisan", "Single-origin"]
NICKNAMES = ["Sid", "Bud", "Ace", "Rex", "Dot", "Kit", "Moe", "Pip"]
YEARS = [str(y) for y in range(1890, 1990, 4)]
HAPPY_OBJECTS = ["promotion", "gift", "letter", "meal", "hike", "movie", "garden", "visit"]

CAFE_HEADS = ["Cafe", "Coffee", "Roasters", "Beans", "Brew", "Espresso"]
CAFE_MODS = [
    "Blue", "Iron", "Maple", "Harbor", "Stone", "Cedar", "North", "Violet",
    "Copper", "Winding", "Golden", "Quiet", "Ember", "Drift", "Fable", "Lark",
    "Tidal", "Mossy", "Slate", "Sunder", "Gable", "Hollow", "Prairie", "Vesper",
    "Cinder", "Bramble", "Foxglove", "Meridian", "Umber", "Saffron", "Kestrel", "Pewter",
]
# Distinct pool for cafes named *without* a giveaway head word — these are
# only extractable via evidence aggregation, which is the paper's point.
CAFE_PLAIN = [
    "Ritual", "Heart", "Elm", "Sparrow", "Anchor", "Juniper", "Marlow",
    "Wren", "Alder", "Finch", "Orbit", "Pomelo", "Quill", "Sable",
]
STREETS = ["Mission", "Alder", "Main", "Oak", "Pine", "Division", "Burnside"]
# Restaurants that genuinely serve espresso but are not cafes — the
# plausible-but-wrong candidates behind KOKO's sub-1.0 precision in Fig. 3.
RESTAURANT_HEADS = ["Bistro", "Diner", "Kitchen", "Grill", "Tavern", "Bakery"]
COFFEE_BRANDS = ["Marzocco", "Synesso", "Aeropress", "V60"]
FESTIVALS = ["Brewers Cup", "Barista Championship", "Coffee Fest"]
TEAMS = ["Falcons", "Rovers", "Comets", "Pilots", "Harriers", "Drakes"]
FACILITIES = ["Stadium", "Arena", "Library", "Museum", "Pavilion", "Gym"]

# --------------------------------------------------- semantic clusters
# Each cluster is a set of words/phrases that the paraphrase-embedding
# substrate places close together (shared base vector + per-word noise).
# These are the "linguistic variations" the cafe query's descriptors must
# be robust to; word-level clusters also serve similarTo (Ex. 2.2).
CLUSTERS: dict[str, list[str]] = {
    "city": ["city", "cities"] + [c.lower() for c in CITIES],
    "country": ["country", "countries"] + [c.lower() for c in COUNTRIES],
    "person": ["person"] + [n.lower() for n in FIRST_NAMES + LAST_NAMES],
    "serve": ["serves", "sells", "offers", "pours", "brews"],
    "coffee": ["coffee", "espresso", "cappuccino", "macchiato", "latte", "cappuccinos"],
    "employ": ["employs", "hired", "hires", "recruited"],
    "barista": ["barista", "baristas"],
    "be": ["is", "was", "are", "were", "remains"],
    "born": ["born", "birthed"],
    "call": ["called", "named", "nicknamed", "dubbed"],
    "visit": ["went", "go", "visited", "stopped"],
    "food": ["food"] + FOODS,
}

# Phrases an evidence-template may use for each descriptor concept. The
# first entry is the canonical phrase a query author would write; the rest
# are the variations the corpus actually contains.
EVIDENCE_PHRASES: dict[str, list[tuple[str, str]]] = {
    # (verb, object) pairs — both drawn from clusters above so expansion
    # can recover them from the canonical descriptor.
    "serves coffee": [
        ("serves", "coffee"), ("sells", "espresso"), ("pours", "macchiato"),
        ("offers", "cappuccinos"), ("brews", "latte"), ("serves", "espresso"),
    ],
    "employs baristas": [
        ("employs", "baristas"), ("hired", "barista"), ("recruited", "baristas"),
        ("hires", "barista"),
    ],
}
