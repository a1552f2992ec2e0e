"""Deterministic word pools for the synthetic company/security generator.

The pools are designed to reproduce the *matching difficulty structure* of
the paper's Crunchbase-derived benchmark (Section 3.2):

- ``COMMON_TERMS`` is intentionally small so that distinct entities share
  name tokens ("hitech", "networks", "energy", ... — paper Section 6.2.1),
  which makes the Token Overlap blocking produce hard negative candidate
  pairs and drives the Pre-Graph-Cleanup precision collapse.
- ``stem(i)`` produces a pseudo-word unique per entity index, so most groups
  remain matchable by text alignment despite source noise.
"""
from __future__ import annotations

import numpy as np

# Shared, collision-prone name terms (paper: "hitech", "networks", "energy",
# "resources", geographical terms, etc.).
COMMON_TERMS = [
    "Global", "Energy", "Networks", "Resources", "Tech", "Hitech", "Digital",
    "Capital", "Solutions", "Systems", "Industries", "Partners", "Media",
    "Financial", "Health", "Data", "Cloud", "Smart", "Micro", "First",
    "United", "National", "Pacific", "Atlantic", "Alpha", "Nova", "Prime",
    "Quantum", "Vertex", "Summit", "Apex", "Pioneer", "Horizon", "Dynamics",
    "Logistics", "Mobility", "Analytics", "Robotics", "Pharma", "Materials",
]

CORPORATE_SUFFIXES = ["Inc.", "Ltd", "Corp", "AG", "GmbH", "PLC", "SA",
                      "Holdings", "Group", "Limited", "Co."]

# (city, region, region_code, country_name, country_code)
LOCATIONS = [
    ("Zurich", "Zurich", "ZH", "Switzerland", "CHE"),
    ("Geneva", "Geneva", "GE", "Switzerland", "CHE"),
    ("Winterthur", "Zurich", "ZH", "Switzerland", "CHE"),
    ("New York", "New York", "NY", "United States", "USA"),
    ("Austin", "Texas", "TX", "United States", "USA"),
    ("Sunnyvale", "California", "CA", "United States", "USA"),
    ("Boston", "Massachusetts", "MA", "United States", "USA"),
    ("London", "England", "ENG", "United Kingdom", "GBR"),
    ("Manchester", "England", "ENG", "United Kingdom", "GBR"),
    ("Berlin", "Berlin", "BE", "Germany", "DEU"),
    ("Munich", "Bavaria", "BY", "Germany", "DEU"),
    ("Paris", "Ile-de-France", "IDF", "France", "FRA"),
    ("Amsterdam", "North Holland", "NH", "Netherlands", "NLD"),
    ("Stockholm", "Stockholm", "ST", "Sweden", "SWE"),
    ("Singapore", "Singapore", "SG", "Singapore", "SGP"),
    ("Tokyo", "Tokyo", "13", "Japan", "JPN"),
    ("Sydney", "New South Wales", "NSW", "Australia", "AUS"),
    ("Toronto", "Ontario", "ON", "Canada", "CAN"),
    ("Stellenbosch", "Western Cape", "WC", "South Africa", "ZAF"),
    ("Mumbai", "Maharashtra", "MH", "India", "IND"),
]

INDUSTRIES = [
    "cybersecurity", "online travel", "telecommunications", "real estate",
    "renewable energy", "asset management", "semiconductor", "biotech",
    "e-commerce", "cloud infrastructure", "insurance", "mass media",
    "industrial automation", "consumer electronics", "logistics",
    "wealth management", "pharmaceutical", "mining", "agritech", "fintech",
]

SERVICES = [
    "endpoint protection", "booking platforms", "broadband connectivity",
    "investment offerings", "solar installations", "portfolio analytics",
    "chip design tools", "drug discovery pipelines", "online marketplaces",
    "container orchestration", "risk underwriting", "news distribution",
    "factory robotics", "smart devices", "freight forwarding",
    "advisory services", "generic medicines", "ore extraction",
    "crop monitoring", "payment processing",
]

AUDIENCES = [
    "enterprises", "consumers", "small businesses", "institutional investors",
    "households", "governments", "hospitals", "retailers", "manufacturers",
    "startups",
]

ADJECTIVES = [
    "leading", "pioneering", "global", "innovative", "trusted", "independent",
    "fast-growing", "established", "award-winning", "specialized",
]

# Synonym map used by the ParaphraseAttribute artifact (simulates the Pegasus
# paraphraser of the paper with a deterministic rule-based rewrite).
SYNONYMS = {
    "leading": "top", "pioneering": "trailblazing", "global": "worldwide",
    "innovative": "cutting-edge", "trusted": "reliable",
    "independent": "autonomous", "fast-growing": "rapidly expanding",
    "established": "long-standing", "award-winning": "acclaimed",
    "specialized": "niche", "company": "firm", "provides": "offers",
    "providing": "offering", "enterprises": "corporations",
    "consumers": "individuals", "platforms": "services",
}

SECURITY_TYPES = ["Ordinary Share", "Common Stock", "Equity Shares",
                  "Registered Share", "ADR"]
EXTRA_SECURITY_TYPES = ["Rights", "Bond", "Unit", "Preferred Share"]

_SYLLABLES = ["zor", "vex", "lum", "tar", "qui", "nel", "bra", "sot", "kir",
              "pha", "dro", "wim", "cal", "yen", "rus", "ola", "tev", "gan",
              "mir", "plo", "sun", "ket", "var", "ixo", "ner"]


def stem(i: int) -> str:
    """Unique-ish pseudo-word for entity index ``i`` (deterministic)."""
    s = _SYLLABLES[i % len(_SYLLABLES)]
    s += _SYLLABLES[(i // len(_SYLLABLES)) % len(_SYLLABLES)]
    s += _SYLLABLES[(i // len(_SYLLABLES) ** 2) % len(_SYLLABLES)]
    return s.capitalize() + str(i % 97)


def pick(g: np.random.Generator, pool: list) -> object:
    """Uniform draw from a list with a numpy Generator (keeps seeds local)."""
    return pool[int(g.integers(0, len(pool)))]
