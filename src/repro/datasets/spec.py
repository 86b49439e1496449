"""Registry of the paper's nine evaluation domains (Table II).

Each `DomainSpec` records the Table II statistics at sf=1.0 — the two
table cardinalities, the arity, and the labeled train/test pair counts —
plus a schema of typed attributes that drives the synthetic generator,
and the clean (†) / noisy (‡) flag that controls corruption strength.
"""
from __future__ import annotations

from dataclasses import dataclass


@dataclass(frozen=True)
class AttrSpec:
    """One attribute of a domain schema.

    ``kind`` selects the value generator in `generate.py`:
      name        2-4 pseudo-words (the entity's identifying text)
      person      "First Last" pseudo-name list (e.g., authors)
      category    draw from a small fixed vocabulary
      description free text, 6-18 tokens (noisy/unstructured)
      year        4-digit year
      numeric     decimal number rendered as text
      phone       formatted phone number
      email       derived from the entity name
      code        short alphanumeric identifier (ticker, zip, ...)
    """

    name: str
    kind: str
    vocab: tuple[str, ...] = ()


@dataclass(frozen=True)
class DomainSpec:
    """Table II row: sizes at sf=1.0 plus generator parameters."""

    name: str
    card_a: int
    card_b: int
    arity: int
    n_train: int
    n_test: int
    clean: bool  # † in Table II; ‡ domains get heavy corruption + missing values
    schema: tuple[AttrSpec, ...]
    # Fraction of labeled pairs that are positives (DeepMatcher-suite-like).
    pos_frac: float = 0.2

    def __post_init__(self) -> None:
        assert len(self.schema) == self.arity, (
            f"{self.name}: schema length {len(self.schema)} != arity {self.arity}"
        )


_CUISINES = ("italian", "french", "thai", "bbq", "seafood", "steakhouse",
             "mexican", "sushi", "diner", "vegan")
_VENUES = ("SIGMOD Conference", "VLDB", "ICDE", "TKDE", "PODS", "EDBT",
           "CIKM", "KDD", "WWW", "TODS")
_GENRES = ("Rock", "Pop", "Jazz", "Hip-Hop", "Classical", "Country",
           "Electronic", "Folk", "Blues", "Metal")
_STYLES = ("IPA", "Stout", "Pilsner", "Lager", "Porter", "Saison",
           "Wheat Ale", "Pale Ale", "Amber Ale", "Sour")
_SECTORS = ("Technology", "Energy", "Healthcare", "Financials", "Utilities",
            "Materials", "Industrials", "Consumer Staples")
_EXCHANGES = ("NYSE", "NASDAQ", "LSE", "TSX")
_SEGMENTS = ("skincare", "makeup", "haircare", "fragrance", "nailcare")
_OS = ("Windows", "macOS", "Linux", "Android", "iOS")
_COUNTRIES = ("UK", "USA", "France", "Germany", "Spain", "Canada")
_TITLES = ("Engineer", "Manager", "Analyst", "Director", "Consultant",
           "Designer", "Accountant", "Developer")

DOMAINS: dict[str, DomainSpec] = {
    "restaurants": DomainSpec(
        "restaurants", 533, 331, 6, 567, 189, clean=True,
        schema=(
            AttrSpec("name", "name"),
            AttrSpec("addr", "description"),
            AttrSpec("city", "category", ("new york", "los angeles", "atlanta",
                                          "san francisco", "chicago", "boston")),
            AttrSpec("phone", "phone"),
            AttrSpec("type", "category", _CUISINES),
            AttrSpec("class", "code"),
        ),
    ),
    "citations1": DomainSpec(
        "citations1", 2616, 2294, 4, 7417, 2473, clean=True,
        schema=(
            AttrSpec("title", "description"),
            AttrSpec("authors", "person"),
            AttrSpec("venue", "category", _VENUES),
            AttrSpec("year", "year"),
        ),
    ),
    "citations2": DomainSpec(
        "citations2", 2612, 64263, 4, 17223, 5742, clean=True,
        schema=(
            AttrSpec("title", "description"),
            AttrSpec("authors", "person"),
            AttrSpec("venue", "category", _VENUES),
            AttrSpec("year", "year"),
        ),
    ),
    "cosmetics": DomainSpec(
        "cosmetics", 11026, 6443, 3, 327, 81, clean=False,
        schema=(
            AttrSpec("title", "name"),
            AttrSpec("price", "numeric"),
            AttrSpec("description", "description"),
        ),
    ),
    "software": DomainSpec(
        "software", 1363, 3226, 3, 6874, 2293, clean=False,
        schema=(
            AttrSpec("title", "name"),
            AttrSpec("price", "numeric"),
            AttrSpec("description", "description"),
        ),
    ),
    "music": DomainSpec(
        "music", 6907, 55923, 8, 321, 109, clean=False,
        schema=(
            AttrSpec("song", "name"),
            AttrSpec("artist", "person"),
            AttrSpec("album", "name"),
            AttrSpec("genre", "category", _GENRES),
            AttrSpec("price", "numeric"),
            AttrSpec("copyright", "description"),
            AttrSpec("time", "code"),
            AttrSpec("released", "year"),
        ),
    ),
    "beer": DomainSpec(
        "beer", 4345, 3000, 4, 268, 91, clean=False,
        schema=(
            AttrSpec("beer_name", "name"),
            AttrSpec("brewery", "name"),
            AttrSpec("style", "category", _STYLES),
            AttrSpec("abv", "numeric"),
        ),
    ),
    "stocks": DomainSpec(
        "stocks", 2768, 21863, 8, 4472, 1117, clean=False,
        schema=(
            AttrSpec("ticker", "code"),
            AttrSpec("company", "name"),
            AttrSpec("exchange", "category", _EXCHANGES),
            AttrSpec("sector", "category", _SECTORS),
            AttrSpec("price", "numeric"),
            AttrSpec("volume", "numeric"),
            AttrSpec("open", "numeric"),
            AttrSpec("close", "numeric"),
        ),
    ),
    "crm": DomainSpec(
        "crm", 5742, 9683, 12, 440, 220, clean=True,
        schema=(
            AttrSpec("first_name", "person"),
            AttrSpec("last_name", "person"),
            AttrSpec("email", "email"),
            AttrSpec("phone", "phone"),
            AttrSpec("company", "name"),
            AttrSpec("address", "description"),
            AttrSpec("city", "category", ("london", "manchester", "leeds",
                                          "bristol", "glasgow", "york")),
            AttrSpec("state", "code"),
            AttrSpec("zip", "code"),
            AttrSpec("country", "category", _COUNTRIES),
            AttrSpec("job_title", "category", _TITLES),
            AttrSpec("website", "email"),
        ),
    ),
}

# Extra vocabulary hints used by the generator for flavour text.
DESCRIPTION_THEMES: dict[str, tuple[str, ...]] = {
    "restaurants": ("street", "avenue", "blvd", "plaza", "road", "suite"),
    "citations1": ("query", "database", "index", "join", "learning", "graph",
                   "stream", "transaction", "optimization", "schema"),
    "citations2": ("query", "database", "index", "join", "learning", "graph",
                   "stream", "transaction", "optimization", "schema"),
    "cosmetics": ("matte", "hydrating", "shade", "vegan", "gloss", "serum",
                  "spf", "cream", "natural", "oil"),
    "software": ("edition", "license", "download", "windows", "antivirus",
                 "suite", "pro", "upgrade", "user", "subscription"),
    "music": ("records", "remastered", "deluxe", "explicit", "rights",
              "reserved", "entertainment", "music", "group", "ltd"),
    "beer": ("hoppy", "citrus", "barrel", "aged", "crisp", "roasted"),
    "stocks": ("holdings", "group", "corp", "inc", "plc", "industries"),
    "crm": ("street", "avenue", "lane", "court", "drive", "house"),
}
