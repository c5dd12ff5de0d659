"""Table I — NER tag extraction on the 12 Piroszhki ingredient phrases.

Trains the tagger on the synthetic hand-tagged corpus (paper sizes:
6,612 phrases) and prints the paper's Table I columns for the paper's
exact 12 phrases.

Run: ``spark-submit jobs/table1_ner_tags.py`` (Spark is only needed for
parity with the other jobs — tagging 12 phrases happens on the driver).
"""
from __future__ import annotations

from repro.ner.tagger import NerTagger, extract_entities
from repro.recipes.generator import tagged_corpus
from repro.recipes.phrases import ner_tokenize

#: the 12 ingredient phrases of the paper's Table I (Piroszhki recipe).
TABLE1_PHRASES = [
    "1/2 lb lean ground beef",
    "1 small onion , finely chopped",
    "1 hard-cooked egg , finely chopped",
    "1 tablespoon fresh dill weed",
    "1/2 teaspoon salt ,freshly ground",
    "1/8 teaspoon black pepper,minced",
    "3/4 cup butter or 3/4 cup margarine , softened",
    "2 cups all-purpose flour",
    "1 teaspoon salt",
    "1/2 cup low-fat sour cream",
    "1 egg yolk",
    "1 tablespoon cold water",
]

COLUMNS = ["Ingredient Phrase", "Name", "State", "Quantity", "Unit",
           "Temperature", "Dry/Fresh", "Size"]


def build_tagger(*, n_train: int = 6612, seed: int = 7) -> NerTagger:
    """The paper-sized training run (deterministic)."""
    return NerTagger().fit(tagged_corpus(n_train, seed=seed), epochs=5)


def run(tagger: NerTagger | None = None) -> list[dict[str, str]]:
    """Tag the 12 phrases; returns one Table I row dict per phrase."""
    tagger = tagger or build_tagger()
    rows = []
    for phrase in TABLE1_PHRASES:
        tokens = ner_tokenize(phrase)
        ents = extract_entities(tokens, tagger.predict(tokens))
        rows.append(
            {
                "Ingredient Phrase": phrase,
                "Name": ents["ner_name"] or "",
                "State": ents["ner_state"] or "",
                "Quantity": ents["ner_qty"] or "",
                "Unit": ents["ner_unit"] or "",
                "Temperature": ents["ner_temp"] or "",
                "Dry/Fresh": ents["ner_df"] or "",
                "Size": ents["ner_size"] or "",
            }
        )
    return rows


def main() -> None:
    rows = run()
    widths = {c: max(len(c), *(len(r[c]) for r in rows)) for c in COLUMNS}
    print("TABLE I. INGREDIENT TAGS EXTRACTION (reproduced)")
    print(" | ".join(c.ljust(widths[c]) for c in COLUMNS))
    for r in rows:
        print(" | ".join(r[c].ljust(widths[c]) for c in COLUMNS))


if __name__ == "__main__":
    main()
