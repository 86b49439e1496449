"""Baseline deep ER matchers (paper §VI-A.2): DeepER, DeepMatcher, DITTO.

The originals need PyTorch + pre-trained models, neither of which ships
offline, so each is reimplemented as a *lite* on the numpy substrate
that keeps its architecture family — and hence its cost profile —
intact (DESIGN.md §2):

- `DeepERLite`: averaged word embeddings per attribute, end-to-end
  classifier over [|e_s - e_t|, e_s * e_t] comparison features;
- `DeepMatcherLite`: token-level soft-alignment attention summariser per
  attribute + a wide, long-schedule classifier (the hybrid model);
- `DittoLite`: pair serialisation '[COL] a [VAL] v ...' into hashed
  character-n-gram features + a deep classifier ("fine-tuning" a wider
  net over a fixed subword vocabulary).

All share the interface: fit(vals_s, vals_t, y) / predict_proba(...),
where vals_* are per-pair lists of attribute-value strings.
"""
from repro.baselines.matchers import BASELINES, DeepERLite, DeepMatcherLite, DittoLite

__all__ = ["BASELINES", "DeepERLite", "DeepMatcherLite", "DittoLite"]
