"""Simulated large-language-model substrate.

The paper drives every semantic decision through Claude 3.5. This
container has no network, so the subpackage provides a deterministic
stand-in: prompt templates that mirror the paper's Figures 2-3
(:mod:`repro.llm.prompts`), typed JSON-shaped responses
(:mod:`repro.llm.types`), a semantic knowledge base of real-world facts
(:mod:`repro.llm.knowledge`) and :class:`repro.llm.SimulatedLLM`, which
answers the prompts from the knowledge base alone — it never sees ground
truth or error masks (see DESIGN.md §2).
"""
from repro.llm.client import LLMClient, SimulatedLLM

__all__ = ["LLMClient", "SimulatedLLM"]
