"""Unit tests for the Appendix-E prompt templates."""
import pytest

from repro.llm import prompts


class TestTemplates:
    def test_openie_renders(self):
        p = prompts.render(prompts.OPENIE_PROMPT, chunk="DOCTEXT", topic="movies")
        assert "DOCTEXT" in p and "movies" in p

    def test_openie_has_generic_demonstrations(self):
        # in-context examples are data-lake agnostic (Canada / medications)
        assert "Canada" in prompts.OPENIE_PROMPT
        assert "medications" in prompts.OPENIE_PROMPT

    def test_closed_renders(self):
        p = prompts.render(prompts.CLOSED_PROMPT, chunk="X", attribute="director")
        assert '"director"' in p

    def test_func_prompt_a_zero_shot(self):
        # P_A has no in-context function examples, only the task
        p = prompts.render(prompts.FUNC_PROMPT_A, chunk="C", attribute="a",
                           function_field="a")
        assert p.count("def get_") == 1

    def test_func_prompt_b_has_two_demonstrations(self):
        p = prompts.render(prompts.FUNC_PROMPT_B, chunk="C", attribute="a",
                           function_field="a")
        assert p.count("def get_") >= 2  # two worked examples + request

    def test_validate_renders(self):
        p = prompts.render(prompts.VALIDATE_PROMPT, value="2014",
                           attribute="year", topic="students")
        assert 'Could "2014" be a "year"' in p

    def test_rerank_renders(self):
        p = prompts.render(prompts.RERANK_PROMPT, topic="t", attributes="- a\n- b")
        assert "- a" in p

    @pytest.mark.parametrize("tmpl", [
        prompts.OPENIE_PROMPT, prompts.CLOSED_PROMPT, prompts.FUNC_PROMPT_A,
        prompts.FUNC_PROMPT_B, prompts.VALIDATE_PROMPT, prompts.RERANK_PROMPT,
    ])
    def test_templates_are_nonempty(self, tmpl):
        assert len(tmpl) > 50
